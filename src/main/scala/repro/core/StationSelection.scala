package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.geo.Haversine

/** The paper's Algorithm 1 — station ranking and selection.
  *
  * Degree of a node = number of trips starting there + number ending
  * there (a round trip contributes to both sides). The selection rules:
  *
  *   - Rule 3 (degree threshold): a candidate scores 0 if its degree is
  *     below the minimum fixed-station degree;
  *   - Rule 4 (secondary distance): a candidate scores 0 if its centroid
  *     is within `minDistM` (250 m) of a fixed station;
  *   - pairwise pruning: while any two surviving candidates are within
  *     `minDistM` of each other, the lower-degree one is zeroed;
  *   - survivors, ranked by score descending, become new stations.
  *
  * Degrees are computed in Spark; the rule loop runs on the driver over
  * the collected candidate summaries (≈1k rows at sf=1).
  */
object StationSelection {

  final case class Candidate(nodeId: Long, lat: Double, lon: Double,
                             degree: Long, score: Long, selected: Boolean)

  final case class Result(candidates: Seq[Candidate], degreeThreshold: Long) {
    def selected: Seq[Candidate] = candidates.filter(_.selected)
  }

  /** Per-node degree: trips from + trips to. Columns: node_id, degree. */
  def degrees(trips: DataFrame): DataFrame = {
    trips.select(col("src_node") as "node_id")
      .unionAll(trips.select(col("dst_node") as "node_id"))
      .groupBy(col("node_id")).agg(count(lit(1)) as "degree")
  }

  def select(spark: SparkSession, candidate: CandidateGraph.Result,
             minDistM: Double = 250.0): Result = {
    import spark.implicits._
    val deg = degrees(candidate.trips)
    val nodeDeg = candidate.nodes.join(deg, Seq("node_id"), "left")
      .select($"node_id", $"lat", $"lon", $"is_station",
              coalesce($"degree", lit(0L)) as "degree")
      .as[(Long, Double, Double, Boolean, Long)]
      .collect()

    val stations = nodeDeg.filter(_._4)
    require(stations.nonEmpty, "no fixed stations")
    val threshold = stations.map(_._5).min

    final case class C(id: Long, lat: Double, lon: Double, deg: Long, var score: Long)
    val cands = nodeDeg.filterNot(_._4).sortBy(_._1)
      .map(t => C(t._1, t._2, t._3, t._5, t._5))

    // Rules 3 and 4
    for (c <- cands) {
      if (c.deg < threshold) c.score = 0
      else {
        val dMin = stations.iterator
          .map(s => Haversine.metres(c.lat, c.lon, s._2, s._3)).min
        if (dMin <= minDistM) c.score = 0
      }
    }

    // pairwise pruning until no two positive-score candidates are close
    var changed = true
    while (changed) {
      changed = false
      val alive = cands.filter(_.score > 0)
      var i = 0
      while (i < alive.length) {
        var j = i + 1
        while (j < alive.length) {
          val a = alive(i); val b = alive(j)
          if (a.score > 0 && b.score > 0 &&
              Haversine.metres(a.lat, a.lon, b.lat, b.lon) < minDistM) {
            // zero the lower-degree station; break id ties deterministically
            val loser = if (a.deg < b.deg || (a.deg == b.deg && a.id > b.id)) a else b
            loser.score = 0
            changed = true
          }
          j += 1
        }
        i += 1
      }
    }

    val out = cands.sortBy(c => (-c.score, c.id))
      .map(c => Candidate(c.id, c.lat, c.lon, c.deg, c.score, c.score > 0))
    Result(out.toSeq, threshold)
  }
}
