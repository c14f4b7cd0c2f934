package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Community summary tables (paper Tables IV, V, VI): per community the
  * number of old (pre-existing) and new (selected) stations, and the
  * trips that stay inside it (within), leave it (out) or enter it (in).
  */
object CommunityAnalysis {

  final case class CommunityRow(communityId: Long, oldStations: Long, newStations: Long,
                                totalStations: Long, within: Long, out: Long, in: Long) {
    def total: Long = within + out + in
  }

  final case class Summary(rows: Seq[CommunityRow], modularity: Double) {
    def nCommunities: Int = rows.size
    /** Fraction of all trips that start and end in the same community. */
    def selfContainment: Double = {
      val within = rows.map(_.within).sum.toDouble
      val all = within + rows.map(_.out).sum
      if (all == 0) 0.0 else within / all
    }
  }

  /** Build the summary from a node->community assignment.
    *
    * Community ids are renumbered 1..K by descending total station count
    * then ascending min node id, mirroring the paper's table layout.
    */
  def summarize(spark: SparkSession, selected: SelectedGraph.Result,
                community: Map[Long, Long], modularity: Double): Summary = {
    import spark.implicits._
    val commDf = community.toSeq.toDF("node_id", "community")

    val stationCounts = selected.nodes.join(commDf, "node_id")
      .groupBy($"community")
      .agg(sum(when($"is_new", 0L).otherwise(1L)) as "old_st",
           sum(when($"is_new", 1L).otherwise(0L)) as "new_st",
           count(lit(1)) as "total_st")

    val withComm = selected.trips
      .join(commDf.select($"node_id" as "src_node", $"community" as "c_src"), "src_node")
      .join(commDf.select($"node_id" as "dst_node", $"community" as "c_dst"), "dst_node")

    val within = withComm.filter($"c_src" === $"c_dst")
      .groupBy($"c_src").agg(count(lit(1)) as "within").withColumnRenamed("c_src", "community")
    val out = withComm.filter($"c_src" =!= $"c_dst")
      .groupBy($"c_src").agg(count(lit(1)) as "out").withColumnRenamed("c_src", "community")
    val in = withComm.filter($"c_src" =!= $"c_dst")
      .groupBy($"c_dst").agg(count(lit(1)) as "in").withColumnRenamed("c_dst", "community")

    val joined = stationCounts
      .join(within, Seq("community"), "left")
      .join(out, Seq("community"), "left")
      .join(in, Seq("community"), "left")
      .select($"community", $"old_st", $"new_st", $"total_st",
              coalesce($"within", lit(0L)) as "within",
              coalesce($"out", lit(0L)) as "out",
              coalesce($"in", lit(0L)) as "in")
      .as[(Long, Long, Long, Long, Long, Long, Long)]
      .collect()
      .sortBy(t => (-t._4, t._1))

    val rows = joined.zipWithIndex.map { case (t, i) =>
      CommunityRow(i + 1L, t._2, t._3, t._4, t._5, t._6, t._7)
    }
    Summary(rows.toSeq, modularity)
  }
}
