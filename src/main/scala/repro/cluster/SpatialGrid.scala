package repro.cluster

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.geo.Haversine

/** Grid blocking for neighbour-pair generation.
  *
  * Points are bucketed into square cells of side `thresholdM` metres (in a
  * local equirectangular projection around Dublin's latitude). Any two
  * points within `thresholdM` of each other land in the same or adjacent
  * cells, so emitting each point into its 3×3 cell neighbourhood and
  * joining on cell id yields a superset of the true neighbour pairs, which
  * a final Haversine filter trims exactly. This keeps HAC pair generation
  * O(n · density) instead of the O(n²) cross join.
  */
object SpatialGrid {

  /** Reference latitude for the projection; exact cell side only matters
    * for pruning efficiency, correctness comes from the final filter.
    */
  val RefLat = 53.33

  /** All unordered pairs (id_a < id_b) of `points` (id, lat, lon) whose
    * Haversine distance is <= thresholdM. Output: id_a, id_b, dist_m.
    */
  def neighbourPairs(spark: SparkSession, points: DataFrame, thresholdM: Double): DataFrame = {
    import spark.implicits._
    val mLat = Haversine.MetresPerDegLat
    val mLon = Haversine.metresPerDegLon(RefLat)

    val cells = points.select(
      $"id", $"lat", $"lon",
      floor($"lat" * mLat / thresholdM).cast("long") as "cy",
      floor($"lon" * mLon / thresholdM).cast("long") as "cx")

    // each point probes its own cell and the 8 surrounding ones
    val offsets = Seq.tabulate(9)(i => (i / 3 - 1, i % 3 - 1))
    val probes = cells.select(
      $"id", $"lat", $"lon",
      explode(array(offsets.map { case (dy, dx) =>
        struct(($"cy" + dy) as "cy", ($"cx" + dx) as "cx")
      }: _*)) as "cell")
      .select($"id" as "id_a", $"lat" as "lat_a", $"lon" as "lon_a",
              $"cell.cy" as "cy", $"cell.cx" as "cx")

    probes.join(
        cells.select($"id" as "id_b", $"lat" as "lat_b", $"lon" as "lon_b", $"cy", $"cx"),
        Seq("cy", "cx"))
      .filter($"id_a" < $"id_b")
      .withColumn("dist_m",
        Haversine.metresCol($"lat_a", $"lon_a", $"lat_b", $"lon_b"))
      .filter($"dist_m" <= thresholdM)
      .select("id_a", "id_b", "dist_m")
  }
}
