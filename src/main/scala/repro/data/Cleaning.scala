package repro.data

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import MobySchema._

/** The paper's §III cleaning pipeline (produces Table I).
  *
  * Removal rules, applied jointly:
  *   1. locations outside Dublin, and rentals that touch them;
  *   2. locations not on land, and rentals that touch them;
  *   3. locations missing latitude or longitude, and rentals that touch them;
  *   4. rentals missing a rental- or return-location id;
  *   5. rentals whose rental- or return-location id is not in Location;
  *   6. locations never referenced by the surviving rentals.
  *
  * Stations are filtered with the spatial validity rules (1–3): the paper
  * drops 95 → 92 stations.
  */
object Cleaning {

  final case class CleanData(stations: DataFrame, locations: DataFrame, rentals: DataFrame)

  final case class Report(origStations: Long, cleanStations: Long,
                          origRentals: Long, cleanRentals: Long,
                          origLocations: Long, cleanLocations: Long)

  /** Spatial validity of a coordinate pair as a Catalyst predicate. */
  def validCoords(lat: Column, lon: Column): Column = {
    val inDublin = lat.isNotNull && lon.isNotNull &&
      lat >= DublinLatMin && lat <= DublinLatMax && lon >= DublinLonMin && lon <= DublinLonMax
    val atSea = lon > SeaLonMin && lat > SeaLatMin && lat < SeaLatMax
    inDublin && !atSea
  }

  /** Apply all six rules; pure DataFrame transform. */
  def clean(data: MobyData): CleanData = {
    val stations = data.stations.filter(validCoords(col("lat"), col("lon")))

    // rules 1-3: spatially valid locations only
    val validLoc = data.locations.filter(validCoords(col("lat"), col("lon")))

    // rules 4-5: both endpoints present and resolvable to a valid location
    val locIds = validLoc.select(col("location_id"))
    val rentals = data.rentals
      .filter(col("rental_location_id").isNotNull && col("return_location_id").isNotNull)
      .join(locIds.withColumnRenamed("location_id", "rental_location_id"), Seq("rental_location_id"), "left_semi")
      .join(locIds.withColumnRenamed("location_id", "return_location_id"), Seq("return_location_id"), "left_semi")

    // rule 6: drop locations no surviving rental references
    val referenced = rentals.select(col("rental_location_id") as "location_id")
      .union(rentals.select(col("return_location_id") as "location_id"))
      .distinct()
    val locations = validLoc.join(referenced, Seq("location_id"), "left_semi")

    // eager localCheckpoint: the cleaned tables are the fan-out point for
    // everything downstream; truncating here keeps later plans small
    CleanData(stations.localCheckpoint(true),
              locations.select("location_id", "lat", "lon").localCheckpoint(true),
              rentals.select("rental_id", "bike_id", "start_ts", "end_ts",
                             "rental_location_id", "return_location_id").localCheckpoint(true))
  }

  /** Original-vs-cleaned counts (the content of Table I). */
  def report(data: MobyData, cleaned: CleanData): Report = Report(
    origStations = data.stations.count(), cleanStations = cleaned.stations.count(),
    origRentals = data.rentals.count(), cleanRentals = cleaned.rentals.count(),
    origLocations = data.locations.count(), cleanLocations = cleaned.locations.count())
}
