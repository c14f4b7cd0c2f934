package repro.data

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

/** Tests for the §III cleaning pipeline (Table I). */
class CleaningSpec extends SparkSpec {

  private val sf = repro.TestFixtures.sf
  private lazy val data = repro.TestFixtures.data
  private lazy val c = repro.TestFixtures.counts
  private lazy val cleaned = repro.TestFixtures.cleaned
  private lazy val rpt = repro.TestFixtures.report

  test("cleaning removes exactly the injected bad stations") {
    assert(rpt.origStations === c.totalStations)
    assert(rpt.cleanStations === c.goodStations)
  }

  test("cleaning removes exactly the injected bad rentals") {
    assert(rpt.origRentals === c.totalRentals)
    assert(rpt.cleanRentals === c.goodRentals)
  }

  test("cleaning removes exactly the injected bad locations") {
    assert(rpt.origLocations === c.totalLocations)
    assert(rpt.cleanLocations === c.goodLocations)
  }

  test("cleaned rentals have no null endpoint ids") {
    import spark.implicits._
    assert(cleaned.rentals.filter(
      $"rental_location_id".isNull || $"return_location_id".isNull).count() === 0L)
  }

  test("cleaned rentals reference only cleaned locations") {
    import spark.implicits._
    val ids = cleaned.locations.select($"location_id")
    val orphanRefs = cleaned.rentals
      .join(ids.withColumnRenamed("location_id", "rental_location_id"),
            Seq("rental_location_id"), "left_anti")
    assert(orphanRefs.count() === 0L)
    val orphanRefs2 = cleaned.rentals
      .join(ids.withColumnRenamed("location_id", "return_location_id"),
            Seq("return_location_id"), "left_anti")
    assert(orphanRefs2.count() === 0L)
  }

  test("every cleaned location is referenced by some cleaned rental (rule 6)") {
    import spark.implicits._
    val refs = cleaned.rentals.select($"rental_location_id" as "location_id")
      .union(cleaned.rentals.select($"return_location_id" as "location_id")).distinct()
    val unreferenced = cleaned.locations.join(refs, Seq("location_id"), "left_anti")
    assert(unreferenced.count() === 0L)
  }

  test("all cleaned locations are spatially valid") {
    import spark.implicits._
    assert(cleaned.locations.filter(!Cleaning.validCoords($"lat", $"lon")).count() === 0L)
    assert(cleaned.locations.filter($"lat".isNull || $"lon".isNull).count() === 0L)
  }

  test("all cleaned stations are spatially valid") {
    import spark.implicits._
    assert(cleaned.stations.filter(!Cleaning.validCoords($"lat", $"lon")).count() === 0L)
  }

  test("cleaning is idempotent") {
    val again = Cleaning.clean(MobySchema.MobyData(
      cleaned.stations, cleaned.locations, cleaned.rentals, data.locationMeta))
    assert(again.stations.count() === cleaned.stations.count())
    assert(again.locations.count() === cleaned.locations.count())
    assert(again.rentals.count() === cleaned.rentals.count())
  }

  test("cleaned rental count matches a DuckDB reference query (oracle)") {
    import spark.implicits._
    // express rules 3-6 relationally in DuckDB over the raw tables and
    // compare with the pipeline's surviving rental ids
    val sparkSurvivors = cleaned.rentals.select($"rental_id")
    val locForDuck = data.locations
      .withColumn("valid", Cleaning.validCoords($"lat", $"lon").cast("int"))
      .select($"location_id", $"valid")
    Oracle.assertEquivalent(sparkSurvivors,
      """SELECT r.rental_id FROM rentals r
        |JOIN locations lo ON r.rental_location_id = lo.location_id AND lo.valid = '1'
        |JOIN locations ld ON r.return_location_id = ld.location_id AND ld.valid = '1'
        |WHERE r.rental_location_id IS NOT NULL AND r.return_location_id IS NOT NULL""".stripMargin,
      "rentals" -> data.rentals.select($"rental_id", $"rental_location_id", $"return_location_id"),
      "locations" -> locForDuck)
  }

  test("cleaned location set matches a DuckDB reference query (oracle)") {
    import spark.implicits._
    val locForDuck = data.locations
      .withColumn("valid", Cleaning.validCoords($"lat", $"lon").cast("int"))
      .select($"location_id", $"valid")
    Oracle.assertEquivalent(cleaned.locations.select($"location_id"),
      """WITH surv AS (
        |  SELECT r.* FROM rentals r
        |  JOIN locations lo ON r.rental_location_id = lo.location_id AND lo.valid = '1'
        |  JOIN locations ld ON r.return_location_id = ld.location_id AND ld.valid = '1'
        |  WHERE r.rental_location_id IS NOT NULL AND r.return_location_id IS NOT NULL)
        |SELECT DISTINCT l.location_id FROM locations l
        |JOIN (SELECT rental_location_id AS location_id FROM surv
        |      UNION SELECT return_location_id FROM surv) refs
        |  ON l.location_id = refs.location_id
        |WHERE l.valid = '1'""".stripMargin,
      "rentals" -> data.rentals.select($"rental_id", $"rental_location_id", $"return_location_id"),
      "locations" -> locForDuck)
  }

  test("counts scale linearly-ish with sf") {
    val small = MobySynth.counts(0.01)
    val big = MobySynth.counts(0.1)
    assert(big.goodRentals > small.goodRentals * 5)
    assert(big.goodLocations > small.goodLocations * 5)
  }
}
