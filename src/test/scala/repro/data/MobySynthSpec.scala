package repro.data

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.data.MobySchema._
import repro.geo.Haversine

/** Tests for the synthetic Moby generator. Run at small sf for speed;
  * calibration against the paper's exact Table I counts happens at sf=1
  * in the bench suite.
  */
class MobySynthSpec extends SparkSpec {

  private val sf = repro.TestFixtures.sf
  private lazy val data = repro.TestFixtures.data
  private lazy val c = repro.TestFixtures.counts

  test("apportion distributes exactly and proportionally") {
    val got = MobySynth.apportion(92, Seq(30, 14, 18, 6, 10, 14))
    assert(got.sum === 92L)
    assert(got === Seq(30L, 14L, 18L, 6L, 10L, 14L))
    val uneven = MobySynth.apportion(10, Seq(1, 1, 1))
    assert(uneven.sum === 10L)
    assert(uneven.forall(n => n == 3L || n == 4L))
  }

  test("apportion handles zero-heavy weights") {
    val got = MobySynth.apportion(5, Seq(100, 1))
    assert(got.sum === 5L)
    assert(got.head >= 4L)
  }

  test("row counts match the calibration at sf=0.05") {
    assert(data.stations.count() === c.totalStations)
    assert(data.locations.count() === c.totalLocations)
    assert(data.rentals.count() === c.totalRentals)
  }

  test("counts calibration reproduces the paper's totals at sf=1") {
    val c1 = MobySynth.counts(1.0)
    assert(c1.totalStations === 95L)
    assert(c1.goodStations === 92L)
    assert(c1.totalLocations === 14239L)
    assert(c1.goodLocations === 14156L)
    assert(c1.totalRentals === 62324L)
    assert(c1.goodRentals === 61872L)
  }

  test("generation is deterministic in (sf, seed)") {
    val a = MobySynth.generate(spark, sf, 7L)
    val sumA = a.rentals.agg(sum(col("rental_location_id")), sum(col("return_location_id"))).head
    val b = MobySynth.generate(spark, sf, 7L)
    val sumB = b.rentals.agg(sum(col("rental_location_id")), sum(col("return_location_id"))).head
    assert(sumA === sumB)
    assert(a.locations.agg(sum(col("lat"))).head.getDouble(0)
      === b.locations.agg(sum(col("lat"))).head.getDouble(0))
  }

  test("different seeds give different data") {
    val b = MobySynth.generate(spark, sf, 8L)
    assert(data.locations.agg(sum(col("lat"))).head.getDouble(0)
      !== b.locations.agg(sum(col("lat"))).head.getDouble(0))
  }

  test("good stations are spatially valid, 3 bad stations are not") {
    import spark.implicits._
    val bad = data.stations.filter(!Cleaning.validCoords($"lat", $"lon"))
    assert(bad.count() === 3L)
    assert(data.stations.count() - 3L === c.goodStations)
  }

  test("good locations all inside Dublin and on land") {
    import spark.implicits._
    val good = data.locations.filter($"location_id" < c.goodLocations)
    val coords = good.select($"lat", $"lon").as[(Double, Double)].collect()
    coords.foreach { case (la, lo) =>
      assert(inDublin(la, lo), s"($la,$lo) outside Dublin")
      assert(onLand(la, lo), s"($la,$lo) at sea")
    }
  }

  test("bad locations fail exactly their intended rule") {
    import spark.implicits._
    val locs = data.locations.filter($"location_id" >= c.goodLocations)
      .select($"location_id", $"lat", $"lon").collect()
    locs.foreach { r =>
      val id = r.getLong(0)
      if (id < c.outsideLocBase) {
        // orphans: spatially valid, removed only by the reference rule
        assert(inDublin(r.getDouble(1), r.getDouble(2)) && onLand(r.getDouble(1), r.getDouble(2)))
      } else if (id < c.seaLocBase) {
        assert(!r.isNullAt(1) && !inDublin(r.getDouble(1), r.getDouble(2)))
      } else if (id < c.noCoordLocBase) {
        assert(!r.isNullAt(1) && inDublin(r.getDouble(1), r.getDouble(2))
          && !onLand(r.getDouble(1), r.getDouble(2)))
      } else {
        assert(r.isNullAt(1) || r.isNullAt(2))
      }
    }
  }

  test("every good location is referenced by a good rental (coverage)") {
    import spark.implicits._
    val goodRentals = data.rentals.filter($"rental_id" < c.goodRentals)
    val referenced = goodRentals.select($"rental_location_id" as "id")
      .union(goodRentals.select($"return_location_id" as "id")).distinct()
    assert(referenced.count() === c.goodLocations)
  }

  test("good rentals reference only good locations") {
    import spark.implicits._
    val goodRentals = data.rentals.filter($"rental_id" < c.goodRentals)
    assert(goodRentals.filter(
      $"rental_location_id" >= c.goodLocations || $"return_location_id" >= c.goodLocations
    ).count() === 0L)
  }

  test("orphan locations are referenced by no rental at all") {
    import spark.implicits._
    val orphans = (c.orphanLocBase until c.outsideLocBase)
    val refs = data.rentals.filter(
      $"rental_location_id".isin(orphans: _*) || $"return_location_id".isin(orphans: _*))
    assert(refs.count() === 0L)
  }

  test("bad rental categories have calibrated sizes (oracle-checked)") {
    import spark.implicits._
    val bad = data.rentals.filter($"rental_id" >= c.goodRentals)
    assert(bad.count() === c.badRentals)
    val missing = bad.filter($"rental_location_id".isNull || $"return_location_id".isNull)
    assert(missing.count() === c.missingIdRentals)
    // oracle: null-id rental count agrees with DuckDB over the same table
    val missingDf = data.rentals.groupBy()
      .agg(sum(when($"rental_location_id".isNull || $"return_location_id".isNull, 1)
        .otherwise(0)).cast("long") as "n_missing")
    Oracle.assertEquivalent(missingDf,
      """SELECT CAST(SUM(CASE WHEN rental_location_id IS NULL
        |OR return_location_id IS NULL THEN 1 ELSE 0 END) AS BIGINT) AS n_missing
        |FROM rentals""".stripMargin,
      "rentals" -> data.rentals.select($"rental_id", $"rental_location_id", $"return_location_id"))
  }

  test("dangling rentals reference non-existent location ids") {
    import spark.implicits._
    val locIds = data.locations.select($"location_id")
    val dangling = data.rentals
      .filter($"rental_location_id".isNotNull && $"return_location_id".isNotNull)
      .join(locIds.withColumnRenamed("location_id", "rental_location_id"),
            Seq("rental_location_id"), "left_anti")
    assert(dangling.count() === (c.danglingRentals + 1) / 2)
  }

  test("timestamps are inside the paper's observation window") {
    import spark.implicits._
    val good = data.rentals.filter($"rental_id" < c.goodRentals)
    val bounds = good.agg(min($"start_ts"), max($"start_ts")).head
    assert(bounds.getTimestamp(0).toString >= "2020-01-06")
    assert(bounds.getTimestamp(1).toString <= "2021-09-13")
    assert(good.filter($"end_ts" <= $"start_ts").count() === 0L)
  }

  test("locations scatter tightly around their anchors") {
    import spark.implicits._
    val cnts = MobySynth.counts(sf)
    val anchorPos = MobySynth.anchors(cnts).map(a => (a.cls, a.idx) -> (a.lat, a.lon)).toMap
    val meta = data.locationMeta.select($"location_id", $"cls", $"anchor_idx")
      .as[(Long, String, Long)].collect().map(t => t._1 -> (t._2, t._3)).toMap
    val coords = data.locations.filter($"location_id" < cnts.goodLocations)
      .select($"location_id", $"lat", $"lon").as[(Long, Double, Double)].collect()
    coords.foreach { case (id, la, lo) =>
      val (ala, alo) = anchorPos(meta(id))
      val d = Haversine.metres(la, lo, ala, alo)
      assert(d <= 90.0, s"location $id is ${d}m from its anchor") // 3σ clamp ⇒ ≤ ~77 m
    }
  }

  test("every anchor owns at least one location (coverage forcing)") {
    import spark.implicits._
    val cnts = MobySynth.counts(sf)
    val owned = data.locationMeta.select($"cls", $"anchor_idx").distinct().count()
    assert(owned === cnts.goodStations + cnts.hotspots)
  }

  test("block self-containment of trips is near the configured 78%+5% round trips") {
    import spark.implicits._
    val meta = data.locationMeta.select($"location_id", $"block")
    val good = data.rentals.filter($"rental_id" < c.goodRentals)
    val joined = good
      .join(meta.select($"location_id" as "rental_location_id", $"block" as "o_b"), "rental_location_id")
      .join(meta.select($"location_id" as "return_location_id", $"block" as "d_b"), "return_location_id")
    val same = joined.filter($"o_b" === $"d_b").count().toDouble / joined.count()
    assert(same > 0.74 && same < 0.90, s"same-block fraction $same")
  }

  test("commuter trips are weekday-heavy, leisure trips weekend-heavy") {
    import spark.implicits._
    val meta = data.locationMeta.select($"location_id" as "rental_location_id", $"archetype")
    val good = data.rentals.filter($"rental_id" < c.goodRentals).join(meta, "rental_location_id")
      .withColumn("dow", pmod(dayofweek($"start_ts") + 5, lit(7)))
    def weekendShare(arch: String): Double = {
      val n = good.filter($"archetype" === arch)
      n.filter($"dow" >= 5).count().toDouble / n.count()
    }
    val commuterWe = weekendShare(Archetype.Commuter)
    val leisureWe = weekendShare(Archetype.Leisure)
    assert(commuterWe < 0.25, s"commuter weekend share $commuterWe")
    assert(leisureWe > 0.40, s"leisure weekend share $leisureWe")
  }

  test("commuter hour profile peaks at 8 and 17, leisure at midday") {
    import spark.implicits._
    val meta = data.locationMeta.select($"location_id" as "rental_location_id", $"archetype")
    val good = data.rentals.filter($"rental_id" < c.goodRentals).join(meta, "rental_location_id")
      .withColumn("hr", hour($"start_ts"))
    def hist(arch: String): Map[Int, Long] =
      good.filter($"archetype" === arch).groupBy($"hr").count()
        .as[(Int, Long)].collect().toMap.withDefaultValue(0L)
    val ch = hist(Archetype.Commuter)
    assert(ch(8) > ch(12), "commuter AM peak beats midday")
    assert(ch(17) > ch(12), "commuter PM peak beats midday")
    val lh = hist(Archetype.Leisure)
    assert(lh(13) > lh(8), "leisure midday beats 8am")
  }

  test("round trips exist at roughly the configured rate") {
    import spark.implicits._
    val good = data.rentals.filter($"rental_id" < c.goodRentals)
    val rt = good.filter($"rental_location_id" === $"return_location_id").count().toDouble
    val share = rt / good.count()
    // round-trip prob is 0.05 plus accidental same-destination draws
    assert(share > 0.03 && share < 0.12, s"round-trip share $share")
  }

  test("station-class locations are ~70% of good locations") {
    import spark.implicits._
    val st = data.locationMeta.filter($"cls" === "station").count().toDouble
    assert(math.abs(st / c.goodLocations - 0.70) < 0.01)
  }

  test("trip-count aggregation by origin matches DuckDB oracle") {
    import spark.implicits._
    val good = data.rentals.filter($"rental_id" < c.goodRentals)
    val sparkAgg = good.groupBy($"rental_location_id")
      .agg(count(lit(1)) as "n_trips")
      .filter($"rental_location_id" < 50)
    Oracle.assertEquivalent(sparkAgg,
      s"""SELECT rental_location_id, CAST(COUNT(*) AS BIGINT) AS n_trips
         |FROM rentals WHERE CAST(rental_id AS BIGINT) < ${c.goodRentals}
         |AND CAST(rental_location_id AS BIGINT) < 50
         |GROUP BY rental_location_id""".stripMargin,
      "rentals" -> data.rentals.select($"rental_id", $"rental_location_id"))
  }
}
