package repro.data

import java.sql.Timestamp
import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.geo.Haversine
import MobySchema._

/** Deterministic synthetic generator for the Moby Bikes dataset.
  *
  * The paper's input is proprietary (21 months of Dublin trips). This
  * generator reproduces its statistical shape — see DESIGN.md §2:
  *
  *   - 92 fixed stations + ~1,080 candidate "hotspots" laid out on
  *     sunflower lattices inside six Dublin regions (typical anchor
  *     spacing 120–150 m, well above the 100 m HAC cut);
  *   - good locations scattered N(0, ~18 m) around anchors, 70 % around
  *     stations (dockless users chase the return incentive) and 30 %
  *     around hotspots;
  *   - rentals with a block-level origin/destination matrix (~78 % of
  *     trips stay inside their spatial block → the paper's ~74 %
  *     self-containment after clustering) and per-archetype day-of-week /
  *     hour-of-day profiles (commuter AM/PM, leisure weekend-midday);
  *   - dirty rows calibrated so cleaning reproduces Table I exactly at
  *     sf=1: 3 bad stations, 83 bad locations, 452 bad rentals.
  *
  * Everything is a pure function of (sf, seed): randomness comes from
  * xxhash64 over row ids, never from `rand()`, so repeated evaluation of
  * the same DataFrame is stable and the DuckDB oracle sees identical data.
  */
object MobySynth {

  def counts(sf: Double): MobyCounts = MobyCounts(sf)

  /** Largest-remainder apportionment of `total` over integer weights. */
  private[data] def apportion(total: Long, weights: Seq[Int]): Seq[Long] = {
    val wSum = weights.sum.toDouble
    val raw = weights.map(w => w * total / wSum)
    val base = raw.map(_.toLong)
    var left = total - base.sum
    val order = raw.zip(base).map { case (r, b) => r - b }.zipWithIndex.sortBy(-_._1).map(_._2)
    val out = base.toArray
    var i = 0
    while (left > 0) { out(order(i % order.size)) += 1; left -= 1; i += 1 }
    out.toSeq
  }

  /** Sunflower (Vogel spiral) layout: near-uniform points in a disc with
    * typical spacing ~ radius * 1.77 / sqrt(n).
    */
  private def sunflower(centerLat: Double, centerLon: Double, radiusM: Double,
                        n: Int, phase: Double): IndexedSeq[(Double, Double)] = {
    val mPerLon = Haversine.metresPerDegLon(centerLat)
    (0 until n).map { k =>
      val r = radiusM * math.sqrt((k + 0.5) / math.max(1, n))
      val t = k * 2.3999632297 + phase
      (centerLat + r * math.cos(t) / Haversine.MetresPerDegLat,
       centerLon + r * math.sin(t) / mPerLon)
    }
  }

  /** Anchor ground truth: cls, class-local idx, region meta, coordinates. */
  private[data] final case class Anchor(cls: String, idx: Long, region: String,
                                        block: String, archetype: String,
                                        lat: Double, lon: Double)

  /** Stations cover the inner 0.75·R of each region; hotspots extend to
    * 1.25·R. The outer band is demand beyond existing coverage — the
    * paper's selected stations "extend into the adjacent suburbs beyond
    * the positions of the existing stations", and Algorithm 1's 250 m
    * station-exclusion would otherwise reject nearly everything.
    */
  private[data] def anchors(c: MobyCounts): Seq[Anchor] = {
    val stationCounts = apportion(c.goodStations, Regions.map(_.stationW))
    val hotspotCounts = apportion(c.hotspots, Regions.map(_.hotspotW))
    var sIdx = -1L; var hIdx = -1L
    val sts = Regions.zip(stationCounts).flatMap { case (r, n) =>
      sunflower(r.lat, r.lon, r.radiusM * 0.75, n.toInt, 0.7).map { case (la, lo) =>
        sIdx += 1; Anchor("station", sIdx, r.code, r.block, r.archetype, la, lo)
      }
    }
    val hot = Regions.zip(hotspotCounts).flatMap { case (r, n) =>
      sunflower(r.lat, r.lon, r.radiusM * 1.25, n.toInt, 0.0).map { case (la, lo) =>
        hIdx += 1; Anchor("hotspot", hIdx, r.code, r.block, r.archetype, la, lo)
      }
    }
    sts ++ hot
  }

  // ---- temporal profiles (unnormalised weights; normalised in cdf()) ----

  private val DayWeights: Map[String, Seq[Double]] = Map(
    Archetype.Centre   -> Seq(16, 16, 16, 16, 16, 10, 10),
    Archetype.Commuter -> Seq(17, 17, 17, 17, 16, 8, 8),
    Archetype.Leisure  -> Seq(9, 9, 9, 9, 14, 25, 25),
  )

  /** Hour profiles are keyed by a finer *hour-archetype*: commuter
    * stations split into AM-origin (residential) and PM-origin
    * (employment) halves — the directional asymmetry real commuter flows
    * have, and what differentiates the paper's 10 G_Hour communities
    * beyond its 7 G_Day ones.
    */
  private val HourWeights: Map[String, Seq[Double]] = Map(
    Archetype.Centre -> Seq(0.4, 0.2, 0.1, 0.1, 0.2, 0.6, 1.5, 3.5, 5.5, 6.0, 6.0, 6.5,
                            7.0, 6.5, 6.0, 6.0, 6.5, 7.0, 6.5, 5.0, 3.5, 2.5, 1.5, 0.8),
    "commuter-am" -> Seq(0.3, 0.15, 0.1, 0.1, 0.3, 1.5, 6.0, 14.0, 18.0, 8.0, 3.0, 2.5,
                         3.0, 2.5, 2.0, 2.5, 4.0, 6.0, 4.0, 2.5, 1.5, 1.0, 0.6, 0.4),
    "commuter-pm" -> Seq(0.3, 0.15, 0.1, 0.1, 0.2, 0.6, 1.5, 3.5, 4.5, 3.0, 2.5, 3.0,
                         3.5, 3.0, 3.5, 6.0, 11.0, 16.0, 12.0, 6.0, 3.0, 2.0, 1.0, 0.6),
    "leisure-mid" -> Seq(0.3, 0.2, 0.1, 0.1, 0.2, 0.4, 1.0, 2.0, 4.0, 6.5, 9.5, 12.0,
                         13.0, 12.5, 10.5, 8.0, 5.5, 3.5, 2.5, 1.5, 1.0, 0.7, 0.5, 0.3),
    "leisure-eve" -> Seq(0.4, 0.2, 0.1, 0.1, 0.1, 0.2, 0.5, 1.0, 1.5, 2.5, 3.5, 4.5,
                         5.5, 6.0, 6.5, 7.5, 9.0, 10.5, 11.5, 11.0, 8.5, 5.5, 3.0, 1.5),
  )

  /** (archetype, bucket, lo, hi) cumulative rows for inverse-CDF sampling. */
  private def cdfRows(weights: Map[String, Seq[Double]]): Seq[(String, Int, Double, Double)] =
    weights.toSeq.sortBy(_._1).flatMap { case (a, ws) =>
      val total = ws.sum
      val cum = ws.scanLeft(0.0)(_ + _)
      ws.indices.map { i =>
        val hi = if (i == ws.size - 1) 1.000001 else cum(i + 1) / total
        (a, i, cum(i) / total, hi)
      }
    }

  /** Per-anchor location-allocation weights.
    *
    * Stations follow a moderate zipf (busy hubs, long tail) with a
    * handful of deliberately *weak* stations at the end — real networks
    * have dud stations, and Algorithm 1's degree threshold is the MIN
    * fixed-station degree, so the weak tail is what makes selection
    * non-degenerate (threshold ≈ a few dozen trips, like the paper's).
    * Hotspots follow a flatter zipf so a few hundred candidates clear the
    * threshold and the 250 m spacing rules do the rest.
    */
  private[data] def anchorWeights(cls: String, n: Long): Seq[Double] =
    if (cls == "station") {
      val weak = math.max(1L, n / 15).toInt
      (0 until n.toInt).map(i =>
        if (i >= n - weak) 0.0004 else 1.0 / math.pow(i + 10, 1.2))
    } else {
      // zipf popularity, but *permuted* across sunflower positions: the
      // anchor index encodes radius (low = region centre), and demand
      // hotspots must appear at all radii or every high-degree candidate
      // would sit inside the stations' 250 m exclusion zone
      val ranks = new scala.util.Random(97L).shuffle((0 until n.toInt).toVector)
      (0 until n.toInt).map(i => 1.0 / math.pow(ranks(i) + 5, 1.05))
    }

  /** (cls, idx, lo, hi) cumulative rows for anchor allocation. */
  private[data] def anchorCdfRows(c: MobyCounts): Seq[(String, Long, Double, Double)] =
    Seq("station" -> c.goodStations, "hotspot" -> c.hotspots).flatMap { case (cls, n) =>
      val ws = anchorWeights(cls, n)
      val total = ws.sum
      val cum = ws.scanLeft(0.0)(_ + _)
      ws.indices.map { i =>
        val hi = if (i == ws.size - 1) 1.000001 else cum(i + 1) / total
        (cls, i.toLong, cum(i) / total, hi)
      }
    }

  /** Destination draws concentrate on popular anchors: each anchor's
    * weight is its location-allocation share raised to `DestSharpen`.
    * Without sharpening (uniform draws over a region's locations) the
    * candidate graph comes out ~3× denser than the paper's Table II
    * (16,042 directed pairs over 61,872 trips ⇒ ~3.9 trips per pair).
    */
  private val DestSharpen = 2.0

  /** Per-(region) destination-anchor CDF rows:
    * (region, cls, anchor_idx, lo, hi).
    */
  private[data] def destAnchorCdfRows(c: MobyCounts,
                                      anchorSeq: Seq[Anchor]): Seq[(String, String, Long, Double, Double)] = {
    val wS = anchorWeights("station", c.goodStations); val sS = wS.sum
    val wH = anchorWeights("hotspot", c.hotspots); val sH = wH.sum
    def baseW(a: Anchor): Double =
      if (a.cls == "station") 0.7 * wS(a.idx.toInt) / sS else 0.3 * wH(a.idx.toInt) / sH
    anchorSeq.groupBy(_.region).toSeq.sortBy(_._1).flatMap { case (region, as) =>
      val sorted = as.sortBy(a => (a.cls, a.idx))
      val ws = sorted.map(a => math.pow(baseW(a), DestSharpen))
      val tot = ws.sum
      val cum = ws.scanLeft(0.0)(_ + _)
      sorted.indices.map { i =>
        val hi = if (i == sorted.size - 1) 1.000001 else cum(i + 1) / tot
        (region, sorted(i).cls, sorted(i).idx, cum(i) / tot, hi)
      }
    }
  }

  /** Cross-block destination weights: P(dest block | origin block leaves). */
  private val CrossBlock: Map[(String, String), Double] = Map(
    ("central", "south") -> 0.5, ("central", "suburb") -> 0.5,
    ("south", "central") -> 0.65, ("south", "suburb") -> 0.35,
    ("suburb", "central") -> 0.65, ("suburb", "south") -> 0.35,
  )

  private val SameBlockP = 0.78
  /** Given a same-block destination, probability of staying in the
    * origin's *region* (vs the block's location-share draw). Regions are
    * the temporally coherent sub-networks (e.g. Dún Laoghaire leisure vs
    * Southside commuter); without this locality their mutual edges drown
    * the finer structure the temporal granularities are meant to expose.
    */
  private val SameRegionP = 0.6
  private val RoundTripP = 0.05
  private val DominantArchetypeP = 0.85
  private val NWeeks = 88 // Mondays 2020-01-06 .. 2021-09-06, all trips < 2021-09-19

  /** Generate the full dataset. See class doc; sf=1 ≈ the paper's volume. */
  def generate(spark: SparkSession, sf: Double = 1.0, seed: Long = 7L): MobyData = {
    import spark.implicits._
    val c = counts(sf)

    /** Deterministic uniform in [0,1) from (seed, salt, cols). */
    def u(salt: Int, cols: Column*): Column =
      pmod(xxhash64((lit(seed) +: lit(salt) +: cols): _*), lit(1000003L)) / 1000003.0

    /** Standard normal (Box–Muller) clamped to ±3σ so every good location
      * stays inside its region's land envelope.
      */
    def z(salt: Int, cols: Column*): Column = {
      val u1 = u(salt, cols: _*) * 0.999999 + 1e-7
      val u2 = u(salt + 1000, cols: _*)
      greatest(lit(-3.0), least(lit(3.0), sqrt(lit(-2.0) * log(u1)) * cos(lit(2 * math.Pi) * u2)))
    }

    val anchorSeq = anchors(c)
    val anchorsDf = anchorSeq
      .map(a => (a.cls, a.idx, a.region, a.block, a.archetype, a.lat, a.lon))
      .toDF("cls", "anchor_idx", "region", "block", "archetype", "a_lat", "a_lon")

    val nStations = c.goodStations
    val nHot = c.hotspots

    // ---------------- stations ----------------
    val goodStations = anchorSeq.filter(_.cls == "station")
      .map(a => (a.idx, s"Station ${a.region}-${a.idx}", Option(a.lat), Option(a.lon)))
    val badStations = Seq(
      (nStations, "Station BAD-outside", Option(51.898), Option(-8.471)), // Cork
      (nStations + 1, "Station BAD-sea", Option(53.320), Option(-6.080)), // Dublin Bay
      (nStations + 2, "Station BAD-nocoord", Option.empty[Double], Option.empty[Double]),
    )
    val stations = (goodStations ++ badStations)
      .toDF("station_id", "station_name", "lat", "lon")

    // ---------------- locations ----------------
    val anchorCdf = anchorCdfRows(c).toDF("cls", "cdf_idx", "a_lo", "a_hi")
    val locBase = spark.range(c.goodLocations).toDF("location_id")
      .withColumn("cls", when($"location_id" < c.stationLocations, "station").otherwise("hotspot"))
      .withColumn("class_local",
        when($"cls" === "station", $"location_id").otherwise($"location_id" - c.stationLocations))
      // force coverage: first location of each anchor class maps 1:1 to the
      // anchor, so every anchor owns >= 1 location; the rest follow the
      // zipf-with-weak-tail CDF of anchorWeights.
      .withColumn("n_anchor", when($"cls" === "station", lit(nStations)).otherwise(lit(nHot)))
      .withColumn("u_anchor", u(11, $"location_id"))
      .join(anchorCdf, Seq("cls"))
      .filter($"u_anchor" >= $"a_lo" && $"u_anchor" < $"a_hi")
      .withColumn("anchor_idx",
        when($"class_local" < $"n_anchor", $"class_local").otherwise($"cdf_idx"))
      .drop("cdf_idx", "a_lo", "a_hi")

    val sigma = when(col("cls") === "station", lit(16.0)).otherwise(lit(18.0))
    val mPerLon = Haversine.metresPerDegLon(53.33)
    val locJoined = locBase.join(anchorsDf, Seq("cls", "anchor_idx"))
      .withColumn("lat", $"a_lat" + z(21, $"location_id") * sigma / Haversine.MetresPerDegLat)
      .withColumn("lon", $"a_lon" + z(23, $"location_id") * sigma / mPerLon)
      .withColumn("archetype",
        when(u(31, $"location_id") < DominantArchetypeP, $"archetype")
          .otherwise(element_at(
            array(Archetype.All.map(lit): _*),
            (floor(u(33, $"location_id") * 3) + 1).cast(IntegerType))))
      .withColumn("harch",
        when($"archetype" === Archetype.Commuter,
          when(u(35, xxhash64($"cls"), $"anchor_idx") < 0.5, "commuter-am")
            .otherwise("commuter-pm"))
          .when($"archetype" === Archetype.Leisure,
            when(u(37, xxhash64($"cls"), $"anchor_idx") < 0.5, "leisure-mid")
              .otherwise("leisure-eve"))
          .otherwise($"archetype"))
      .withColumn("anchor_local",
        row_number().over(Window.partitionBy($"cls", $"anchor_idx").orderBy($"location_id")) - 1)
      .select($"location_id", $"cls", $"anchor_idx", $"region", $"block", $"archetype",
              $"harch", $"lat", $"lon", $"anchor_local")
      .cache()

    val regionCounts: Map[String, Long] =
      locJoined.groupBy($"region").count().collect().map(r => r.getString(0) -> r.getLong(1)).toMap

    val badLocations = {
      def jit(k: Long, s: Int): Double = (((k * 2654435761L + s * 40503L + seed) % 1000) - 500) / 1e6
      val orphan = (0L until c.orphanLocations).map { k =>
        (c.orphanLocBase + k, Option(53.3475 + jit(k, 1) * 4), Option(-6.2610 + jit(k, 2) * 4))
      }
      val outside = (0L until c.outsideLocations).map { k =>
        (c.outsideLocBase + k, Option(52.661 + jit(k, 3)), Option(-8.630 + jit(k, 4)))
      }
      val sea = (0L until c.seaLocations).map { k =>
        (c.seaLocBase + k, Option(53.315 + jit(k, 5) * 20), Option(-6.082 + jit(k, 6) * 10))
      }
      val noCoord = (0L until c.noCoordLocations).map { k =>
        if (k % 2 == 0) (c.noCoordLocBase + k, Option.empty[Double], Option(-6.26 + jit(k, 7)))
        else (c.noCoordLocBase + k, Option(53.34 + jit(k, 8)), Option.empty[Double])
      }
      (orphan ++ outside ++ sea ++ noCoord).toDF("location_id", "lat", "lon")
    }

    val locations = locJoined
      .select($"location_id", $"lat".cast(DoubleType) as "lat", $"lon".cast(DoubleType) as "lon")
      .unionByName(badLocations)

    // ---------------- rentals ----------------
    val rBase = spark.range(c.goodRentals).toDF("rental_id")
      // coverage: rental i < nGoodLocations starts at location i, so rule 6
      // (unreferenced locations) removes exactly the injected orphans.
      .withColumn("o_loc",
        when($"rental_id" < c.goodLocations, $"rental_id")
          .otherwise(floor(u(41, $"rental_id") * c.goodLocations)))

    val oMeta = locJoined.select(
      $"location_id" as "o_loc", $"region" as "o_region", $"block" as "o_block",
      $"archetype" as "o_archetype", $"harch" as "o_harch")

    def blockW(origin: String, dest: String): Double = CrossBlock((origin, dest))
    val withDest = rBase.join(oMeta, "o_loc")
      .withColumn("u_block", u(43, $"rental_id"))
      .withColumn("dest_block",
        when(u(45, $"rental_id") < SameBlockP, $"o_block").otherwise(
          Blocks.foldLeft(lit(null).cast(StringType)) { (acc, ob) =>
            val others = Blocks.filterNot(_ == ob)
            when(col("o_block") === ob,
              when($"u_block" < blockW(ob, others.head), lit(others.head)).otherwise(lit(others(1)))
            ).otherwise(acc)
          }))
      .withColumn("dest_region", {
        // same-block trips stay in the origin's region with SameRegionP;
        // otherwise choose a region inside the destination block by
        // location share
        val byShare = Blocks.foldLeft(lit(null).cast(StringType)) { (acc, b) =>
          val rs = Regions.filter(_.block == b).map(_.code)
          val cA = regionCounts.getOrElse(rs.head, 0L).toDouble
          val cB = regionCounts.getOrElse(rs(1), 0L).toDouble
          when(col("dest_block") === b,
            when(u(47, $"rental_id") < cA / math.max(1.0, cA + cB), lit(rs.head))
              .otherwise(lit(rs(1)))
          ).otherwise(acc)
        }
        when($"dest_block" === $"o_block" && u(46, $"rental_id") < SameRegionP, $"o_region")
          .otherwise(byShare)
      })
      .withColumn("u_danchor", u(48, $"rental_id"))

    val destCdf = destAnchorCdfRows(c, anchorSeq)
      .toDF("dest_region", "d_cls", "d_anchor", "da_lo", "da_hi")
    val anchorCounts = locJoined.groupBy($"cls", $"anchor_idx")
      .agg(count(lit(1)) as "n_at_anchor")
      .select($"cls" as "d_cls", $"anchor_idx" as "d_anchor", $"n_at_anchor")

    val withDestLoc = withDest
      .join(destCdf, Seq("dest_region"))
      .filter($"u_danchor" >= $"da_lo" && $"u_danchor" < $"da_hi")
      .join(anchorCounts, Seq("d_cls", "d_anchor"))
      .withColumn("d_local", floor(u(49, $"rental_id") * $"n_at_anchor"))

    val dKey = locJoined.select($"cls" as "d_cls", $"anchor_idx" as "d_anchor",
                                $"anchor_local" as "d_local", $"location_id" as "d_loc")
    val dayCdf = cdfRows(DayWeights).toDF("d_arch", "dow", "d_lo", "d_hi")
    val hourCdf = cdfRows(HourWeights).toDF("h_arch", "hour", "h_lo", "h_hi")

    // endpoint plan before temporal sampling, so the mirror pass below can
    // swap endpoints and the trip's clock still follows its actual origin
    val planned = withDestLoc.join(dKey, Seq("d_cls", "d_anchor", "d_local"))
      .withColumn("ret_loc", when(u(51, $"rental_id") < RoundTripP, $"o_loc").otherwise($"d_loc"))
      .select($"rental_id", $"o_loc", $"ret_loc")

    // reciprocity: half the free rentals replay the previous rental's trip
    // in reverse (commute out in the morning, back in the evening). The
    // paper's graph has directed ≈ 2 x undirected edges — most pairs are
    // travelled both ways — which independent draws cannot produce.
    // Coverage rentals (id < #locations) are exempt to keep rule 6 exact.
    val prev = planned.select(($"rental_id" + 1) as "rental_id",
                              $"o_loc" as "prev_o", $"ret_loc" as "prev_ret")
    val mirrored = planned.join(prev, Seq("rental_id"), "left")
      .withColumn("mirror",
        $"rental_id" >= c.goodLocations && $"prev_o".isNotNull && u(65, $"rental_id") < 0.5)
      .select($"rental_id",
              when($"mirror", $"prev_ret").otherwise($"o_loc") as "o_loc",
              when($"mirror", $"prev_o").otherwise($"ret_loc") as "ret_loc")

    val tMeta = locJoined.select($"location_id" as "o_loc",
                                 $"archetype" as "t_archetype", $"harch" as "t_harch")
    val withTime = mirrored.join(tMeta, "o_loc")
      .withColumn("u_day", u(53, $"rental_id"))
      .withColumn("u_hour", u(55, $"rental_id"))
      .join(dayCdf, $"t_archetype" === $"d_arch" && $"u_day" >= $"d_lo" && $"u_day" < $"d_hi")
      .join(hourCdf, $"t_harch" === $"h_arch" && $"u_hour" >= $"h_lo" && $"u_hour" < $"h_hi")

    val goodRentals = withTime
      .withColumn("week", floor(u(57, $"rental_id") * NWeeks))
      .withColumn("trip_date",
        date_add(lit("2020-01-06").cast(DateType), ($"week" * 7 + $"dow").cast(IntegerType)))
      .withColumn("start_ts",
        timestamp_seconds(unix_timestamp($"trip_date".cast(TimestampType))
          + $"hour" * 3600L + floor(u(59, $"rental_id") * 60) * 60L))
      .withColumn("end_ts",
        timestamp_seconds(unix_timestamp($"start_ts")
          + lit(300L) + floor(u(61, $"rental_id") * 35) * 60L))
      .select(
        $"rental_id",
        (floor(u(63, $"rental_id") * 95) + 1).cast(IntegerType) as "bike_id",
        $"start_ts", $"end_ts",
        $"o_loc".cast(LongType) as "rental_location_id",
        $"ret_loc".cast(LongType) as "return_location_id")

    val badRentals = {
      val t0 = Timestamp.valueOf("2020-06-01 10:00:00")
      def ts(k: Long) = new Timestamp(t0.getTime + k * 60000L)
      def ts2(k: Long) = new Timestamp(t0.getTime + k * 60000L + 900000L)
      def goodLoc(k: Long, s: Int): Long = math.floorMod(k * 48271L + s * 1299709L + seed, c.goodLocations)
      var id = c.goodRentals - 1
      def nextId(): Long = { id += 1; id }
      def mk(n: Long, badBase: Long, nBad: Long, badOnRentalSide: Long => Boolean) =
        (0L until n).map { k =>
          val rid = nextId(); val bad = badBase + (k % nBad)
          if (badOnRentalSide(k))
            (rid, (k % 95 + 1).toInt, ts(rid), ts2(rid), Option(bad), Option(goodLoc(rid, 1)))
          else
            (rid, (k % 95 + 1).toInt, ts(rid), ts2(rid), Option(goodLoc(rid, 2)), Option(bad))
        }
      val outside = mk(c.outsideRentals, c.outsideLocBase, c.outsideLocations, _ % 2 == 0)
      val sea = mk(c.seaRentals, c.seaLocBase, c.seaLocations, _ % 2 == 1)
      val noCoord = mk(c.noCoordRentals, c.noCoordLocBase, c.noCoordLocations, _ % 2 == 0)
      val missing = (0L until c.missingIdRentals).map { k =>
        val rid = nextId()
        if (k % 2 == 0)
          (rid, (k % 95 + 1).toInt, ts(rid), ts2(rid), Option.empty[Long], Option(goodLoc(rid, 3)))
        else
          (rid, (k % 95 + 1).toInt, ts(rid), ts2(rid), Option(goodLoc(rid, 4)), Option.empty[Long])
      }
      val dangling = (0L until c.danglingRentals).map { k =>
        val rid = nextId()
        val ghost = c.noCoordLocBase + c.noCoordLocations + 10000000L + k
        if (k % 2 == 0)
          (rid, (k % 95 + 1).toInt, ts(rid), ts2(rid), Option(ghost), Option(goodLoc(rid, 5)))
        else
          (rid, (k % 95 + 1).toInt, ts(rid), ts2(rid), Option(goodLoc(rid, 6)), Option(ghost))
      }
      (outside ++ sea ++ noCoord ++ missing ++ dangling)
        .toDF("rental_id", "bike_id", "start_ts", "end_ts",
              "rental_location_id", "return_location_id")
    }

    // Row counts are tiny (≤ ~76k at sf=1) but the lineage is join-heavy,
    // and everything downstream (cleaning → HAC → selection → Louvain)
    // builds on top of it. Eager localCheckpoint truncates the logical
    // plan here — without it Catalyst re-analyzes a multi-megabyte tree on
    // every downstream action and the driver drowns in plan analysis.
    val rentals = goodRentals.unionByName(badRentals).localCheckpoint(true)

    val meta = locJoined.select($"location_id", $"cls", $"anchor_idx", $"region",
                                $"block", $"archetype").localCheckpoint(true)
    MobyData(stations.localCheckpoint(true), locations.localCheckpoint(true), rentals, meta)
  }
}
