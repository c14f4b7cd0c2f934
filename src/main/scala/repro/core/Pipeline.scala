package repro.core

import org.apache.spark.sql.SparkSession
import repro.community.{Louvain, LouvainGraphX, Modularity}
import repro.data.{Cleaning, MobySynth}
import repro.data.MobySchema.MobyData

/** End-to-end orchestration of the paper's three-step methodology:
  * generate → clean → candidate graph (HAC) → Algorithm 1 selection →
  * selected graph → Louvain at three temporal granularities.
  */
object Pipeline {

  /** All thresholds default to the paper's §IV values (metres). */
  final case class Config(sf: Double = 1.0, seed: Long = 7L,
                          preAssignM: Double = 50.0, hacCutM: Double = 100.0,
                          centroidSepM: Double = 50.0, minDistM: Double = 250.0,
                          useGraphXLouvain: Boolean = false)

  final case class CommunityResult(granularity: TemporalGraphs.Granularity,
                                   summary: CommunityAnalysis.Summary)

  final case class Result(raw: MobyData, clean: Cleaning.CleanData, report: Cleaning.Report,
                          candidate: CandidateGraph.Result,
                          selection: StationSelection.Result,
                          selected: SelectedGraph.Result)

  /** Run generation through station selection (Tables I–III). */
  def run(spark: SparkSession, cfg: Config = Config()): Result = {
    val raw = MobySynth.generate(spark, cfg.sf, cfg.seed)
    val clean = Cleaning.clean(raw)
    val report = Cleaning.report(raw, clean)
    val candidate = CandidateGraph.build(spark, clean,
      preAssignM = cfg.preAssignM, hacCutM = cfg.hacCutM, centroidSepM = cfg.centroidSepM)
    val selection = StationSelection.select(spark, candidate, minDistM = cfg.minDistM)
    val selected = SelectedGraph.build(spark, candidate, selection)
    Result(raw, clean, report, candidate, selection, selected)
  }

  /** Louvain + community summary on the selected graph at a granularity
    * (Tables IV–VI). Uses the exact sequential Louvain unless
    * `cfg.useGraphXLouvain`; modularity is always recomputed with the
    * shared [[Modularity]] definition.
    */
  def communities(spark: SparkSession, selected: SelectedGraph.Result,
                  g: TemporalGraphs.Granularity,
                  useGraphX: Boolean = false): CommunityResult = {
    import spark.implicits._
    val edges = TemporalGraphs.edges(spark, selected.trips, g)
    val (community, q) =
      if (useGraphX) {
        val r = LouvainGraphX.run(spark, edges)
        (r.community, r.modularity)
      } else {
        val triples = edges.select($"src".cast("long"), $"dst".cast("long"),
                                   $"weight".cast("double"))
          .as[(Long, Long, Double)].collect().toSeq
        val r = Louvain.run(triples)
        (r.community, r.modularity)
      }
    // nodes with no surviving edge weight (possible under affinity
    // damping) become singleton communities
    val allNodes = selected.nodes.select($"node_id").as[Long].collect()
    val full = allNodes.map(n => n -> community.getOrElse(n, n)).toMap
    CommunityResult(g, CommunityAnalysis.summarize(spark, selected, full, q))
  }
}
