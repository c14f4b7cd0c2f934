package repro.community

import org.apache.spark.graphx.{Edge, Graph, VertexId}
import org.apache.spark.sql.{DataFrame, SparkSession}

/** Distributed Louvain-style community detection on GraphX
  * (message passing via `aggregateMessages`, per the parallel heuristics of
  * Lu et al. / Que et al. [27],[34] cited by the paper).
  *
  * Each level: every vertex gathers its neighbour-community weights
  * through `aggregateMessages`, computes the best modularity-gain move
  * against broadcast community totals, and a deterministic parity filter
  * (vertex id + iteration) lets only half the vertices move per round to
  * prevent two-vertex oscillation. When a level converges the graph is
  * contracted and the process repeats — the same two-phase structure as
  * the sequential reference, evaluated with the same [[Modularity]].
  */
object LouvainGraphX {

  final case class LouvainResult(community: Map[Long, Long], modularity: Double, levels: Int)

  /** One level of parallel local moving; returns vertex -> community. */
  private def oneLevel(graph: Graph[Unit, Double], maxIter: Int): Map[VertexId, VertexId] = {
    val sc = graph.edges.sparkContext
    // k_i with self-loops counted twice (adjacency convention)
    val selfW = graph.edges.filter(e => e.srcId == e.dstId)
      .map(e => (e.srcId, 2 * e.attr)).collectAsMap()
    val nbrDeg = graph.aggregateMessages[Double](
      ctx => if (ctx.srcId != ctx.dstId) { ctx.sendToSrc(ctx.attr); ctx.sendToDst(ctx.attr) },
      _ + _)
    val k: Map[VertexId, Double] = {
      val base = nbrDeg.collectAsMap()
      val all = graph.vertices.keys.collect()
      all.map(v => v -> (base.getOrElse(v, 0.0) + selfW.getOrElse(v, 0.0))).toMap
    }
    val twoM = k.values.sum
    if (twoM == 0) return k.keys.map(v => v -> v).toMap

    var comm: Map[VertexId, VertexId] = k.keys.map(v => v -> v).toMap
    var iter = 0
    var moved = true
    while (moved && iter < maxIter) {
      moved = false
      val commB = sc.broadcast(comm)
      val tot: Map[VertexId, Double] = {
        val t = scala.collection.mutable.HashMap.empty[VertexId, Double].withDefaultValue(0.0)
        k.foreach { case (v, kv) => t(comm(v)) += kv }
        t.toMap.withDefaultValue(0.0)
      }
      val totB = sc.broadcast(tot)
      val kB = sc.broadcast(k)

      // gather neighbour-community weights per vertex
      val nbrComm = graph.aggregateMessages[Map[VertexId, Double]](
        ctx => if (ctx.srcId != ctx.dstId) {
          ctx.sendToSrc(Map(commB.value(ctx.dstId) -> ctx.attr))
          ctx.sendToDst(Map(commB.value(ctx.srcId) -> ctx.attr))
        },
        (a, b) => (a.keySet ++ b.keySet).iterator
          .map(c => c -> (a.getOrElse(c, 0.0) + b.getOrElse(c, 0.0))).toMap)

      val parity = iter % 2
      val moves = nbrComm.flatMap { case (v, nbrW) =>
        if (math.floorMod(v, 2) != parity) None
        else {
          val cv = commB.value(v)
          val kv = kB.value(v)
          val totNoV = (c: VertexId) => totB.value(c) - (if (c == cv) kv else 0.0)
          val stay = nbrW.getOrElse(cv, 0.0) - totNoV(cv) * kv / twoM
          val cands = nbrW.toSeq.filter(_._1 != cv).sortBy(_._1)
          var bestC = cv; var bestG = stay
          cands.foreach { case (c, w) =>
            val g = w - totNoV(c) * kv / twoM
            if (g > bestG + 1e-12) { bestG = g; bestC = c }
          }
          if (bestC != cv) Some((v, bestC)) else None
        }
      }.collectAsMap()

      if (moves.nonEmpty) { moved = true; comm = comm ++ moves }
      else if (iter % 2 == 0) moved = true // give the other parity class a chance
      iter += 1
      commB.destroy(); totB.destroy(); kB.destroy()
    }
    comm.map { case (v, c) => (v, c) }
  }

  private def contract(graph: Graph[Unit, Double],
                       comm: Map[VertexId, VertexId]): Graph[Unit, Double] = {
    val sc = graph.edges.sparkContext
    val commB = sc.broadcast(comm)
    val newEdges = graph.edges
      .map { e =>
        val a = commB.value(e.srcId); val b = commB.value(e.dstId)
        ((math.min(a, b), math.max(a, b)), e.attr)
      }
      .reduceByKey(_ + _)
      .map { case ((a, b), w) => Edge(a, b, w) }
    val newVerts = sc.parallelize(comm.values.toSeq.distinct.map(c => (c, ())))
    Graph(newVerts, newEdges)
  }

  /** Run to convergence over an undirected edge list (src <= dst, w). */
  def run(spark: SparkSession, edges: DataFrame, maxLevels: Int = 10,
          maxIterPerLevel: Int = 50): LouvainResult = {
    import spark.implicits._
    val triples = edges.select($"src".cast("long"), $"dst".cast("long"), $"weight".cast("double"))
      .as[(Long, Long, Double)].collect().toSeq
    require(triples.forall { case (s, d, _) => s <= d }, "edges must be unordered (src <= dst)")

    val sc = spark.sparkContext
    var g = Graph(
      sc.parallelize(triples.flatMap(t => Seq(t._1, t._2)).distinct.map(v => (v, ()))),
      sc.parallelize(triples.map { case (s, d, w) => Edge(s, d, w) }))
    var mapping: Map[Long, Long] = triples.flatMap(t => Seq(t._1, t._2)).distinct.map(v => v -> v).toMap
    var levels = 0
    var improved = true
    var lastQ = Modularity.local(triples, mapping)
    while (improved && levels < maxLevels) {
      val comm = oneLevel(g, maxIterPerLevel)
      val newMapping = mapping.view.mapValues(c => comm(c)).toMap
      val q = Modularity.local(triples, newMapping)
      if (q > lastQ + 1e-9) {
        mapping = newMapping; lastQ = q; levels += 1
        g = contract(g, comm)
      } else improved = false
    }
    // Final polish: the parity-dampened parallel heuristic can stall in a
    // slightly worse local optimum than sequential Louvain. Following the
    // parallel-Louvain literature (the paper's refs [27],[34]), finish
    // with an exact sequential pass over the *contracted* graph — one
    // node per community, so this is O(#communities), not O(#vertices).
    val contracted = triples
      .map { case (s, d, w) =>
        val (a, b) = (mapping(s), mapping(d))
        (math.min(a, b), math.max(a, b)) -> w
      }
      .groupBy(_._1).view.mapValues(_.map(_._2).sum)
      .toSeq.map { case ((a, b), w) => (a, b, w) }
    val polish = Louvain.run(contracted)
    val polished = mapping.view.mapValues(c => polish.community(c)).toMap

    val byComm = polished.groupBy(_._2).view.mapValues(_.keys.min).toMap
    val finalMap = polished.view.mapValues(byComm).toMap
    LouvainResult(finalMap, Modularity.local(triples, finalMap), levels)
  }
}
