package repro.community

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Newman modularity (paper eq. 2) for undirected weighted graphs.
  *
  * Convention used throughout this repo: an edge list of *unordered*
  * pairs (src <= dst, weight), self-loops included once. In adjacency
  * terms A(i,j) = A(j,i) = w for i != j and A(i,i) = 2·w_self, so
  * 2m = Σ_ij A(i,j), k_i = Σ_j A(i,j), and
  * Q = (1/2m) Σ_ij [A(i,j) − k_i·k_j/2m] δ(c_i, c_j).
  */
object Modularity {

  /** Local computation over edge triples (src, dst, w) with src <= dst. */
  def local(edges: Seq[(Long, Long, Double)], community: Map[Long, Long]): Double = {
    require(edges.forall { case (s, d, _) => s <= d }, "edges must be unordered (src <= dst)")
    val twoM = edges.map { case (_, _, w) => 2 * w }.sum
    if (twoM == 0) return 0.0
    val k = scala.collection.mutable.HashMap.empty[Long, Double].withDefaultValue(0.0)
    edges.foreach { case (s, d, w) => k(s) += w; k(d) += w }
    val sumIn = scala.collection.mutable.HashMap.empty[Long, Double].withDefaultValue(0.0)
    edges.foreach { case (s, d, w) => if (community(s) == community(d)) sumIn(community(s)) += 2 * w }
    val sumTot = scala.collection.mutable.HashMap.empty[Long, Double].withDefaultValue(0.0)
    k.foreach { case (v, kv) => sumTot(community(v)) += kv }
    val cs = sumTot.keySet ++ sumIn.keySet
    cs.iterator.map { c =>
      sumIn(c) / twoM - math.pow(sumTot(c) / twoM, 2)
    }.sum
  }

  /** Same metric as a Spark computation: `edges` (src, dst, weight) with
    * src <= dst; `assignment` (id, community). Returns Q.
    */
  def spark(edges: DataFrame, assignment: DataFrame): Double = {
    val e = edges.select(col("src"), col("dst"), col("weight"))
    val twoM = e.agg(sum(col("weight") * 2)).head.getDouble(0)
    if (twoM == 0) return 0.0
    val degrees = e.select(col("src") as "id", col("weight") as "w")
      .unionAll(e.select(col("dst") as "id", col("weight") as "w"))
      .groupBy(col("id")).agg(sum(col("w")) as "k")
    val sumTot = degrees.join(assignment, "id")
      .groupBy(col("community")).agg(sum(col("k")) as "tot")
    val withC = e
      .join(assignment.select(col("id") as "src", col("community") as "c_src"), "src")
      .join(assignment.select(col("id") as "dst", col("community") as "c_dst"), "dst")
    val sumIn = withC.filter(col("c_src") === col("c_dst"))
      .groupBy(col("c_src")).agg(sum(col("weight") * 2) as "inw")
      .withColumnRenamed("c_src", "community")
    sumTot.join(sumIn, Seq("community"), "left")
      .select(
        (coalesce(col("inw"), lit(0.0)) / twoM - pow(col("tot") / twoM, 2)) as "q")
      .agg(sum(col("q"))).head.getDouble(0)
  }
}
