package repro.community

import repro.SparkSpec

/** Tests for the distributed GraphX Louvain against the sequential
  * reference: same modularity definition, comparable quality.
  */
class LouvainGraphXSpec extends SparkSpec {

  private def clique(ids: Seq[Long], w: Double = 1.0): Seq[(Long, Long, Double)] =
    for { i <- ids.indices; j <- i + 1 until ids.size } yield (ids(i), ids(j), w)

  private def run(edges: Seq[(Long, Long, Double)]): LouvainGraphX.LouvainResult = {
    import spark.implicits._
    LouvainGraphX.run(spark, edges.toDF("src", "dst", "weight"))
  }

  test("two cliques joined by one edge split into two communities") {
    val edges = clique(Seq(1L, 2L, 3L, 4L)) ++ clique(Seq(5L, 6L, 7L, 8L)) :+ (4L, 5L, 1.0)
    val r = run(edges)
    assert(Set(1L, 2L, 3L, 4L).map(r.community).size === 1)
    assert(Set(5L, 6L, 7L, 8L).map(r.community).size === 1)
    assert(r.community(1L) !== r.community(5L))
  }

  test("modularity is close to the sequential reference on a ring of cliques") {
    val edges = (0 until 6).flatMap(c => clique((0 until 4).map(i => (c * 4 + i).toLong))) ++
      (0 until 6).map { c =>
        val a = (c * 4).toLong; val b = (((c + 1) % 6) * 4).toLong
        (math.min(a, b), math.max(a, b), 1.0)
      }
    val seq = Louvain.run(edges)
    val par = run(edges)
    assert(par.modularity > seq.modularity - 0.05,
      s"parallel ${par.modularity} much worse than sequential ${seq.modularity}")
  }

  test("reported modularity equals Modularity.local of the assignment") {
    val edges = clique(Seq(1L, 2L, 3L)) ++ clique(Seq(10L, 11L, 12L)) :+ (3L, 10L, 0.2)
    val r = run(edges)
    assert(math.abs(r.modularity - Modularity.local(edges, r.community)) < 1e-12)
  }

  test("deterministic across repeated runs") {
    val edges = clique(Seq(1L, 2L, 3L, 4L)) ++ clique(Seq(7L, 8L, 9L)) :+ (4L, 7L, 0.5)
    val a = run(edges)
    val b = run(edges)
    assert(a.community === b.community)
  }

  test("handles self-loops") {
    // note: a *heavy* self-loop on node 1 would make merging 1 into {2,3}
    // modularity-negative (it inflates k_1); use a light one
    val edges = clique(Seq(1L, 2L, 3L)) ++ Seq((1L, 1L, 0.5), (4L, 4L, 1.0), (3L, 4L, 0.1))
    val r = run(edges)
    assert(r.community.contains(4L))
    assert(r.community(1L) === r.community(2L))
    assert(r.community(4L) !== r.community(1L))
  }

  test("weighted two-block graph reaches positive modularity") {
    val rnd = new scala.util.Random(9)
    val block1 = clique((1L to 8L).toSeq, 2.0)
    val block2 = clique((11L to 18L).toSeq, 2.0)
    val cross = Seq((3L, 13L, 0.2), (5L, 15L, 0.2))
    val r = run(block1 ++ block2 ++ cross)
    assert(r.modularity > 0.3)
    assert((1L to 8L).map(r.community).toSet.size === 1)
    assert((11L to 18L).map(r.community).toSet.size === 1)
  }
}
