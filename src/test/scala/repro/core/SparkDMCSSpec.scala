package repro.core

import repro.SparkSpec
import repro.graph.{GraphFrames, GraphGen, LocalGraph}
import scala.collection.mutable

/** The distributed pipeline must return exactly the community of the local
  * layer-pruned FPA (same prefix selection, same peel, same tie-breaks).
  */
class SparkDMCSSpec extends SparkSpec {

  private def assertEquivalent(g: LocalGraph, q: Seq[Int]): Unit = {
    val edges = GraphFrames.edgeDF(spark, g)
    val local = Peeler.fpa(g, q)
    val dist = SparkDMCS.fpa(spark, edges, q.map(_.toLong))
    assert(dist.ok == local.ok)
    if (local.ok) {
      assert(dist.community.map(_.toInt) == local.community,
        s"spark=${dist.community.toSeq.sorted} local=${local.community.toSeq.sorted}")
      assert(math.abs(dist.dm - local.score) < 1e-12)
    }
  }

  test("karate: SparkDMCS == local FPA (hub query)") {
    assertEquivalent(GraphGen.karate.graph, Seq(0))
  }
  test("karate: SparkDMCS == local FPA (officer hub)") {
    assertEquivalent(GraphGen.karate.graph, Seq(33))
  }
  test("karate: SparkDMCS == local FPA (peripheral query)") {
    assertEquivalent(GraphGen.karate.graph, Seq(16))
  }
  test("ring of cliques: SparkDMCS finds the 6-clique") {
    val g = GraphGen.ringOfCliques(10, 6)
    val r = SparkDMCS.fpa(spark, GraphFrames.edgeDF(spark, g), Seq(14L))
    assert(r.ok && r.community == (12 until 18).map(_.toLong).toSet)
  }

  for (seed <- 1 to 3) {
    test(s"LFR seed=$seed: SparkDMCS == local FPA") {
      val gt = GraphGen.lfr(250, 10, 40, 0.3, 20, 60, seed = seed)
      val q = gt.communities.maxBy(_.size).head
      assertEquivalent(gt.graph, Seq(q))
    }
  }

  test("multi-query: community contains all queries and is connected") {
    val gt = GraphGen.lfr(250, 10, 40, 0.3, 20, 60, seed = 9)
    val comm = gt.communities.maxBy(_.size).toSeq.sorted
    val q = comm.take(3)
    val r = SparkDMCS.fpa(spark, GraphFrames.edgeDF(spark, gt.graph), q.map(_.toLong))
    assert(r.ok)
    assert(q.forall(v => r.community.contains(v.toLong)))
    val bits = mutable.BitSet.empty
    r.community.foreach(v => bits += v.toInt)
    assert(gt.graph.isConnected(bits))
  }

  test("queries in different components fail gracefully") {
    val g = LocalGraph.fromEdges(6, Seq((0, 1), (1, 2), (3, 4)))
    val r = SparkDMCS.fpa(spark, GraphFrames.edgeDF(spark, g), Seq(0L, 3L))
    assert(!r.ok)
  }

  test("reported chosenLayer is within [0, maxLayer]") {
    val gt = GraphGen.lfr(250, 10, 40, 0.3, 20, 60, seed = 4)
    val r = SparkDMCS.fpa(spark, GraphFrames.edgeDF(spark, gt.graph), Seq(0L))
    assert(r.ok && r.chosenLayer >= 0 && r.chosenLayer <= r.maxLayer)
  }
}
