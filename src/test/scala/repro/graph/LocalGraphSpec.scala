package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import scala.collection.mutable
import scala.util.Random

class LocalGraphSpec extends AnyFunSuite {

  private def path(n: Int) = LocalGraph.fromEdges(n, (0 until n - 1).map(i => (i, i + 1)))
  private def cycle(n: Int) = LocalGraph.fromEdges(n, (0 until n).map(i => (i, (i + 1) % n)))
  private def star(n: Int) = LocalGraph.fromEdges(n, (1 until n).map(i => (0, i)))
  private def clique(n: Int) =
    LocalGraph.fromEdges(n, for { i <- 0 until n; j <- i + 1 until n } yield (i, j))
  private def allBits(n: Int): mutable.BitSet = {
    val b = mutable.BitSet.empty; (0 until n).foreach(b += _); b
  }
  private def randomGraph(n: Int, p: Double, seed: Long): LocalGraph = {
    val rnd = new Random(seed)
    LocalGraph.fromEdges(n,
      for { i <- 0 until n; j <- i + 1 until n if rnd.nextDouble() < p } yield (i, j))
  }

  test("fromEdges dedupes parallel edges and drops self loops") {
    val g = LocalGraph.fromEdges(3, Seq((0, 1), (1, 0), (0, 1), (2, 2)))
    assert(g.m == 1)
    assert(g.degree.toSeq == Seq(1, 1, 0))
  }

  test("fromEdges rejects out-of-range nodes") {
    intercept[IllegalArgumentException](LocalGraph.fromEdges(2, Seq((0, 5))))
  }

  for (n <- 2 to 8) {
    test(s"path($n): degrees, edges, bfs") {
      val g = path(n)
      assert(g.m == n - 1)
      assert(g.degree(0) == 1 && g.degree(n - 1) == 1)
      val d = g.bfsDist(Seq(0))
      (0 until n).foreach(i => assert(d(i) == i))
    }
    test(s"cycle($n): 2-regular, bfs wraps") {
      val g = cycle(n)
      assert(g.m == (if (n == 2) 1 else n))
      if (n > 2) {
        assert(g.degree.forall(_ == 2))
        val d = g.bfsDist(Seq(0))
        (0 until n).foreach(i => assert(d(i) == math.min(i, n - i)))
      }
    }
    test(s"clique($n): complete") {
      val g = clique(n)
      assert(g.m == n.toLong * (n - 1) / 2)
      assert(g.degree.forall(_ == n - 1))
      assert(g.bfsDist(Seq(0)).forall(_ <= 1))
    }
  }

  test("hasEdge on sorted adjacency") {
    val g = path(5)
    assert(g.hasEdge(1, 2) && g.hasEdge(2, 1))
    assert(!g.hasEdge(0, 2))
  }

  test("edges iterator emits each undirected edge once") {
    val g = clique(5)
    val es = g.edges.toSeq
    assert(es.size == 10)
    assert(es.forall { case (u, v) => u < v })
  }

  test("bfsDist multi-source takes minimum") {
    val g = path(7)
    val d = g.bfsDist(Seq(0, 6))
    assert(d(3) == 3 && d(1) == 1 && d(5) == 1)
  }

  test("bfsDist restricted to members") {
    val g = path(5)
    val members = mutable.BitSet(0, 1, 3, 4)
    val d = g.bfsDist(Seq(0), members)
    assert(d(1) == 1)
    assert(d(3) == -1 && d(4) == -1) // 2 removed: unreachable
  }

  test("bfsParents yields a valid shortest-path tree") {
    val g = cycle(8)
    val p = g.bfsParents(0)
    val d = g.bfsDist(Seq(0))
    (1 until 8).foreach { v => assert(d(p(v)) == d(v) - 1) }
  }

  test("componentOf finds exactly one component") {
    val g = LocalGraph.fromEdges(6, Seq((0, 1), (1, 2), (3, 4)))
    assert(g.componentOf(0).toSet == Set(0, 1, 2))
    assert(g.componentOf(3).toSet == Set(3, 4))
    assert(g.componentOf(5).toSet == Set(5))
  }

  test("connectedComponents labels") {
    val g = LocalGraph.fromEdges(6, Seq((0, 1), (1, 2), (3, 4)))
    val l = g.connectedComponents()
    assert(l(0) == l(1) && l(1) == l(2))
    assert(l(3) == l(4))
    assert(Set(l(0), l(3), l(5)).size == 3)
  }

  test("isConnected") {
    val g = LocalGraph.fromEdges(4, Seq((0, 1), (2, 3)))
    assert(g.isConnected(mutable.BitSet(0, 1)))
    assert(!g.isConnected(mutable.BitSet(0, 1, 2)))
    assert(g.isConnected(mutable.BitSet.empty))
  }

  test("articulation points of a path are the interior nodes") {
    val g = path(5)
    assert(g.articulationPoints(allBits(5)).toSet == Set(1, 2, 3))
  }

  test("articulation points of a cycle: none") {
    val g = cycle(6)
    assert(g.articulationPoints(allBits(6)).isEmpty)
  }

  test("articulation points of a star: the center") {
    val g = star(6)
    assert(g.articulationPoints(allBits(6)).toSet == Set(0))
  }

  test("articulation point of two triangles sharing a node") {
    val g = LocalGraph.fromEdges(5, Seq((0, 1), (1, 2), (2, 0), (2, 3), (3, 4), (4, 2)))
    assert(g.articulationPoints(allBits(5)).toSet == Set(2))
  }

  test("articulation respects membership restriction") {
    val g = cycle(6)
    val members = mutable.BitSet(0, 1, 2, 3) // path 0-1-2-3 within the cycle
    assert(g.articulationPoints(members).toSet == Set(1, 2))
  }

  for (seed <- 1 to 8) {
    test(s"articulation matches brute force on random graph seed=$seed") {
      val g = randomGraph(14, 0.2, seed)
      val members = allBits(14)
      val fast = g.articulationPoints(members).toSet
      // brute force: a non-isolated v is an articulation point iff removing
      // it increases the number of connected components
      def nComponents(mem: mutable.BitSet): Int = {
        val seen = mutable.BitSet.empty
        var c = 0
        mem.foreach { v =>
          if (!seen(v)) { c += 1; g.componentOf(v, mem).foreach(seen += _) }
        }
        c
      }
      val base = nComponents(members)
      val brute = (0 until 14).filter { v =>
        val mem = members.clone(); mem -= v
        g.degree(v) > 0 && nComponents(mem) > base
      }.toSet
      assert(fast == brute)
    }
  }

  test("coreNumbers of a clique") {
    assert(clique(5).coreNumbers().forall(_ == 4))
  }

  test("coreNumbers of a tree are all 1") {
    val g = LocalGraph.fromEdges(7, Seq((0, 1), (0, 2), (1, 3), (1, 4), (2, 5), (2, 6)))
    assert(g.coreNumbers().forall(_ == 1))
  }

  test("coreNumbers of a cycle are all 2") {
    assert(cycle(8).coreNumbers().forall(_ == 2))
  }

  test("coreNumbers of clique with a tail") {
    val g = LocalGraph.fromEdges(7,
      (for { i <- 0 until 4; j <- i + 1 until 4 } yield (i, j)) ++ Seq((3, 4), (4, 5), (5, 6)))
    val c = g.coreNumbers()
    assert((0 until 4).forall(c(_) == 3))
    assert(Seq(4, 5, 6).forall(c(_) == 1))
  }

  for (seed <- 1 to 6) {
    test(s"coreNumbers brute-force check seed=$seed") {
      val g = randomGraph(16, 0.25, seed + 100)
      val core = g.coreNumbers()
      // brute: k-core via repeated peeling; node's core = max k with node in k-core
      def inKCore(k: Int): Set[Int] = {
        val mem = allBits(16)
        var changed = true
        while (changed) {
          changed = false
          mem.toArray.foreach { v =>
            if (g.degreeWithin(v, mem) < k) { mem -= v; changed = true }
          }
        }
        mem.toSet
      }
      val maxK = g.degree.max
      (0 until 16).foreach { v =>
        val brute = (0 to maxK).filter(k => inKCore(k).contains(v)).max
        assert(core(v) == brute, s"node $v: fast=${core(v)} brute=$brute")
      }
    }
  }

  test("induced subgraph preserves structure") {
    val g = clique(6)
    val (sub, origId) = g.induced(mutable.BitSet(1, 3, 5))
    assert(sub.n == 3 && sub.m == 3)
    assert(origId.toSeq == Seq(1, 3, 5))
  }

  test("edgeCount and degreeSum on subsets") {
    val g = clique(5)
    val s = mutable.BitSet(0, 1, 2)
    assert(g.edgeCount(s) == 3)
    assert(g.degreeSum(s) == 12)
    assert(g.degreeWithin(0, s) == 2)
    assert(g.degreeWithin(4, s) == 3)
  }
}
