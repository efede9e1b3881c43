package repro.graph

import scala.collection.mutable

/** Immutable undirected simple graph with sorted adjacency arrays.
  *
  * Node ids are `0 until n`. Self-loops and parallel edges are dropped at
  * construction. All traversal primitives optionally take a membership
  * predicate so algorithms can operate on an induced subgraph without
  * re-indexing node ids.
  */
final class LocalGraph private (val n: Int, val adj: Array[Array[Int]]) extends Serializable {

  /** Degree of each node in the full graph. */
  val degree: Array[Int] = Array.tabulate(n)(i => adj(i).length)

  /** Number of undirected edges `|E|`. */
  val m: Long = degree.foldLeft(0L)(_ + _) / 2

  def neighbors(v: Int): Array[Int] = adj(v)

  def hasEdge(u: Int, v: Int): Boolean =
    u >= 0 && u < n && java.util.Arrays.binarySearch(adj(u), v) >= 0

  /** Iterator over undirected edges as (u, v) with u < v. */
  def edges: Iterator[(Int, Int)] =
    (0 until n).iterator.flatMap(u => adj(u).iterator.filter(_ > u).map(v => (u, v)))

  /** Number of edges internal to `members`. */
  def edgeCount(members: Int => Boolean): Long = {
    var l = 0L
    var u = 0
    while (u < n) {
      if (members(u)) {
        val a = adj(u); var i = 0
        while (i < a.length) { if (a(i) > u && members(a(i))) l += 1; i += 1 }
      }
      u += 1
    }
    l
  }

  /** Sum of *global* degrees over `members` (the d_C of the paper). */
  def degreeSum(members: mutable.BitSet): Long =
    members.foldLeft(0L)((s, v) => s + degree(v))

  /** Number of neighbors of `v` inside `members` (the k_{v,S} of the paper). */
  def degreeWithin(v: Int, members: Int => Boolean): Int = {
    var k = 0; val a = adj(v); var i = 0
    while (i < a.length) { if (members(a(i))) k += 1; i += 1 }
    k
  }

  /** Multi-source BFS distance, restricted to `inS`; -1 for unreachable. */
  def bfsDist(sources: Iterable[Int], inS: Int => Boolean = _ => true): Array[Int] = {
    val dist = Array.fill(n)(-1)
    val queue = new java.util.ArrayDeque[Integer]()
    for (s <- sources) if (inS(s) && dist(s) == -1) { dist(s) = 0; queue.add(s) }
    while (!queue.isEmpty) {
      val u = queue.poll().intValue()
      val a = adj(u); var i = 0
      while (i < a.length) {
        val v = a(i)
        if (dist(v) == -1 && inS(v)) { dist(v) = dist(u) + 1; queue.add(v) }
        i += 1
      }
    }
    dist
  }

  /** BFS parents from a single source (restricted); -1 = none/unreached. */
  def bfsParents(source: Int, inS: Int => Boolean = _ => true): Array[Int] = {
    val parent = Array.fill(n)(-1)
    val seen = new Array[Boolean](n)
    val queue = new java.util.ArrayDeque[Integer]()
    seen(source) = true; queue.add(source)
    while (!queue.isEmpty) {
      val u = queue.poll().intValue()
      val a = adj(u); var i = 0
      while (i < a.length) {
        val v = a(i)
        if (!seen(v) && inS(v)) { seen(v) = true; parent(v) = u; queue.add(v) }
        i += 1
      }
    }
    parent
  }

  /** Connected component of `seed` restricted to `inS`, as a BitSet. */
  def componentOf(seed: Int, inS: Int => Boolean = _ => true): mutable.BitSet = {
    val comp = mutable.BitSet.empty
    if (!inS(seed)) return comp
    val queue = new java.util.ArrayDeque[Integer]()
    comp += seed; queue.add(seed)
    while (!queue.isEmpty) {
      val u = queue.poll().intValue()
      val a = adj(u); var i = 0
      while (i < a.length) {
        val v = a(i)
        if (inS(v) && !comp(v)) { comp += v; queue.add(v) }
        i += 1
      }
    }
    comp
  }

  /** Component label per node (full graph); labels are representative ids. */
  def connectedComponents(): Array[Int] = {
    val label = Array.fill(n)(-1)
    val queue = new java.util.ArrayDeque[Integer]()
    var s = 0
    while (s < n) {
      if (label(s) == -1) {
        label(s) = s; queue.add(s)
        while (!queue.isEmpty) {
          val u = queue.poll().intValue()
          val a = adj(u); var i = 0
          while (i < a.length) {
            val v = a(i)
            if (label(v) == -1) { label(v) = s; queue.add(v) }
            i += 1
          }
        }
      }
      s += 1
    }
    label
  }

  def isConnected(members: mutable.BitSet): Boolean = {
    if (members.isEmpty) return true
    componentOf(members.head, members).size == members.size
  }

  /** Articulation points of the subgraph induced by `members` (iterative
    * Hopcroft–Tarjan low-link; safe on deep graphs).
    */
  def articulationPoints(members: mutable.BitSet): mutable.BitSet = {
    val disc = Array.fill(n)(-1)
    val low = new Array[Int](n)
    val parent = Array.fill(n)(-1)
    val childIdx = new Array[Int](n)
    val art = mutable.BitSet.empty
    var timer = 0
    val stack = new mutable.ArrayBuffer[Int]()
    for (root <- members) if (disc(root) == -1) {
      var rootChildren = 0
      disc(root) = timer; low(root) = timer; timer += 1
      stack += root
      while (stack.nonEmpty) {
        val u = stack(stack.length - 1)
        var advanced = false
        while (!advanced && childIdx(u) < adj(u).length) {
          val v = adj(u)(childIdx(u)); childIdx(u) += 1
          if (members(v)) {
            if (disc(v) == -1) {
              parent(v) = u
              if (u == root) rootChildren += 1
              disc(v) = timer; low(v) = timer; timer += 1
              stack += v; advanced = true
            } else if (v != parent(u)) {
              if (disc(v) < low(u)) low(u) = disc(v)
            }
          }
        }
        if (!advanced) {
          stack.remove(stack.length - 1)
          val p = parent(u)
          if (p != -1) {
            if (low(u) < low(p)) low(p) = low(u)
            if (p != root && low(u) >= disc(p)) art += p
          }
        }
      }
      if (rootChildren >= 2) art += root
    }
    art
  }

  /** Core number of every node (bucket peeling, O(E)). */
  def coreNumbers(): Array[Int] = {
    if (n == 0) return Array.empty
    val deg = degree.clone()
    val maxDeg = deg.max
    val bin = new Array[Int](maxDeg + 2)
    deg.foreach(d => bin(d) += 1)
    var start = 0
    var d = 0
    while (d <= maxDeg) { val c = bin(d); bin(d) = start; start += c; d += 1 }
    val pos = new Array[Int](n)
    val vert = new Array[Int](n)
    var v = 0
    while (v < n) { pos(v) = bin(deg(v)); vert(pos(v)) = v; bin(deg(v)) += 1; v += 1 }
    d = maxDeg
    while (d >= 1) { bin(d) = bin(d - 1); d -= 1 }
    bin(0) = 0
    val core = new Array[Int](n)
    var i = 0
    while (i < n) {
      val u = vert(i)
      core(u) = deg(u)
      val a = adj(u); var j = 0
      while (j < a.length) {
        val w = a(j)
        if (deg(w) > deg(u)) {
          val dw = deg(w); val pw = pos(w)
          val pFirst = bin(dw); val vFirst = vert(pFirst)
          if (vFirst != w) {
            pos(w) = pFirst; vert(pw) = vFirst
            pos(vFirst) = pw; vert(pFirst) = w
          }
          bin(dw) += 1
          deg(w) -= 1
        }
        j += 1
      }
      i += 1
    }
    core
  }

  /** Induce a new graph on `members`; returns (graph, origId) where
    * `origId(newId) = old id`.
    */
  def induced(members: mutable.BitSet): (LocalGraph, Array[Int]) = {
    val origId = members.toArray
    val newId = mutable.HashMap.empty[Int, Int]
    origId.zipWithIndex.foreach { case (o, i) => newId(o) = i }
    val es = mutable.ArrayBuffer.empty[(Int, Int)]
    for (u <- origId; v <- adj(u) if v > u && members(v)) es += ((newId(u), newId(v)))
    (LocalGraph.fromEdges(origId.length, es.toSeq), origId)
  }
}

object LocalGraph {
  /** Build from an edge list; dedupes, drops self-loops, sorts adjacency. */
  def fromEdges(n: Int, edgeSeq: Iterable[(Int, Int)]): LocalGraph = {
    val sets = Array.fill(n)(mutable.SortedSet.empty[Int])
    for ((u, v) <- edgeSeq if u != v) {
      require(u >= 0 && u < n && v >= 0 && v < n, s"edge ($u,$v) out of range n=$n")
      sets(u) += v; sets(v) += u
    }
    new LocalGraph(n, sets.map(_.toArray))
  }
}
