package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.{GraphFrames, LocalGraph}
import scala.collection.mutable

/** Distributed FPA (the `distributed_dataflow` reproduction target).
  *
  * Stage 1 (Spark/Catalyst): multi-source BFS from the query nodes over the
  * edge DataFrame; per-layer node/edge aggregates; density-modularity score
  * of every distance-prefix subgraph (Section 5.7's layer pruning) — all as
  * DataFrame dataflow, so it scales to graphs that do not fit one machine.
  *
  * Stage 2 (driver): the chosen prefix subgraph — a tiny fraction of the
  * graph after pruning — is collected and the outermost layer is peeled with
  * the density ratio, exactly as local FPA does. DM is still scored against
  * the *full* graph's |E| and degrees.
  *
  * A test asserts this returns exactly the same community as `Peeler.fpa`.
  */
object SparkDMCS {

  final case class Result(community: Set[Long], dm: Double, chosenLayer: Int,
                          maxLayer: Int, millis: Long, ok: Boolean, note: String = "")

  /** Run distributed FPA over a canonical (src<dst) edge DataFrame. */
  def fpa(spark: SparkSession, edges: DataFrame, queries: Seq[Long]): Result = {
    val t0 = System.nanoTime()
    def elapsedMs = (System.nanoTime() - t0) / 1000000L
    require(queries.nonEmpty, "need at least one query node")

    val e = edges.select(col("src").cast("long"), col("dst").cast("long")).cache()
    val mE = e.count()
    val degs = GraphFrames.degrees(e).cache()

    // --- multi-query: protect the union of shortest paths linking Q -------
    // For |Q|>1 the protected set is computed with a BFS-parent walk like the
    // local engine; distances are then taken from the protected set.
    val protSources: Seq[Long] =
      if (queries.length == 1) queries
      else {
        // Cheap driver-side Steiner union: BFS tree from q0 in Spark, then
        // walk parents. We get parents by re-running BFS keeping a parent col.
        bfsParents(spark, e, queries.head) match {
          case None => return Result(queries.toSet, Double.NaN, -1, -1, elapsedMs, ok = false,
            "query component unreachable")
          case Some(parents) =>
            val prot = mutable.HashSet.empty[Long]
            for (q <- queries) {
              if (!parents.contains(q) && q != queries.head)
                return Result(queries.toSet, Double.NaN, -1, -1, elapsedMs, ok = false,
                  "query nodes are not in the same connected component")
              var v = q
              while (v != -1L && !prot.contains(v)) { prot += v; v = parents.getOrElse(v, -1L) }
            }
            prot.toSeq.sorted
        }
      }

    val dist = GraphFrames.bfsDist(spark, e, protSources).cache()
    val distOfQueries = dist.filter(col("node").isin(queries: _*)).count()
    if (distOfQueries != queries.distinct.length)
      return Result(queries.toSet, Double.NaN, -1, -1, elapsedMs, ok = false,
        "query nodes are not in the same connected component")

    // --- layer aggregates + prefix DM (pure dataflow) ---------------------
    val nodeStats = GraphFrames.nodeLayerStats(dist, degs)
    val edgeStats = GraphFrames.edgeLayerStats(e, dist)
    val layerRows = nodeStats.join(edgeStats, Seq("dist"), "left_outer")
      .select(col("dist"), col("nNodes"), col("sumDeg"),
        coalesce(col("nEdges"), lit(0L)).as("nEdges"))
      .orderBy(col("dist"))
      .collect()

    val maxLayer = layerRows.map(_.getAs[Int]("dist")).maxOption.getOrElse(0)
    var cl = 0L; var cd = 0L; var cn = 0L
    var bestT = 0; var bestPrefix = Double.NegativeInfinity
    for (r <- layerRows) {
      cl += r.getAs[Long]("nEdges"); cd += r.getAs[Long]("sumDeg"); cn += r.getAs[Long]("nNodes")
      val sc = Modularity.dm(cl, cd, cn, mE)
      if (sc > bestPrefix) { bestPrefix = sc; bestT = r.getAs[Int]("dist") }
    }

    // --- collect the pruned prefix subgraph and peel locally --------------
    val keep = dist.filter(col("dist") <= bestT).cache()
    val nodeRows = keep.join(degs, Seq("node"))
      .select(col("node"), col("dist"), col("deg")).collect()
    val ids = nodeRows.map(_.getAs[Long]("node")).sorted
    val idOf = ids.zipWithIndex.toMap
    val degOf = new Array[Int](ids.length)
    nodeRows.foreach(r => degOf(idOf(r.getAs[Long]("node"))) = r.getAs[Long]("deg").toInt)

    val ks = keep.select(col("node").as("src"))
    val kd = keep.select(col("node").as("dst"))
    val subEdges = e.join(ks, Seq("src"), "left_semi").join(kd, Seq("dst"), "left_semi")
      .select(col("src"), col("dst")).collect()
      .map(r => (idOf(r.getAs[Long]("src")), idOf(r.getAs[Long]("dst"))))

    val sub = LocalGraph.fromEdges(ids.length, subEdges.toSeq)
    val localQueries = protSources.map(idOf)
    val res = Peeler.run(sub, localQueries, Peeler.FarthestLayer, Peeler.DensityRatio,
      layerPrune = true, globalDeg = degOf(_), mEGlobal = mE)

    e.unpersist(); degs.unpersist(); dist.unpersist(); keep.unpersist()
    Result(res.community.map(i => ids(i)), res.score, bestT, maxLayer, elapsedMs, ok = res.ok, res.note)
  }

  /** BFS parent map from a single source; None if source absent from graph. */
  private def bfsParents(spark: SparkSession, edges: DataFrame, source: Long): Option[Map[Long, Long]] = {
    import spark.implicits._
    val sym = GraphFrames.symmetrize(edges).cache()
    var visited = spark.createDataset(Seq((source, -1L))).toDF("node", "parent").cache()
    var frontier = visited
    var done = false
    var iter = 0
    while (!done && iter < 128) {
      iter += 1
      val next = sym.join(frontier, sym("src") === frontier("node"))
        .select(sym("dst").as("node"), sym("src").as("parent"))
        .groupBy(col("node")).agg(min(col("parent")).as("parent"))
        .join(visited, Seq("node"), "left_anti")
        .localCheckpoint()
      if (next.isEmpty) done = true
      else { visited = visited.union(next).localCheckpoint(); frontier = next }
    }
    sym.unpersist()
    val map = visited.collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    Some(map)
  }
}
