package repro.eval

import org.apache.spark.sql.SparkSession
import repro.baselines._
import repro.core.{Modularity, Peeler, SparkDMCS}
import repro.graph._
import scala.collection.mutable

/** Runners for every evaluation table (see DESIGN.md §5); each returns a
  * printable table so jobs and bench suites share the exact same code path.
  */
object Experiments {

  // ----------------------------------------------------------- registry
  final case class Algo(name: String, run: (GraphCtx, Seq[Int]) => Option[Set[Int]])

  private def peelerAlgo(name: String, f: (LocalGraph, Seq[Int]) => Peeler.Result): Algo =
    Algo(name, (ctx, q) => { val r = f(ctx.g, q); if (r.ok) Some(r.community) else None })

  /** The algorithms reported on the synthetic benchmark (Figs 8/9). */
  def coreAlgos(k: Int = 3, ktK: Int = 4, includeNca: Boolean = true): Seq[Algo] = {
    val base = Seq(
      Algo("kc", (c, q) => CoreTruss.kc(c, q, k)),
      Algo("kt", (c, q) => CoreTruss.kt(c, q, ktK)),
      Algo("kecc", (c, q) => KEcc.kecc(c.g, q, k)),
      Algo("highcore", (c, q) => CoreTruss.highcore(c, q)),
      Algo("hightruss", (c, q) => CoreTruss.hightruss(c, q)),
      Algo("wu2015", (c, q) => QueryBiased.find(c.g, q)),
      Algo("huang2015", (c, q) => ClosestTruss.find(c, q)),
      peelerAlgo("FPA", (g, q) => Peeler.fpa(g, q)),
    )
    if (includeNca) base :+ peelerAlgo("NCA", (g, q) => Peeler.nca(g, q)) else base
  }

  /** Extra baselines only run on the small real-world graphs (Figs 15/16). */
  def smallExtras(includeGn: Boolean = true): Seq[Algo] = {
    val b = mutable.ArrayBuffer(
      Algo("clique", (c, q) => CliquePerc.find(c.g, q)),
      Algo("CNM", (c, q) => CNM.find(c.g, q)),
      Algo("icwi2008", (c, q) => LocalModularity.find(c.g, q)),
    )
    if (includeGn) b += Algo("GN", (c, q) => GN.find(c.g, q))
    b.toSeq
  }

  // ----------------------------------------------------------- evaluation
  final case class EvalRow(algo: String, medNmi: Double, medAri: Double, medF1: Double,
                           meanMs: Double, meanSize: Double, fails: Int)

  /** Run `algos` over `querySets`; metrics use the best-matching ground-truth
    * community containing all the queries (paper's protocol for overlapping
    * ground truth; identical to the planted community when disjoint).
    */
  def evaluate(gt: GroundTruthGraph, ctx: GraphCtx, algos: Seq[Algo],
               querySets: Seq[(Seq[Int], Set[Int])]): Seq[EvalRow] = {
    val n = gt.graph.n
    algos.map { algo =>
      val nmis = mutable.ArrayBuffer.empty[Double]
      val aris = mutable.ArrayBuffer.empty[Double]
      val f1s = mutable.ArrayBuffer.empty[Double]
      val times = mutable.ArrayBuffer.empty[Double]
      val sizes = mutable.ArrayBuffer.empty[Double]
      var fails = 0
      for ((q, ownComm) <- querySets) {
        val t0 = System.nanoTime()
        val res = try algo.run(ctx, q) catch { case _: StackOverflowError => None }
        times += (System.nanoTime() - t0) / 1e6
        res match {
          case Some(c) if c.nonEmpty =>
            val cands = {
              val cs = gt.communities.filter(cm => q.forall(cm.contains))
              if (cs.nonEmpty) cs else IndexedSeq(ownComm)
            }
            nmis += cands.map(t => Metrics.nmi(n, c, t)).max
            aris += cands.map(t => Metrics.ari(n, c, t)).max
            f1s += cands.map(t => Metrics.f1(c, t)).max
            sizes += c.size.toDouble
          case _ =>
            fails += 1
            nmis += 0.0; aris += 0.0; f1s += 0.0
        }
      }
      EvalRow(algo.name, Metrics.median(nmis.toSeq), Metrics.median(aris.toSeq),
        Metrics.median(f1s.toSeq), Metrics.mean(times.toSeq), Metrics.mean(sizes.toSeq), fails)
    }
  }

  // ----------------------------------------------------------- formatting
  def formatTable(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def fmt(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("  ")
    val sb = new StringBuilder
    sb.append(s"== $title ==\n")
    sb.append(fmt(header)).append('\n')
    sb.append(widths.map("-" * _).mkString("  ")).append('\n')
    rows.foreach(r => sb.append(fmt(r)).append('\n'))
    sb.toString
  }

  private def f(x: Double): String = if (x.isNaN) "n/a" else f"$x%.4f"
  private def ms(x: Double): String = if (x.isNaN) "n/a" else f"$x%.1f"

  def evalRowsToTable(title: String, keyName: String,
                      rows: Seq[(String, EvalRow)]): String =
    formatTable(title,
      Seq(keyName, "algo", "medNMI", "medARI", "medF1", "meanMs", "meanSize", "fails"),
      rows.map { case (kv, r) =>
        Seq(kv, r.algo, f(r.medNmi), f(r.medAri), f(r.medF1), ms(r.meanMs),
          ms(r.meanSize), r.fails.toString)
      })

  // ------------------------------------------------- Table 1: dataset stats
  def table1(scale: Double = 1.0): String = {
    val paper = Map(
      "dolphin-standin" -> (62, 159, 2), "karate" -> (34, 78, 2),
      "polblogs-standin" -> (1224, 16718, 2), "mexican-standin" -> (35, 117, 2),
      "dblp-lite" -> (317080, 1049866, 13477), "youtube-lite" -> (1134890, 2987624, 8385),
      "livejournal-lite" -> (3997962, 34681189, 287512))
    val ds = Seq(GraphGen.karate, GraphGen.dolphinStandIn(), GraphGen.mexicanStandIn(),
      GraphGen.polblogsStandIn(), GraphGen.dblpLite(scale), GraphGen.youtubeLite(scale),
      GraphGen.livejournalLite(scale))
    formatTable("Table 1: real-world datasets (stand-ins; paper values alongside)",
      Seq("dataset", "|V|", "|E|", "|C|", "paper|V|", "paper|E|", "paper|C|"),
      ds.map { g =>
        val (pv, pe, pc) = paper(g.name)
        Seq(g.name, g.graph.n.toString, g.graph.m.toString, g.communities.length.toString,
          pv.toString, pe.toString, pc.toString)
      })
  }

  // ---------------------------------------- Table 2: LFR realized statistics
  def table2(n: Int = 3000, seed: Long = 7): String = {
    val configs =
      Seq(20, 30, 40, 50).map(d => (s"davg=$d", d.toDouble, 200, 0.4)) ++
      Seq(200, 300, 400, 500).map(dm => (s"dmax=$dm", 40.0, dm, 0.4)) ++
      Seq(0.2, 0.3, 0.4).map(mu => (s"mu=$mu", 40.0, 200, mu))
    val rows = configs.map { case (label, davg, dmax, mu) =>
      val gt = GraphGen.lfr(n, davg, dmax, mu, minC = 20, maxC = 1000, seed)
      val g = gt.graph
      val realMu = {
        var ext = 0L
        g.edges.foreach { case (u, v) => if (gt.labels(u) != gt.labels(v)) ext += 1 }
        ext.toDouble / math.max(1, g.m)
      }
      Seq(label, g.n.toString, g.m.toString, f"${2.0 * g.m / g.n}%.1f",
        g.degree.max.toString, f"$realMu%.3f", gt.communities.length.toString,
        gt.communities.map(_.size).min.toString, gt.communities.map(_.size).max.toString)
    }
    formatTable(s"Table 2: LFR realized stats (n=$n; paper targets in row label)",
      Seq("config", "n", "m", "davgReal", "dmaxReal", "muReal", "|C|", "minC", "maxC"), rows)
  }

  // -------------------------------------------- Figs 8/9: synthetic sweeps
  def syntheticSweep(n: Int = 3000, nQuerySets: Int = 5, qSize: Int = 2,
                     seed: Long = 42, includeNca: Boolean = true): String = {
    val settings =
      Seq(0.2, 0.3, 0.4).map(mu => (s"mu=$mu", 40.0, 200, mu)) ++
      Seq(20, 30, 50).map(d => (s"davg=$d", d.toDouble, 200, 0.4)) ++
      Seq(300, 400, 500).map(dm => (s"dmax=$dm", 40.0, dm, 0.4))
    val out = new StringBuilder
    val allRows = mutable.ArrayBuffer.empty[(String, EvalRow)]
    for ((label, davg, dmax, mu) <- settings) {
      val gt = GraphGen.lfr(n, davg, dmax, mu, minC = 20, maxC = 1000, seed)
      val ctx = new GraphCtx(gt.graph)
      val qs = QueryGen.querySets(gt, ctx, nQuerySets, qSize, seed + label.hashCode)
      evaluate(gt, ctx, coreAlgos(includeNca = includeNca), qs)
        .foreach(r => allRows += ((label, r)))
    }
    out.append(evalRowsToTable(
      s"Figs 8/9: effectiveness & efficiency on LFR (n=$n, $nQuerySets query sets, |Q|=$qSize)",
      "setting", allRows.toSeq))
    out.toString
  }

  // --------------------------------------------------- Fig 10: effect of |Q|
  def querySetSize(n: Int = 3000, sizes: Seq[Int] = Seq(1, 2, 4, 8),
                   nQuerySets: Int = 5, seed: Long = 43): String = {
    val gt = GraphGen.lfr(n, 40.0, 200, 0.4, 20, 1000, seed)
    val ctx = new GraphCtx(gt.graph)
    val algos = Seq(
      Algo("kc", (c, q) => CoreTruss.kc(c, q, 3)),
      Algo("kecc", (c, q) => KEcc.kecc(c.g, q, 3)),
      peelerAlgo("NCA", (g, q) => Peeler.nca(g, q)),
      peelerAlgo("FPA", (g, q) => Peeler.fpa(g, q)))
    val rows = for {
      s <- sizes
      qs = QueryGen.querySets(gt, ctx, nQuerySets, s, seed + s)
      r <- evaluate(gt, ctx, algos, qs)
    } yield (s"|Q|=$s", r)
    evalRowsToTable(s"Fig 10: effect of |Q| (LFR n=$n)", "|Q|", rows)
  }

  // ------------------------------------------------- Fig 11: scalability
  def scalability(spark: SparkSession, sizes: Seq[Int] = Seq(10000, 25000, 50000, 100000),
                  ncaUpTo: Int = 10000, seed: Long = 44): String = {
    val rows = mutable.ArrayBuffer.empty[Seq[String]]
    for (n <- sizes) {
      val gt = GraphGen.lfr(n, 20.0, 200, 0.4, 20, 1000, seed)
      val ctx = new GraphCtx(gt.graph)
      val qs = QueryGen.querySets(gt, ctx, nSets = 2, qSize = 1, seed = seed + n)
      def time(body: => Any): Double = {
        val t0 = System.nanoTime(); body; (System.nanoTime() - t0) / 1e6
      }
      ctx.core // warm the decomposition shared by kc/highcore
      val tKc = Metrics.mean(qs.map { case (q, _) => time(CoreTruss.kc(ctx, q, 3)) })
      val tHc = Metrics.mean(qs.map { case (q, _) => time(CoreTruss.highcore(ctx, q)) })
      val tFpa = Metrics.mean(qs.map { case (q, _) => time(Peeler.fpa(ctx.g, q)) })
      val tNca =
        if (n <= ncaUpTo) Metrics.mean(qs.map { case (q, _) => time(Peeler.nca(ctx.g, q)) })
        else Double.NaN
      val edges = GraphFrames.edgeDF(spark, ctx.g).cache()
      edges.count()
      val tSpark = Metrics.mean(qs.map { case (q, _) =>
        time(SparkDMCS.fpa(spark, edges, q.map(_.toLong)))
      })
      edges.unpersist()
      rows += Seq(n.toString, ms(tKc), ms(tHc), ms(tFpa), ms(tNca), ms(tSpark))
    }
    formatTable("Fig 11: scalability (mean ms per query)",
      Seq("n", "kc", "highcore", "FPA(local)", "NCA", "FPA(spark)"), rows.toSeq)
  }

  // ------------------------------------- Fig 12: which modularity to optimize
  def modularityMeasures(n: Int = 3000, nQuerySets: Int = 10, seed: Long = 45): String = {
    val gt = GraphGen.lfr(n, 40.0, 200, 0.4, 20, 1000, seed)
    val ctx = new GraphCtx(gt.graph)
    val qs = QueryGen.querySets(gt, ctx, nQuerySets, qSize = 2, seed)
    // un-pruned FPA: the objective sees the full chain of intermediates, so
    // classic modularity's preference for large communities (resolution
    // limit) is visible, as in the paper
    val algos = Seq(
      peelerAlgo("FPA-DM", (g, q) => Peeler.fpaNoPrune(g, q, Peeler.DmObjective)),
      peelerAlgo("FPA-CM", (g, q) => Peeler.fpaNoPrune(g, q, Peeler.CmObjective)),
      peelerAlgo("FPA-GMD", (g, q) => Peeler.fpaNoPrune(g, q, Peeler.GmdObjective)))
    val rows = evaluate(gt, ctx, algos, qs).map(r => ("default", r))
    val sizeDm = rows.find(_._2.algo == "FPA-DM").map(_._2.meanSize).getOrElse(Double.NaN)
    val sizeCm = rows.find(_._2.algo == "FPA-CM").map(_._2.meanSize).getOrElse(Double.NaN)
    evalRowsToTable("Fig 12: objective used to select the best subgraph", "setting", rows) +
      f"size ratio CM/DM = ${sizeCm / sizeDm}%.1f (paper: 18x)\n"
  }

  // ----------------------------------------------- Fig 13: pruning strategy
  def pruning(n: Int = 3000, nQuerySets: Int = 10, seed: Long = 46): String = {
    val gt = GraphGen.lfr(n, 40.0, 200, 0.4, 20, 1000, seed)
    val ctx = new GraphCtx(gt.graph)
    val qs = QueryGen.querySets(gt, ctx, nQuerySets, qSize = 2, seed)
    val algos = Seq(
      peelerAlgo("FPA", (g, q) => Peeler.fpa(g, q)),
      peelerAlgo("FPA-noprune", (g, q) => Peeler.fpaNoPrune(g, q)))
    evalRowsToTable("Fig 13: layer-based pruning", "setting",
      evaluate(gt, ctx, algos, qs).map(("default", _)))
  }

  // -------------------------------------------------- Fig 14: variants
  def variants(n: Int = 3000, nQuerySets: Int = 5, seed: Long = 47): String = {
    val gt = GraphGen.lfr(n, 40.0, 200, 0.4, 20, 1000, seed)
    val ctx = new GraphCtx(gt.graph)
    val qs = QueryGen.querySets(gt, ctx, nQuerySets, qSize = 2, seed)
    val algos = Seq(
      peelerAlgo("NCA", (g, q) => Peeler.nca(g, q)),
      peelerAlgo("NCA-DR", (g, q) => Peeler.ncaDR(g, q)),
      peelerAlgo("FPA-DMG", (g, q) => Peeler.fpaDMG(g, q)),
      peelerAlgo("FPA", (g, q) => Peeler.fpa(g, q)),
      // no-pruning versions expose the cost of Λ's instability (the paper's
      // 150x gap): with pruning the candidate layer is tiny and hides it
      peelerAlgo("FPA-DMG-np", (g, q) =>
        Peeler.run(g, q, Peeler.FarthestLayer, Peeler.DMGain, layerPrune = false)),
      peelerAlgo("FPA-np", (g, q) => Peeler.fpaNoPrune(g, q)))
    evalRowsToTable("Fig 14: variants (a/b x c/d)", "setting",
      evaluate(gt, ctx, algos, qs).map(("default", _)))
  }

  // ------------------------------------- Figs 15/16: small real-world graphs
  def smallRealWorld(nQuerySets: Int = 10, seed: Long = 48): String = {
    val ds = Seq(GraphGen.karate, GraphGen.dolphinStandIn(), GraphGen.mexicanStandIn(),
      GraphGen.polblogsStandIn())
    val rows = mutable.ArrayBuffer.empty[(String, EvalRow)]
    for (gt <- ds) {
      val ctx = new GraphCtx(gt.graph)
      val qs = QueryGen.querySets(gt, ctx, nQuerySets, qSize = 1, seed, minTruss = 4)
      // paper: GN does not finish Polblogs within 24h; mirror with a budget
      val isBig = gt.graph.n > 500
      val algos = coreAlgos() ++ smallExtras(includeGn = !isBig)
      evaluate(gt, ctx, algos, qs).foreach(r => rows += ((gt.name, r)))
      if (isBig) rows += ((gt.name, EvalRow("GN", Double.NaN, Double.NaN, Double.NaN,
        Double.NaN, Double.NaN, nQuerySets)))
    }
    evalRowsToTable("Figs 15/16: graphs with distinct communities", "dataset", rows.toSeq)
  }

  // --------------------------- Figs 17/18: overlapping/real-world (lite) sets
  def overlappingRealWorld(scale: Double = 1.0, nQuerySets: Int = 10,
                           seed: Long = 49): String = {
    val ds = Seq(GraphGen.dblpLite(scale), GraphGen.youtubeLite(scale),
      GraphGen.livejournalLite(scale))
    val rows = mutable.ArrayBuffer.empty[(String, EvalRow)]
    for (gt <- ds) {
      val ctx = new GraphCtx(gt.graph)
      val qs = QueryGen.querySets(gt, ctx, nQuerySets, qSize = 1, seed, minTruss = 4)
      val algos = coreAlgos(includeNca = false)
      evaluate(gt, ctx, algos, qs).foreach(r => rows += ((gt.name, r)))
    }
    evalRowsToTable("Figs 17/18: overlapping-community datasets (lite stand-ins)",
      "dataset", rows.toSeq)
  }

  // ------------------------------------------------------ Fig 19: varying k
  def varyK(scale: Double = 1.0, ks: Seq[Int] = Seq(3, 4, 5, 6, 7),
            nQuerySets: Int = 10, seed: Long = 50): String = {
    val ds = Seq(GraphGen.dblpLite(scale), GraphGen.youtubeLite(scale))
    val rows = mutable.ArrayBuffer.empty[(String, EvalRow)]
    for (gt <- ds) {
      val ctx = new GraphCtx(gt.graph)
      val qs = QueryGen.querySets(gt, ctx, nQuerySets, qSize = 1, seed, minTruss = 4)
      for (k <- ks) {
        val algos = Seq(
          Algo(s"kc(k=$k)", (c, q) => CoreTruss.kc(c, q, k)),
          Algo(s"kecc(k=$k)", (c, q) => KEcc.kecc(c.g, q, k)),
          Algo(s"kt(k=$k)", (c, q) => CoreTruss.kt(c, q, k)))
        evaluate(gt, ctx, algos, qs).foreach(r => rows += ((gt.name, r)))
      }
      evaluate(gt, ctx, Seq(peelerAlgo("FPA", (g, q) => Peeler.fpa(g, q))), qs)
        .foreach(r => rows += ((gt.name, r)))
    }
    evalRowsToTable("Fig 19: effect of the user parameter k", "dataset", rows.toSeq)
  }

  // ----------------------------------------------- §6.3.2 case study (hub)
  def caseStudy(scale: Double = 1.0, seed: Long = 51): String = {
    val gt = GraphGen.dblpLite(scale, seed)
    val g = gt.graph
    val ctx = new GraphCtx(g)
    val q = (0 until g.n).maxBy(g.degree(_))
    val fpa = Peeler.fpa(g, Seq(q)).community
    val kt3 = CoreTruss.kt(ctx, Seq(q), 3).getOrElse(Set(q))
    val kc3 = CoreTruss.kc(ctx, Seq(q), 3).getOrElse(Set(q))
    def stats(name: String, c: Set[Int]): Seq[String] = {
      val others = c - q
      val adjFrac =
        if (others.isEmpty) 1.0
        else g.adj(q).count(others.contains).toDouble / others.size
      val bs = mutable.BitSet.empty; c.foreach(bs += _)
      val bet = Centrality.betweenness(g, bs)
      val eig = Centrality.eigen(g, bs)
      def rank(m: mutable.HashMap[Int, Double]): Int =
        1 + m.count { case (v, x) => v != q && x > m(q) }
      Seq(name, c.size.toString, f"$adjFrac%.3f", rank(bet).toString, rank(eig).toString)
    }
    formatTable(s"Case study: query = max-degree hub (node $q, deg=${g.degree(q)}) on ${gt.name}",
      Seq("community", "size", "fracAdjToQ", "betweennessRank", "eigenRank"),
      Seq(stats("FPA", fpa), stats("3-truss", kt3), stats("3-core", kc3)))
  }
}
