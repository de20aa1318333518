package repro.bench

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.baselines.{BaselineMetrics, IterativeOsr}
import repro.data.{Datasets, PaperExample, Workload}
import repro.graph.RoadGraph
import repro.semantics.CategoryForest

/** Generators for every table of the paper's evaluation (§7) — each returns
  * the formatted table plus machine-checkable rows so the bench suites can
  * assert the paper's qualitative shape and `EXPERIMENTS.md` can record
  * paper-vs-measured numbers. Shared by `bench/` suites and `jobs/`
  * entrypoints.
  */
object Tables {

  /** Degrees → meters, for the qualitative route tables (1 and 9). */
  private val MetersPerDegree = 111000.0

  // ------------------------------------------------------------------ T5 --
  final case class T5Row(name: String, v: Int, p: Int, e: Int,
                         paperV: Int, paperP: Int, paperE: Int)

  def table5(): (String, Seq[T5Row]) = {
    val paper = Map(
      "Tokyo" -> (401893, 174421, 499397),
      "NYC"   -> (1150744, 451051, 1722350),
      "Cal"   -> (21048, 87365, 108863))
    val rows = Datasets.all.map { case (name, g, _) =>
      val (pv, pp, pe) = paper(name)
      T5Row(name, g.numVertices - g.numPois, g.numPois, g.numEdges, pv, pp, pe)
    }
    val txt = BenchUtil.table("Table 5: datasets (ours vs paper)",
      Seq("Dataset", "|V|", "|P|", "|E|", "paper |V|", "paper |P|", "paper |E|"),
      rows.map(r => Seq(r.name, r.v.toString, r.p.toString, r.e.toString,
        r.paperV.toString, r.paperP.toString, r.paperE.toString)))
    (txt, rows)
  }

  // ------------------------------------------------------------------ T7 --
  final case class T7Row(dataset: String, len: Int, weightSum: Double,
                         initMs: Double, nRoutes: Double, ratio: Double,
                         existingWeightSum: Double)

  /** Table 7: effect of the initial search. "Weight sum" is the relaxed-edge
    * weight of the *first* modified Dijkstra; without NNinit that search has
    * no threshold and relaxes the whole graph (2·Σw), regardless of |Sq| —
    * exactly the paper's "Existing ... (regardless |Sq|)" row.
    */
  def table7(lens: Seq[Int] = 2 to 5, queriesPer: Int = 10, seed: Long = 7L)
      : (String, Seq[T7Row]) = {
    val rows = for {
      (name, g, forest) <- Datasets.all
      len <- lens
    } yield {
      val qs = Workload.queries(g, forest, queriesPer, len, seed + len, minPois = 10)
      val bssr = new Bssr(g, forest)
      val ms = qs.map(q => bssr.run(q).metrics)
      T7Row(name, len,
        avg(ms.map(_.firstSearchWeightSum)),
        avg(ms.map(_.initTimeNanos.toDouble)) / 1e6,
        avg(ms.map(_.initRoutes.toDouble)),
        avg(ms.filter(m => !m.initRatio.isNaN).map(_.initRatio)),
        2.0 * g.totalWeight)
    }
    val txt = BenchUtil.table(
      "Table 7: effect of initial search (proposed; Existing = whole-graph weight sum)",
      Seq("Dataset", "|Sq|", "Weight sum", "NNinit ms", "# routes", "Ratio", "Existing w.s."),
      rows.map(r => Seq(r.dataset, r.len.toString, f"${r.weightSum}%.4f",
        f"${r.initMs}%.2f", f"${r.nRoutes}%.2f", f"${r.ratio}%.2f",
        f"${r.existingWeightSum}%.2f")))
    (txt, rows)
  }

  // ------------------------------------------------------------------ T8 --
  final case class T8Row(dataset: String, len: Int, proposed: Long, distanceBased: Long)

  /** Table 8: vertices visited with the proposed priority queue vs a
    * conventional distance-based one.
    */
  def table8(lens: Seq[Int] = 2 to 5, queriesPer: Int = 6, seed: Long = 8L)
      : (String, Seq[T8Row]) = {
    val rows = for {
      (name, g, forest) <- Datasets.all
      len <- lens
    } yield {
      val qs = Workload.queries(g, forest, queriesPer, len, seed + len, minPois = 10)
      val prop = new Bssr(g, forest, BssrOptions.all.copy(maxSettled = 20_000_000L))
      val dist = new Bssr(g, forest, BssrOptions(proposedQueue = false, maxSettled = 20_000_000L))
      val a = qs.map(q => prop.run(q).metrics.settled).sum / qs.size
      val b = qs.map(q => dist.run(q).metrics.settled).sum / qs.size
      T8Row(name, len, a, b)
    }
    val txt = BenchUtil.table("Table 8: vertices visited by priority-queue policy",
      Seq("Dataset", "|Sq|", "Proposed", "Distance-based"),
      rows.map(r => Seq(r.dataset, r.len.toString, r.proposed.toString, r.distanceBased.toString)))
    (txt, rows)
  }

  // ------------------------------------------------------------------ T6 --
  final case class T6Row(dataset: String, algo: String, graphBytes: Long,
                         peakRoutes: Int, modelBytes: Long, aborted: Boolean)

  /** Table 6: memory at |Sq| = 4. The paper reports per-process RSS; inside
    * one shared JVM we report a retained-bytes model instead (DESIGN.md §4):
    * graph footprint + peak queued route entries × per-entry cost (+ live
    * NN-search state for PNE, + layer tables for Dij). The mechanism the
    * paper highlights — Dij's queue carries whole routes and dwarfs
    * BSSR's/PNE's — shows up in the `peak routes` column.
    */
  def table6(queriesPer: Int = 2, seed: Long = 6L, cap: Long = 10_000_000L)
      : (String, Seq[T6Row]) = {
    val rows = Datasets.all.flatMap { case (name, g, forest) =>
      val qs = Workload.queries(g, forest, queriesPer, 4, seed, minPois = 10)
      val gBytes  = BenchUtil.graphBytes(g)
      val entryB  = BenchUtil.routeEntryBytes(2.5)
      def bssrRow(algo: String, o: BssrOptions): T6Row = {
        val ms = qs.map(new Bssr(g, forest, o.copy(maxSettled = cap)).run(_).metrics)
        val q  = ms.map(_.peakQueueSize).max
        T6Row(name, algo, gBytes, q, gBytes + q * entryB, ms.exists(_.aborted))
      }
      def baseRow(algo: String, useDij: Boolean): T6Row = {
        val ms = qs.map { q =>
          val m = new BaselineMetrics
          IterativeOsr.skySR(g, forest, q, useDij, m, maxSettled = cap)
          m
        }
        val q      = ms.map(_.peakQueueSize).max
        val nns    = if (useDij) 0L else ms.map(_.peakNnBytes).max
        val layers = if (useDij) 5L * g.numVertices else 0L
        T6Row(name, algo, gBytes, q, gBytes + q * entryB + nns + layers,
          ms.exists(_.aborted))
      }
      Seq(bssrRow("BSSR", BssrOptions.all), bssrRow("BSSR w/o Opt", BssrOptions.none),
        baseRow("PNE", useDij = false), baseRow("Dij", useDij = true))
    }
    val txt = BenchUtil.table(
      "Table 6: memory model (|Sq|=4; graph + peak live search state)",
      Seq("Dataset", "Algorithm", "Graph", "Peak routes", "Model", "Capped?"),
      rows.map(r => Seq(r.dataset, r.algo, BenchUtil.mb(r.graphBytes),
        r.peakRoutes.toString, BenchUtil.mb(r.modelBytes),
        if (r.aborted) "yes" else "no")))
    (txt, rows)
  }

  // ------------------------------------------- response time / # SkySRs --
  final case class RtRow(dataset: String, len: Int, algo: String,
                         avgMs: Double, aborted: Boolean, avgSkySRs: Double)

  /** Fig. 3 / Fig. 6 shapes: response time per algorithm and the number of
    * SkySRs, per dataset and |Sq|. Budget-capped baselines report `>cap`
    * (the paper's runs that "were not finished after a month").
    */
  def responseTime(lens: Seq[Int] = 2 to 5, queriesPer: Int = 2, seed: Long = 3L,
                   cap: Long = 10_000_000L): (String, Seq[RtRow]) = {
    // JIT warmup so the first measured cell is not dominated by compilation
    locally {
      val (_, g, forest) = Datasets.all.head
      val q = Workload.queries(g, forest, 1, 2, 999L, minPois = 10).head
      new Bssr(g, forest).run(q)
      new Bssr(g, forest, BssrOptions.none.copy(maxSettled = 200000)).run(q)
      IterativeOsr.skySR(g, forest, q, useDij = true, new BaselineMetrics, 200000)
      IterativeOsr.skySR(g, forest, q, useDij = false, new BaselineMetrics, 200000)
    }
    val rows = for {
      (name, g, forest) <- Datasets.all
      len <- lens
      row <- {
        val qs = Workload.queries(g, forest, queriesPer, len, seed + len, minPois = 10)
        def bssrRow(algo: String, o: BssrOptions): RtRow = {
          val res = qs.map(new Bssr(g, forest, o.copy(maxSettled = cap)).run(_))
          RtRow(name, len, algo, avg(res.map(_.metrics.totalTimeNanos.toDouble)) / 1e6,
            res.exists(_.metrics.aborted), avg(res.map(_.skyline.size.toDouble)))
        }
        def baseRow(algo: String, useDij: Boolean): RtRow = {
          val res = qs.map { q =>
            val m = new BaselineMetrics
            val s = IterativeOsr.skySR(g, forest, q, useDij, m, maxSettled = cap)
            (m, s)
          }
          RtRow(name, len, algo, avg(res.map(_._1.totalTimeNanos.toDouble)) / 1e6,
            res.exists(_._1.aborted), avg(res.map(_._2.size.toDouble)))
        }
        val base =
          Seq(bssrRow("BSSR", BssrOptions.all), bssrRow("BSSR w/o Opt", BssrOptions.none))
        // mirror the paper's missing bars: baselines only up to |Sq|=4
        if (len <= 4) base ++ Seq(baseRow("PNE", useDij = false), baseRow("Dij", useDij = true))
        else base
      }
    } yield row
    val txt = BenchUtil.table("Response time (Fig. 3 shape) and # SkySRs (Fig. 6 shape)",
      Seq("Dataset", "|Sq|", "Algorithm", "Avg ms", "Capped?", "# SkySRs"),
      rows.map(r => Seq(r.dataset, r.len.toString, r.algo,
        if (r.aborted) f">${r.avgMs}%.1f (cap)" else f"${r.avgMs}%.1f",
        if (r.aborted) "yes" else "no", f"${r.avgSkySRs}%.2f")))
    (txt, rows)
  }

  // -------------------------------------------------------------- T1/T9 --
  final case class RouteRow(meters: Double, names: Seq[String], sem: Double)

  /** A named-category SkySR query answered with the Spark pipeline (when a
    * session is given) or sequential BSSR; rows mirror Tables 1/9.
    */
  def namedQuery(
      g: RoadGraph,
      forest: CategoryForest,
      categories: Seq[String],
      startSeed: Long,
      spark: Option[SparkSession] = None,
  ): (Query, Seq[RouteRow]) = {
    val cats = categories.map(forest.idOf).toVector
    cats.foreach(c => require(g.poisByCategory.contains(c),
      s"no PoIs with category ${forest.nameOf(c)} — regenerate dataset"))
    val rnd = new scala.util.Random(startSeed)
    var start = rnd.nextInt(g.numVertices)
    while (g.isPoi(start)) start = rnd.nextInt(g.numVertices)
    val q = Query(start, cats)
    val sky = spark match {
      case Some(s) => BulkSkySRSpark.run(s, g, forest, q)
      case None    => new Bssr(g, forest).run(q).skyline
    }
    (q, sky.map(r => RouteRow(r.length * MetersPerDegree,
      r.pois.map(p => forest.nameOf(g.poiCategory(p))), r.semScore)))
  }

  def table1(spark: Option[SparkSession] = None): (String, Seq[RouteRow]) = {
    val (_, rows) = namedQuery(Datasets.nycLite, CategoryForest.foursquareLike,
      Seq("Cupcake Shop", "Art Museum", "Jazz Club"), startSeed = 21L, spark)
    (routeTable("Table 1: example SkySRs in NYC ⟨Cupcake Shop, Art Museum, Jazz Club⟩", rows), rows)
  }

  def table9(spark: Option[SparkSession] = None): (String, Seq[RouteRow]) = {
    val (_, rows) = namedQuery(Datasets.tokyoLite, CategoryForest.foursquareLike,
      Seq("Beer Garden", "Sushi Restaurant", "Sake Bar"), startSeed = 9L, spark)
    (routeTable("Table 9: example SkySRs in Tokyo ⟨Beer Garden, Sushi Restaurant, Sake Bar⟩", rows), rows)
  }

  private def routeTable(title: String, rows: Seq[RouteRow]): String =
    BenchUtil.table(title, Seq("Distance", "Sequenced route", "Semantic score"),
      rows.map(r => Seq(f"${r.meters}%.0f meters", r.names.mkString(" -> "), f"${r.sem}%.3f")))

  // ------------------------------------------------------------------ T4 --
  /** Table 4: the worked example's final state (full 12-step trace is
    * asserted in `PaperExampleSpec`).
    */
  def table4(): (String, Vector[SRoute]) = {
    val res = new Bssr(PaperExample.graph, PaperExample.forest).run(PaperExample.query)
    val txt = BenchUtil.table("Table 4 (final state): BSSR on the Fig. 1 example",
      Seq("Route", "Length", "Semantic"),
      res.skyline.map(r => Seq(
        r.pois.map(p => s"p$p").mkString("<", ",", ">"), f"${r.length}%.1f", f"${r.semScore}%.2f")))
    (txt, res.skyline)
  }

  private def avg(xs: Seq[Double]): Double = if (xs.isEmpty) 0.0 else xs.sum / xs.size
}
