package repro.core

import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.graph.{Dijkstra, PoiDistances, RoadGraph}
import repro.semantics.CategoryForest

/** The distributed dataflow rendering of bulk SkySR search: iterative
  * DataFrame joins over the PoI graph with semantic-hierarchy filters and
  * per-level skyline pruning (the `repro=4` calibration mapping; DESIGN.md
  * §2). Exact — verified against `Bssr` and `Exhaustive` in the tests.
  *
  * Phases:
  *  1. Seed upper bounds with NNinit on the driver (the same §5.3.1
  *     optimization BSSR uses); `L0` = best perfect-match length.
  *  2. Build the PoI graph distributedly: bounded Dijkstras from the start
  *     and every semantically matching PoI, in parallel over a broadcast
  *     CSR ([[repro.graph.PoiDistances]]).
  *  3. Grow routes level-synchronously with Catalyst: join the frontier
  *     with the PoI graph and the level's similarity table, then prune —
  *     (a) globally via Lemma 5.3 against `L0` plus the `l_s` suffix bounds
  *     of Def. 5.7, and (b) per end-PoI with a window-function skyline
  *     (routes ending at the same PoI at the same level share all futures,
  *     so dominance among them is safe).
  *  4. Collect the complete routes, union the NNinit seeds, and take the
  *     final minimal skyline.
  */
object BulkSkySRSpark {

  def run(
      spark: SparkSession,
      g: RoadGraph,
      forest: CategoryForest,
      query: Query,
  ): Vector[SRoute] = {
    import spark.implicits._
    val k = query.size

    // Phase 1: driver-side NNinit seeds (upper bound L0, Lemma 5.3). Seeds
    // and L0 already include the §6 destination leg when one is given.
    val sky = new SkylineSet
    val seeds = NNInit.run(g, forest, query, sky)
    val l0 = sky.thresholdFor(0.0)
    val distToDest = query.destination.map(d => Dijkstra.fromSource(g.transpose, d))

    // Lower-bound suffixes (Def. 5.7) shared with the sequential BSSR.
    val (legS, _) = LowerBounds.legs(g, forest, query, l0)
    val lsSuf = LowerBounds.suffixSums(legS)

    // Phase 2: PoI graph restricted to the L0 ball around the start.
    val simPos: Array[Array[Double]] = Array.tabulate(k) { i =>
      Array.tabulate(forest.size)(c => forest.sim(query.categories(i), c))
    }
    val matchCats: Array[Set[Int]] = Array.tabulate(k) { i =>
      forest.categories.filter(c => simPos(i)(c) > 0.0).toSet
    }
    val dv = Dijkstra.fromSource(g, query.start, l0)
    val sourcePois: Seq[Int] =
      (0 until k - 1).flatMap(i => g.pois.filter { p =>
        matchCats(i).contains(g.poiCategory(p)) && dv(p) <= l0
      }).distinct
    val allTargets = matchCats.reduce(_ ++ _)
    val poiDist = PoiDistances
      .build(spark, g, query.start +: sourcePois, allTargets, l0)
      .cache()

    // Per-position similarity table (the semantic hierarchy filter).
    val posSim = (0 until k).flatMap { i =>
      forest.categories.collect { case c if simPos(i)(c) > 0.0 => (i, c, simPos(i)(c)) }
    }.toDF("pos", "cat", "sim")
    val poiCat = g.pois.map(p => (p, g.poiCategory(p))).toSeq.toDF("poi", "poicat")
    val posPoi = posSim
      .join(poiCat, $"cat" === $"poicat")
      .select($"pos", $"poi", $"sim")
      .cache()

    // Phase 3: level-synchronous growth.
    var routes: DataFrame = Seq((Array.empty[Int], query.start, 0.0, 1.0))
      .toDF("pois", "endV", "len", "prod")
    for (i <- 0 until k) {
      val frontier = routes.alias("r")
      val joined = frontier
        .join(poiDist.alias("d"), col("r.endV") === col("d.src"))
        .join(posPoi.where($"pos" === i).alias("m"), col("d.dst") === col("m.poi"))
        .where(!array_contains(col("r.pois"), col("d.dst")))
        .select(
          concat(col("r.pois"), array(col("d.dst"))) as "pois",
          col("d.dst") as "endV",
          (col("r.len") + col("d.dist")) as "len",
          (col("r.prod") * col("m.sim")) as "prod",
        )
      // Global branch-and-bound filter (Lemma 5.3 with the s=0 seed route).
      val bounded =
        if (l0.isInfinity) joined
        else if (i < k - 1) joined.where($"len" + lit(lsSuf(i + 1)) < lit(l0))
        else joined.where($"len" <= lit(l0))
      val treesDistinct =
        query.categories.map(forest.treeOf).distinct.size == k
      routes =
        if (i < k - 1) skylinePerEnd(bounded, includeUsedSet = !treesDistinct)
        else bounded
    }

    val complete = routes.select("pois", "len", "prod").collect().toVector
      .map { r =>
        SRoute(r.getAs[scala.collection.Seq[Int]]("pois").toVector,
          r.getDouble(1), r.getDouble(2))
      }
      .flatMap { r => // destination leg (drop routes that cannot reach it)
        distToDest match {
          case None => Some(r)
          case Some(dd) =>
            val leg = dd(r.end)
            if (leg.isInfinity) None
            else Some(SRoute(r.pois, r.length + leg, r.simProduct))
        }
      }
    poiDist.unpersist(); posPoi.unpersist()

    // Phase 4: final minimal skyline over pipeline results + NNinit seeds.
    Skyline.of(complete ++ seeds.filter(_.size == k))
  }

  /** Per-end-PoI skyline prune: among routes of the same level ending at the
    * same PoI, drop any dominated by (or equivalent to) another — their
    * extensions would be dominated pointwise (Lemma 5.2 applied per state).
    */
  private[core] def skylinePerEnd(df: DataFrame, includeUsedSet: Boolean = false): DataFrame = {
    import df.sparkSession.implicits._
    // When some positions share a category tree, two partials with different
    // used-PoI sets have different legal futures (Def. 3.4-iii), so dominance
    // is only safe within identical (endV, used-set) states; with all-distinct
    // trees (the paper's workloads) the used set can never collide with a
    // future position and endV alone is a sound state.
    val state =
      if (includeUsedSet) Seq($"endV", sort_array($"pois")) else Seq($"endV")
    val dedupW = Window.partitionBy(state :+ $"len" :+ $"prod": _*).orderBy($"pois")
    val domW = Window.partitionBy(state: _*)
      .orderBy($"len".asc, $"prod".desc)
      .rowsBetween(Window.unboundedPreceding, -1)
    df.withColumn("rn", row_number().over(dedupW))
      .where($"rn" === 1)
      .drop("rn")
      .withColumn("bestProdBefore", max($"prod").over(domW))
      .where($"bestProdBefore".isNull || $"prod" > $"bestProdBefore")
      .drop("bestProdBefore")
  }
}
