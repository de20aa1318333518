package repro.baselines

import repro.core.{Query, SRoute, Skyline}
import repro.graph.RoadGraph
import repro.semantics.CategoryForest

import scala.collection.mutable

/** The paper's naive SkySR solution (§4): iterate an OSR solver over the
  * exponentially-many relaxations of the category sequence, then skyline-
  * filter the candidate routes.
  *
  * We enumerate per-position *similarity levels* instead of the paper's
  * super-category sequences — the distinct `sim` values realizable in each
  * queried category's tree — and solve a threshold-OSR (`match := sim ≥ h`)
  * per combination. This keeps the result exact for any forest (see
  * DESIGN.md §6) while preserving the baseline's exponential cost shape:
  * the combination count is Π|levels_i|, and levels correspond 1:1 to
  * ancestor depths in balanced trees.
  */
object IterativeOsr {

  /** Distinct positive similarity levels per position, over categories that
    * actually carry PoIs, descending.
    */
  def simLevels(g: RoadGraph, forest: CategoryForest, query: Query): Array[Array[Double]] = {
    val present = g.poisByCategory.keys.toArray
    query.categories.toArray.map { c =>
      val ls = forest.simLevels(c, present).toArray
      ls
    }
  }

  def comboCount(g: RoadGraph, forest: CategoryForest, query: Query): Long =
    simLevels(g, forest, query).map(_.length.toLong).product

  /** Exact SkySR via iterated OSR. `useDij` picks the Dijkstra-based OSR
    * solver, otherwise PNE. Budget caps mark the run `aborted` (the paper's
    * "not finished after a month" bars).
    */
  def skySR(
      g: RoadGraph,
      forest: CategoryForest,
      query: Query,
      useDij: Boolean,
      metrics: BaselineMetrics,
      maxSettled: Long = Long.MaxValue,
  ): Vector[SRoute] = {
    val t0     = System.nanoTime()
    val levels = simLevels(g, forest, query)
    val k      = query.size
    val simTables: Array[Array[Double]] = Array.tabulate(k) { i =>
      Array.tabulate(forest.size)(c => forest.sim(query.categories(i), c))
    }
    val candidates = mutable.ArrayBuffer.empty[SRoute]
    def rec(pos: Int, mins: List[Double]): Unit = {
      if (metrics.aborted) return
      if (pos == k) {
        val matchers = mins.reverse.zipWithIndex.map { case (m, i) =>
          PositionMatcher(m, simTables(i))
        }.toArray
        metrics.osrRuns += 1
        try {
          val r =
            if (useDij) OsrDijkstra.osr(g, query.start, matchers, metrics, maxSettled)
            else OsrPne.osr(g, query.start, matchers, metrics, maxSettled)
          r.foreach(candidates += _)
        } catch { case _: BudgetExceeded => metrics.aborted = true }
      } else levels(pos).foreach(h => rec(pos + 1, h :: mins))
    }
    rec(0, Nil)
    val out = Skyline.of(candidates.toSeq)
    metrics.totalTimeNanos = System.nanoTime() - t0
    out
  }
}
