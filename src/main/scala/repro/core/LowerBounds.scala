package repro.core

import repro.graph.{Dijkstra, RoadGraph, SearchMetrics}
import repro.semantics.CategoryForest

/** Possible minimum distances of Def. 5.7 — the semantic-match (`l_s`) and
  * perfect-match (`l_p`) lower bounds on the length a route must still gain
  * per remaining leg, computed with the multi-source multi-destination
  * Dijkstra (Lemma 5.9) over PoI sets restricted to the `l̄(φ)` ball around
  * the start (Algorithm 4). Shared by the sequential BSSR and the Spark
  * pipeline so both prune with identical bounds.
  */
object LowerBounds {

  /** Convenience wrapper for a plain category-sequence query. */
  def legs(
      g: RoadGraph,
      forest: CategoryForest,
      query: Query,
      thr0: Double,
      metrics: SearchMetrics = null,
  ): (Array[Double], Array[Double]) = {
    val simPos = query.categories.toArray.map(c =>
      PositionSpec.simTable(forest, PositionSpec.simple(c)))
    legsTables(g, simPos, query.start, thr0, metrics)
  }

  /** (legS, legP), each of length k: entries 1..k-1 are the leg bounds
    * between positions i and i+1 (index 0 unused and 0.0). A leg is +∞ when
    * no qualifying pair exists — every completion through it is prunable.
    * "Semantic match" is `sim > 0` under the position's table; "perfect
    * match" is `sim == 1` (for a plain position that is exactly the queried
    * category, Eq. 5).
    */
  def legsTables(
      g: RoadGraph,
      simPos: Array[Array[Double]],
      start: Int,
      thr0: Double,
      metrics: SearchMetrics = null,
  ): (Array[Double], Array[Double]) = {
    val k = simPos.length
    val legS = Array.fill(k)(0.0)
    val legP = Array.fill(k)(0.0)
    if (k >= 2) {
      val dv = Dijkstra.fromSource(g, start, thr0, metrics)
      def inBall(v: Int) = dv(v) <= thr0
      def simOf(i: Int, v: Int): Double = {
        val c = g.poiCategory(v)
        if (c < 0) 0.0 else simPos(i)(c)
      }
      for (i <- 1 until k) {
        val srcs = g.pois.filter(p => simOf(i - 1, p) > 0 && inBall(p))
        legS(i) = Dijkstra.multiSourceMinDist(
          g, srcs, v => simOf(i, v) > 0 && inBall(v),
          bound = thr0, metrics = metrics)
        legP(i) = Dijkstra.multiSourceMinDist(
          g, srcs, v => simOf(i, v) == 1.0 && inBall(v),
          bound = thr0, metrics = metrics)
      }
    }
    (legS, legP)
  }

  /** Suffix sums: `suffix(s) = Σ_{i=s}^{k-1} leg(i)` — the minimum extra
    * length any size-`s` partial route needs to become sequenced.
    */
  def suffixSums(leg: Array[Double]): Array[Double] = {
    val k = leg.length
    val suf = Array.fill(k + 1)(0.0)
    for (s <- (1 until k).reverse) suf(s) = suf(s + 1) + leg(s)
    if (k >= 1) suf(0) = suf(1)
    suf
  }
}
