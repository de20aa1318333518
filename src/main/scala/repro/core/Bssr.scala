package repro.core

import repro.graph.{Dijkstra, RoadGraph, SearchMetrics}
import repro.semantics.CategoryForest

import scala.collection.mutable

/** Switches for BSSR's four optimization techniques (§5.3), so each can be
  * ablated independently (Tables 7–8, Figs. 4–5). `BssrOptions.none` is the
  * paper's "BSSR w/o Opt".
  */
final case class BssrOptions(
    useInit: Boolean = true,          // §5.3.1 NNinit
    proposedQueue: Boolean = true,    // §5.3.2 size/semantic/length priority
    useLowerBound: Boolean = true,    // §5.3.3 possible minimum distances
    useCache: Boolean = true,         // §5.3.4 on-the-fly caching
    maxSettled: Long = Long.MaxValue, // budget cap (the paper's one-month timeout)
)

object BssrOptions {
  val all: BssrOptions  = BssrOptions()
  val none: BssrOptions = BssrOptions(useInit = false, proposedQueue = false,
    useLowerBound = false, useCache = false)
}

/** Instrumentation for the evaluation tables. */
final class BssrMetrics {
  val search = new SearchMetrics   // settled/relaxed/weightSum over every search
  var firstSearchWeightSum: Double = 0.0 // Table 7 "weight sum" (first mDijkstra)
  var mDijkstraRuns: Long  = 0L          // Fig. 5 (number of Dijkstra executions)
  var cacheHits: Long      = 0L
  var peakQueueSize: Int   = 0           // Table 6 memory model input
  var routesEnqueued: Long = 0L
  var routesDequeued: Long = 0L
  var initTimeNanos: Long  = 0L          // Table 7 "response time" of NNinit
  var initRoutes: Int      = 0           // Table 7 "# of routes"
  var initRatio: Double    = Double.NaN  // Table 7 "ratio"
  var totalTimeNanos: Long = 0L
  var aborted: Boolean     = false       // budget cap hit — result inexact
  var legS: Array[Double]  = Array.empty // possible minimum distances (Def. 5.7)
  var legP: Array[Double]  = Array.empty

  def settled: Long = search.settled
}

final case class BssrResult(skyline: Vector[SRoute], metrics: BssrMetrics)

/** The bulk SkySR algorithm (paper §5): a branch-and-bound search that grows
  * all candidate sequenced routes simultaneously, expanding the best queued
  * route with a modified Dijkstra (Algorithm 2) that finds the PoI vertices
  * semantically matching the next category, and pruning with the thresholds
  * of Lemma 5.3 / Def. 5.4 (plus Lemma 5.8 when the lower-bound optimization
  * is on). Exactness: every pruned route is dominated by or equivalent to a
  * kept one (Theorem 3) — cross-checked against exhaustive enumeration in
  * the test suite.
  *
  * One instance per graph; scratch arrays are reused across queries (call
  * `run` sequentially per instance).
  */
final class Bssr(
    val g: RoadGraph,
    val forest: CategoryForest,
    val opts: BssrOptions = BssrOptions.all,
) {

  private val Inf = Double.PositiveInfinity

  // --- versioned scratch state for the modified Dijkstra ------------------
  private val dist     = new Array[Double](g.numVertices)
  private val simPath  = new Array[Double](g.numVertices)
  private val stampArr = new Array[Int](g.numVertices)
  private val settledArr = new Array[Int](g.numVertices)
  private var stamp    = 0

  /** Categories that actually occur on PoIs — for δ of Lemma 5.8. */
  private val presentCats: Array[Int] = g.poisByCategory.keys.toArray

  private final case class CacheEntry(
      results: mutable.ArrayBuffer[(Int, Double, Double)], // (poi, dist, sim)
      radius: Double,
  )

  /** Plain category-sequence query (the paper's §7 setting, plus the §6
    * destination variation when `query.destination` is set).
    */
  def run(query: Query): BssrResult =
    runSpecs(query.start,
      query.categories.map(PositionSpec.simple), query.destination)

  /** §6 complex category requirements: each position is a disjunction of
    * categories minus negations; a multi-category PoI is the same
    * generalization seen from the data side (the position's table takes the
    * max similarity, exactly the paper's proposal).
    */
  def runSpecs(start: Int, specs: Vector[PositionSpec],
               destination: Option[Int] = None): BssrResult = {
    val t0      = System.nanoTime()
    val metrics = new BssrMetrics
    val k       = specs.size
    require(k >= 1, "empty category sequence")

    // Per-position similarity tables — the "semantic hierarchy filters".
    val simPos: Array[Array[Double]] =
      specs.toArray.map(PositionSpec.simTable(forest, _))
    // Largest non-perfect similarity reachable at each position (present
    // categories only) — drives δ, the minimum semantic increment.
    val maxNonPerf: Array[Double] = Array.tabulate(k) { i =>
      presentCats.foldLeft(0.0) { (m, c) =>
        val s = simPos(i)(c); if (s < 1.0 && s > m) s else m
      }
    }
    // maxNonPerfSuffix(s) = max over positions s..k-1 (0-based) — the best
    // non-perfect similarity any future position of a size-s route can take.
    val maxNonPerfSuffix = new Array[Double](k + 1)
    for (s <- (0 until k).reverse)
      maxNonPerfSuffix(s) = math.max(maxNonPerf(s), maxNonPerfSuffix(s + 1))

    // Lemma 5.5's substitutions assume the at-least-as-similar interior PoI
    // is *usable* — false when another position can match the same PoIs
    // (the substitute may already be on the route, Def. 3.4-iii). Disable
    // the lemma for such positions; it is a pure pruning rule, so exactness
    // is unaffected. Paper workloads always use distinct trees (§7.1).
    val matchSets: Array[Set[Int]] = Array.tabulate(k) { i =>
      presentCats.filter(c => simPos(i)(c) > 0.0).toSet
    }
    val overlapping: Array[Boolean] = Array.tabulate(k) { i =>
      (0 until k).exists(j => j != i && matchSets(i).intersect(matchSets(j)).nonEmpty)
    }

    // §6 destination variation: distance from every vertex *to* the
    // destination (transpose handles directed graphs).
    val distToDest: Option[Array[Double]] = destination.map(d =>
      Dijkstra.fromSource(g.transpose, d, metrics = metrics.search))

    /** Append the destination leg; None if the destination is unreachable. */
    def sealRoute(r: SRoute): Option[SRoute] = distToDest match {
      case None => Some(r)
      case Some(dd) =>
        val leg = dd(r.end)
        if (leg.isInfinity) None else Some(SRoute(r.pois, r.length + leg, r.simProduct))
    }

    val sky = new SkylineSet

    // ---- Optimization 1: initial search (§5.3.1) -------------------------
    if (opts.useInit) {
      val ti = System.nanoTime()
      val found = NNInit.runTables(g, simPos, start, distToDest, sky, metrics.search)
      metrics.initTimeNanos = System.nanoTime() - ti
      metrics.initRoutes = found.size
      val complete = found.filter(_.size == k)
      val perfect  = complete.filter(_.semScore == 0.0)
      if (perfect.nonEmpty && complete.nonEmpty) {
        val worstSem = complete.maxBy(_.semScore)
        metrics.initRatio = worstSem.length / perfect.head.length
      }
    }

    // ---- Optimization 3: possible minimum distances (§5.3.3) -------------
    // legS(i)/legP(i) bound the length added between positions i and i+1
    // (1-based legs 1..k-1), computed with the multi-source multi-destination
    // Dijkstra over the PoI sets restricted to the l̄(φ) ball around v_q.
    val (legS, legP) =
      if (opts.useLowerBound && k >= 2)
        LowerBounds.legsTables(g, simPos, start, sky.thresholdFor(0.0), metrics.search)
      else (Array.fill(k)(0.0), Array.fill(k)(0.0))
    val lsSuf = LowerBounds.suffixSums(legS)
    val lpSuf = LowerBounds.suffixSums(legP)
    metrics.legS = legS.slice(1, k)
    metrics.legP = legP.slice(1, k)

    // ---- pruning (Lemma 5.3 via Def. 5.4; Lemma 5.8 when bounds are on) --
    def shouldPrune(r: SRoute): Boolean = {
      val sLb   = r.semScore
      val thr   = sky.thresholdFor(sLb)
      if (thr.isInfinity) {
        // no upper bound applies; only an impossible completion prunes
        opts.useLowerBound && lsSuf(r.size).isInfinity
      } else if (r.length + lsSuf(r.size) >= thr) true
      else if (opts.useLowerBound) {
        val devS  = 1.0 - r.simProduct * maxNonPerfSuffix(r.size)
        val condA = sky.thresholdFor(devS) <= r.length
        condA && r.length + lpSuf(r.size) >= thr
      } else false
    }

    // ---- Optimization 2: route priority (§5.3.2) -------------------------
    // Proposed: largest size first, then smallest semantic lower bound, then
    // smallest length. Conventional: smallest length (distance-based).
    val ord: Ordering[SRoute] =
      if (opts.proposedQueue)
        Ordering.by((r: SRoute) => (-r.size, r.semScore, r.length)).reverse
      else
        Ordering.by((r: SRoute) => r.length).reverse
    val qb = mutable.PriorityQueue.empty[SRoute](ord)

    def enqueue(r: SRoute): Unit = {
      qb.enqueue(r)
      metrics.routesEnqueued += 1
      if (qb.size > metrics.peakQueueSize) metrics.peakQueueSize = qb.size
    }

    def processCandidate(parent: SRoute, u: Int, d: Double, sim: Double): Unit = {
      if (!parent.contains(u)) {
        val rt = parent.extend(u, d, sim)
        if (rt.size == k) sealRoute(rt).foreach(sky.update) // rejects dominated/equiv
        else if (!shouldPrune(rt)) enqueue(rt)
      }
    }

    // ---- Optimization 4: on-the-fly cache (§5.3.4) -----------------------
    val cache = mutable.HashMap.empty[Long, CacheEntry]
    var firstSearch = true

    /** Modified Dijkstra (Algorithm 2): find PoIs semantically matching the
      * next category from the end of `parent`, honoring Lemma 5.5 (skip PoIs
      * reached through an at-least-as-similar PoI; never expand through a
      * perfect match) and breaking at the Lemma 5.3 radius.
      */
    def expand(parent: SRoute): Unit = {
      val posIdx = parent.size                     // 0-based next position
      val src    = if (parent.isEmpty) start else parent.end
      val sims   = simPos(posIdx)

      def radiusNow(): Double = {
        val thr = sky.thresholdFor(parent.semScore)
        if (thr.isInfinity) Inf
        else thr - parent.length - (if (opts.useLowerBound) lsSuf(posIdx + 1) else 0.0)
      }

      val key = src.toLong * (k + 1) + posIdx
      val needed = radiusNow()
      val cached = if (opts.useCache) cache.get(key) else None
      cached match {
        case Some(e) if e.radius >= needed =>
          metrics.cacheHits += 1
          val it = e.results.iterator
          while (it.hasNext) {
            val (u, d, s) = it.next()
            if (d < needed) processCandidate(parent, u, d, s)
          }
        case _ =>
          metrics.mDijkstraRuns += 1
          val w0 = metrics.search.weightSum
          val results = mutable.ArrayBuffer.empty[(Int, Double, Double)]
          var finalRadius = Inf

          stamp += 1
          val st = stamp
          val pq = mutable.PriorityQueue.empty[(Double, Int)](
            Ordering.by((e: (Double, Int)) => e._1).reverse)
          dist(src) = 0.0; simPath(src) = 0.0; stampArr(src) = st
          pq.enqueue((0.0, src))
          var break = false
          while (pq.nonEmpty && !break) {
            val (d, u) = pq.dequeue()
            if (settledArr(u) != st) {
              val rad = radiusNow()
              // On break, everything strictly below the breaking entry's
              // distance has been settled, so `d` (≥ rad) is the sound —
              // and larger — radius to record for the cache.
              if (d >= rad) { break = true; finalRadius = d }
              else {
                settledArr(u) = st
                metrics.search.settled += 1
                val cat = g.poiCategory(u)
                val sim = if (cat >= 0) sims(cat) else 0.0
                val lemma55 = !overlapping(posIdx)
                if (sim > 0.0 && u != src && (!lemma55 || sim > simPath(u))) {
                  results += ((u, d, sim))
                  processCandidate(parent, u, d, sim)
                }
                if (!lemma55 || sim != 1.0) { // Lemma 5.5: perfect matches absorb the search
                  val sp = math.max(simPath(u), sim)
                  var i = g.adjIndex(u)
                  while (i < g.adjIndex(u + 1)) {
                    val v = g.adjVertex(i)
                    val w = g.adjWeight(i)
                    metrics.search.relaxed += 1
                    metrics.search.weightSum += w
                    val nd = d + w
                    if (stampArr(v) != st || nd < dist(v)) {
                      dist(v) = nd; simPath(v) = sp; stampArr(v) = st
                      pq.enqueue((nd, v))
                    }
                    i += 1
                  }
                }
              }
            }
          }
          if (firstSearch) {
            metrics.firstSearchWeightSum = metrics.search.weightSum - w0
            firstSearch = false
          }
          if (opts.useCache) {
            val keep = cache.get(key).forall(_.radius < finalRadius)
            if (keep) cache(key) = CacheEntry(results, finalRadius)
          }
      }
    }

    // ---- main loop (Algorithm 1) -----------------------------------------
    expand(SRoute.empty)
    while (qb.nonEmpty && !metrics.aborted) {
      val r = qb.dequeue()
      metrics.routesDequeued += 1
      if (!shouldPrune(r)) expand(r)
      if (metrics.search.settled > opts.maxSettled) metrics.aborted = true
    }

    metrics.totalTimeNanos = System.nanoTime() - t0
    BssrResult(sky.all, metrics)
  }
}
