package repro.baselines

import repro.core.SRoute
import repro.graph.{NearestNeighborSearch, RoadGraph, SearchMetrics}

import scala.collection.mutable

/** Match rule for one sequence position of a (relaxed) OSR query: a PoI with
  * category `c` matches iff `sims(c) >= minSim`. With `minSim = 1` this is
  * the classic perfect-match OSR of Sharifzadeh et al.; smaller thresholds
  * give the similarity-level relaxations our naive SkySR baseline iterates
  * over (DESIGN.md §6).
  */
final case class PositionMatcher(minSim: Double, sims: Array[Double]) {
  def matches(cat: Int): Boolean = cat >= 0 && sims(cat) >= minSim && sims(cat) > 0.0
}

/** Shared instrumentation for the baseline algorithms. */
final class BaselineMetrics {
  val search = new SearchMetrics
  var peakQueueSize: Int = 0
  var liveNnSearches: Int = 0 // PNE: resumable Dijkstras held live (memory model)
  var peakNnBytes: Long = 0L  // PNE: peak retained bytes of the live NN searches
  var osrRuns: Long = 0L
  var totalTimeNanos: Long = 0L
  var aborted: Boolean = false
}

/** Thrown internally when a budget cap is exceeded (the paper's runs that
  * "were not finished after a month" — we cap and report `>cap`).
  */
final class BudgetExceeded extends RuntimeException

/** The Dijkstra-based OSR solution [16]: one Dijkstra over the layered
  * product graph (road network × sequence progress). Queue entries carry
  * their partial route — which is exactly why the paper's Table 6 shows Dij
  * needing an order of magnitude more memory than PNE/BSSR.
  */
object OsrDijkstra {

  def osr(
      g: RoadGraph,
      start: Int,
      matchers: Array[PositionMatcher],
      metrics: BaselineMetrics,
      maxSettled: Long = Long.MaxValue,
  ): Option[SRoute] = {
    val k = matchers.length
    final case class Entry(dist: Double, vertex: Int, layer: Int, route: SRoute)
    val ord = Ordering.by((e: Entry) => e.dist).reverse
    val pq  = mutable.PriorityQueue.empty[Entry](ord)
    // settled flags per (vertex, layer)
    val done = Array.fill(k + 1)(new Array[Boolean](g.numVertices))
    pq.enqueue(Entry(0.0, start, 0, SRoute.empty))
    while (pq.nonEmpty) {
      if (pq.size > metrics.peakQueueSize) metrics.peakQueueSize = pq.size
      val e = pq.dequeue()
      if (!done(e.layer)(e.vertex)) {
        done(e.layer)(e.vertex) = true
        metrics.search.settled += 1
        if (metrics.search.settled > maxSettled) throw new BudgetExceeded
        if (e.layer == k) return Some(e.route)
        val cat = g.poiCategory(e.vertex)
        if (e.layer < k && matchers(e.layer).matches(cat) && !e.route.contains(e.vertex)) {
          val r2 = e.route.extend(e.vertex, e.dist - e.route.length, matchers(e.layer).sims(cat))
          pq.enqueue(Entry(e.dist, e.vertex, e.layer + 1, r2))
        }
        var i = g.adjIndex(e.vertex)
        while (i < g.adjIndex(e.vertex + 1)) {
          val v = g.adjVertex(i)
          val w = g.adjWeight(i)
          metrics.search.relaxed += 1
          metrics.search.weightSum += w
          if (!done(e.layer)(v)) pq.enqueue(Entry(e.dist + w, v, e.layer, e.route))
          i += 1
        }
      }
    }
    None
  }
}

/** The Progressive Neighbor Exploration OSR solution [16]: a best-first
  * search over partial routes ordered by length, where each popped route
  * spawns (a) its extension with the nearest matching PoI for the next
  * position and (b) its sibling — the parent extended with the next-nearest
  * match — via resumable nearest-neighbour Dijkstras.
  */
object OsrPne {

  /** Resumable NN searches shared across routes (and across the OSR runs of
    * one SkySR query — sim thresholds do not change the underlying
    * distance order, but the match predicate does, so the key includes the
    * position's matcher identity).
    */
  final class SearchPool(g: RoadGraph, metrics: BaselineMetrics) {
    private val pool = mutable.HashMap.empty[(Int, Int), NearestNeighborSearch]
    def of(source: Int, posKey: Int, matcher: PositionMatcher): NearestNeighborSearch = {
      val nns = pool.getOrElseUpdate((source, posKey),
        new NearestNeighborSearch(g, source, v => matcher.matches(g.poiCategory(v)), metrics.search))
      if (pool.size > metrics.liveNnSearches) metrics.liveNnSearches = pool.size
      nns
    }
    def totalBytes: Long = pool.valuesIterator.map(_.stateBytes).sum
  }

  def osr(
      g: RoadGraph,
      start: Int,
      matchers: Array[PositionMatcher],
      metrics: BaselineMetrics,
      maxSettled: Long = Long.MaxValue,
      sharedPool: SearchPool = null,
      poolKeyOffset: Int = 0,
  ): Option[SRoute] = {
    val k    = matchers.length
    val pool = if (sharedPool != null) sharedPool else new SearchPool(g, metrics)
    try osrImpl(g, start, matchers, metrics, maxSettled, pool, poolKeyOffset, k)
    finally metrics.peakNnBytes = math.max(metrics.peakNnBytes, pool.totalBytes)
  }

  private def osrImpl(
      g: RoadGraph,
      start: Int,
      matchers: Array[PositionMatcher],
      metrics: BaselineMetrics,
      maxSettled: Long,
      pool: SearchPool,
      poolKeyOffset: Int,
      k: Int,
  ): Option[SRoute] = {

    // Entry: partial route + the NN rank its last PoI was drawn at (for
    // sibling generation). rank == -1 for the empty seed.
    final case class Entry(route: SRoute, rank: Int)
    val ord = Ordering.by((e: Entry) => e.route.length).reverse
    val pq  = mutable.PriorityQueue.empty[Entry](ord)

    /** First NN rank >= from whose PoI is not already on `route`. */
    def nextValid(source: Int, pos: Int, exclude: SRoute, from: Int): Option[(Int, Int, Double)] = {
      val nns = pool.of(source, poolKeyOffset + pos, matchers(pos))
      var r = from
      while (true) {
        if (metrics.search.settled > maxSettled) throw new BudgetExceeded
        nns.get(r) match {
          case Some((p, d)) =>
            if (!exclude.contains(p)) return Some((r, p, d))
            r += 1
          case None => return None
        }
      }
      None
    }

    def pushExtension(parent: SRoute, fromRank: Int): Unit = {
      val pos = parent.size
      val src = if (parent.isEmpty) start else parent.end
      nextValid(src, pos, parent, fromRank).foreach { case (r, p, d) =>
        val cat = g.poiCategory(p)
        pq.enqueue(Entry(parent.extend(p, d, matchers(pos).sims(cat)), r))
        if (pq.size > metrics.peakQueueSize) metrics.peakQueueSize = pq.size
      }
    }

    pushExtension(SRoute.empty, 0)
    while (pq.nonEmpty) {
      val e = pq.dequeue()
      if (e.route.size == k) return Some(e.route)
      // child: first valid NN for the next position
      pushExtension(e.route, 0)
      // sibling: parent's next valid NN after this route's rank — recover the
      // parent by stripping the last leg (its distance is the rank's NN dist)
      val prefix  = e.route.pois.init
      val src     = if (prefix.isEmpty) start else prefix.last
      val lastPos = e.route.size - 1
      val lastSim = matchers(lastPos).sims(g.poiCategory(e.route.end))
      val nns     = pool.of(src, poolKeyOffset + lastPos, matchers(lastPos))
      val lastD   = nns.get(e.rank).map(_._2).getOrElse(0.0)
      val parent  = SRoute(prefix, e.route.length - lastD, e.route.simProduct / lastSim)
      pushExtension(parent, e.rank + 1)
    }
    None
  }
}
