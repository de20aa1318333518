package repro.graph

import scala.collection.mutable

/** Mutable counters shared by all searches of one query execution.
  *
  * `weightSum` accumulates the weights of relaxed (scanned) edges — our
  * concrete rendering of the paper's "weight sum, which represents the
  * search space" (Table 7). `settled` counts dequeued-and-settled vertices —
  * the "number of vertices visited" of Table 8.
  */
final class SearchMetrics extends Serializable {
  var settled: Long    = 0L
  var relaxed: Long    = 0L
  var weightSum: Double = 0.0

  def reset(): Unit = { settled = 0; relaxed = 0; weightSum = 0.0 }
  def add(o: SearchMetrics): Unit = {
    settled += o.settled; relaxed += o.relaxed; weightSum += o.weightSum
  }
}

private[graph] final case class HeapEntry(dist: Double, vertex: Int, origin: Int)

private[graph] object HeapEntry {
  implicit val byDist: Ordering[HeapEntry] =
    Ordering.by[HeapEntry, Double](_.dist).reverse // scala PQ is a max-heap
}

/** Classic Dijkstra variants over [[RoadGraph]]. The modified Dijkstra of the
  * paper's Algorithm 2 lives in `repro.core.Bssr` (it needs route state); the
  * plain searches here back NNinit, the lower-bound estimation (Lemma 5.9)
  * and the Spark PoI-graph builder.
  */
object Dijkstra {

  val Inf: Double = Double.PositiveInfinity

  /** Single-source distances, bounded: vertices with true distance ≤
    * `maxDist` get their exact distance; farther vertices keep a value
    * > `maxDist` (a tentative frontier label or `Inf`) — never an
    * under-report, so ball tests `dist(v) <= maxDist` stay exact.
    */
  def fromSource(
      g: RoadGraph,
      source: Int,
      maxDist: Double = Inf,
      metrics: SearchMetrics = null,
  ): Array[Double] = {
    val dist = Array.fill(g.numVertices)(Inf)
    val done = new Array[Boolean](g.numVertices)
    val pq   = mutable.PriorityQueue.empty[HeapEntry]
    dist(source) = 0.0
    pq.enqueue(HeapEntry(0.0, source, source))
    while (pq.nonEmpty) {
      val e = pq.dequeue()
      val u = e.vertex
      if (!done(u)) {
        if (e.dist > maxDist) { pq.clear() }
        else {
          done(u) = true
          if (metrics != null) metrics.settled += 1
          var i = g.adjIndex(u)
          while (i < g.adjIndex(u + 1)) {
            val v = g.adjVertex(i)
            val w = g.adjWeight(i)
            if (metrics != null) { metrics.relaxed += 1; metrics.weightSum += w }
            val nd = e.dist + w
            if (nd < dist(v)) { dist(v) = nd; pq.enqueue(HeapEntry(nd, v, source)) }
            i += 1
          }
        }
      }
    }
    dist
  }

  /** Minimum network distance from any vertex in `sources` to any vertex
    * satisfying `isDest` — the multi-source multi-destination Dijkstra of
    * Lemma 5.9, used to compute the possible minimum distances of Def. 5.7.
    *
    * Pairs where source == destination are excluded (a sequenced route never
    * visits the same PoI twice, Def. 3.4-iii), which matters when the two
    * PoI sets overlap; we keep up to two settled labels with distinct
    * origins per vertex so the best distinct-pair distance is still exact.
    */
  def multiSourceMinDist(
      g: RoadGraph,
      sources: Array[Int],
      isDest: Int => Boolean,
      bound: Double = Inf,
      metrics: SearchMetrics = null,
  ): Double = {
    if (sources.isEmpty) return Inf
    val origin1 = Array.fill(g.numVertices)(-1)
    val origin2 = Array.fill(g.numVertices)(-1)
    val pq      = mutable.PriorityQueue.empty[HeapEntry]
    sources.foreach(s => pq.enqueue(HeapEntry(0.0, s, s)))
    while (pq.nonEmpty) {
      val e = pq.dequeue()
      val u = e.vertex
      if (e.dist > bound) return Inf
      val fresh = origin1(u) < 0 ||
        (origin2(u) < 0 && origin1(u) != e.origin)
      if (fresh) {
        if (origin1(u) < 0) origin1(u) = e.origin else origin2(u) = e.origin
        if (metrics != null) metrics.settled += 1
        if (isDest(u) && e.origin != u) return e.dist
        var i = g.adjIndex(u)
        while (i < g.adjIndex(u + 1)) {
          val v = g.adjVertex(i)
          val w = g.adjWeight(i)
          if (metrics != null) { metrics.relaxed += 1; metrics.weightSum += w }
          if (origin2(v) < 0) pq.enqueue(HeapEntry(e.dist + w, v, e.origin))
          i += 1
        }
      }
    }
    Inf
  }

  /** Point-to-point distance with early exit. */
  def distBetween(g: RoadGraph, a: Int, b: Int, maxDist: Double = Inf): Double = {
    if (a == b) return 0.0
    val dist = Array.fill(g.numVertices)(Inf)
    val done = new Array[Boolean](g.numVertices)
    val pq   = mutable.PriorityQueue.empty[HeapEntry]
    dist(a) = 0.0
    pq.enqueue(HeapEntry(0.0, a, a))
    while (pq.nonEmpty) {
      val e = pq.dequeue()
      val u = e.vertex
      if (e.dist > maxDist) return Inf
      if (!done(u)) {
        done(u) = true
        if (u == b) return e.dist
        var i = g.adjIndex(u)
        while (i < g.adjIndex(u + 1)) {
          val v  = g.adjVertex(i)
          val nd = e.dist + g.adjWeight(i)
          if (nd < dist(v)) { dist(v) = nd; pq.enqueue(HeapEntry(nd, v, a)) }
          i += 1
        }
      }
    }
    Inf
  }
}

/** Resumable nearest-neighbour search by network distance: yields the PoI
  * vertices satisfying `matches`, in nondecreasing distance from `source`,
  * one at a time. Backs both NNinit's greedy legs and the PNE baseline's
  * progressive neighbor exploration (rank-addressable via `get`).
  */
final class NearestNeighborSearch(
    g: RoadGraph,
    val source: Int,
    matches: Int => Boolean,
    metrics: SearchMetrics = null,
) {
  // Sparse state: an incremental NN search usually touches a small ball
  // around its source, so O(touched) maps beat O(|V|) arrays — and make the
  // PNE memory model of Table 6 reflect what the search actually retains.
  private val dist = mutable.HashMap.empty[Int, Double]
  private val done = mutable.HashSet.empty[Int]
  private val pq   = mutable.PriorityQueue.empty[HeapEntry]
  private val found = mutable.ArrayBuffer.empty[(Int, Double)]
  private var exhausted = false

  dist(source) = 0.0
  pq.enqueue(HeapEntry(0.0, source, source))

  /** Rough retained bytes of this search's live state (Table 6 model). */
  def stateBytes: Long = 48L * dist.size + 32L * done.size + 24L * found.size

  /** The `rank`-th (0-based) nearest matching vertex, extending the
    * underlying Dijkstra as far as needed; None once the component is
    * exhausted.
    */
  def get(rank: Int): Option[(Int, Double)] = {
    while (found.size <= rank && !exhausted) advance()
    if (rank < found.size) Some(found(rank)) else None
  }

  private def advance(): Unit = {
    var produced = false
    while (!produced && pq.nonEmpty) {
      val e = pq.dequeue()
      val u = e.vertex
      if (!done.contains(u)) {
        done += u
        if (metrics != null) metrics.settled += 1
        if (matches(u)) { found += ((u, e.dist)); produced = true }
        var i = g.adjIndex(u)
        while (i < g.adjIndex(u + 1)) {
          val v  = g.adjVertex(i)
          val w  = g.adjWeight(i)
          if (metrics != null) { metrics.relaxed += 1; metrics.weightSum += w }
          val nd = e.dist + w
          if (nd < dist.getOrElse(v, Dijkstra.Inf)) {
            dist(v) = nd; pq.enqueue(HeapEntry(nd, v, source))
          }
          i += 1
        }
      }
    }
    if (!produced) exhausted = true
  }
}
