package repro.core

import scala.collection.mutable

/** A SkySR query: a start vertex and a sequence of category ids (Def. 4.2).
  * `destination`, when set, is the "SkySR with destination" variation of §6:
  * the network distance from the last PoI to the destination is added to the
  * length score.
  */
final case class Query(start: Int, categories: Vector[Int],
                       destination: Option[Int] = None) {
  def size: Int = categories.size
  override def toString: String =
    s"Query(v=$start, S=${categories.mkString("<", ",", ">")}" +
      destination.fold("")(d => s", dest=$d") + ")"
}

/** One position of a complex category requirement (§6): a PoI matches with
  * the best similarity over `anyOf` (disjunction; a multi-category PoI is
  * the same thing seen from the data side), unless its category is in
  * `noneOf` (negation). A plain position is `PositionSpec(Vector(c))`.
  */
final case class PositionSpec(anyOf: Vector[Int], noneOf: Set[Int] = Set.empty) {
  require(anyOf.nonEmpty, "empty disjunction")
}

object PositionSpec {
  def simple(c: Int): PositionSpec = PositionSpec(Vector(c))

  /** Per-category similarity table for a spec (0 for negated categories). */
  def simTable(forest: repro.semantics.CategoryForest, spec: PositionSpec): Array[Double] =
    Array.tabulate(forest.size) { c =>
      if (spec.noneOf.contains(c)) 0.0
      else spec.anyOf.map(a => forest.sim(a, c)).max
    }
}

/** A (possibly partial) route: the PoI vertices visited so far, the length
  * score accumulated so far, and the product of per-position category
  * similarities (Def. 3.5).
  *
  * For a complete sequenced route `semScore == 1 - simProduct` is the exact
  * semantic score (Eq. 7); for a partial route it is the *possible minimum*
  * semantic score `underline-s(R)` — the score reached if every remaining
  * position matches perfectly — which is exactly the lower bound used by
  * Lemma 5.2.
  */
final case class SRoute(pois: Vector[Int], length: Double, simProduct: Double) {
  def size: Int       = pois.size
  def isEmpty: Boolean = pois.isEmpty
  def end: Int        = pois.last
  def semScore: Double = 1.0 - simProduct
  def contains(p: Int): Boolean = pois.contains(p)
  def extend(p: Int, legDist: Double, sim: Double): SRoute =
    SRoute(pois :+ p, length + legDist, simProduct * sim)
  override def toString: String =
    f"SRoute(${pois.mkString("<", ",", ">")}, l=$length%.3f, s=$semScore%.3f)"
}

object SRoute {
  /** The empty route anchored at the start vertex (length 0, product 1). */
  val empty: SRoute = SRoute(Vector.empty, 0.0, 1.0)
}

/** Dominance and skyline utilities over (length, semantic) score pairs
  * (Def. 4.1).
  */
object Skyline {

  /** `a` dominates or is equivalent to `b` (both scores no worse). */
  def dominatesOrEquiv(aL: Double, aS: Double, bL: Double, bS: Double): Boolean =
    aL <= bL && aS <= bS

  /** Strict dominance: no worse in both, strictly better in at least one. */
  def dominates(aL: Double, aS: Double, bL: Double, bS: Double): Boolean =
    dominatesOrEquiv(aL, aS, bL, bS) && (aL < bL || aS < bS)

  /** Minimal skyline of a route set: drops dominated routes and keeps one
    * representative per equivalent (l, s) point, sorted by length ascending.
    */
  def of(routes: Seq[SRoute]): Vector[SRoute] = {
    val sorted = routes.sortBy(r => (r.length, r.semScore))
    val out    = mutable.ArrayBuffer.empty[SRoute]
    var bestSem = Double.PositiveInfinity
    var i = 0
    while (i < sorted.length) {
      val r = sorted(i)
      // among equal lengths only the first (smallest sem) can survive
      val sameL = i + 1 < sorted.length && sorted(i + 1).length == r.length
      if (r.semScore < bestSem) { out += r; bestSem = r.semScore }
      // skip the rest of this length group
      if (sameL) {
        val l = r.length
        while (i + 1 < sorted.length && sorted(i + 1).length == l) i += 1
      }
      i += 1
    }
    out.toVector
  }
}

/** The evolving minimal set `S` of sequenced routes (Def. 4.2), kept sorted
  * by length ascending (hence semantic score strictly descending). Small by
  * construction — the paper observes |S| stays in the single digits — so
  * linear scans are the right tool (Eq. 3 "has a small computation cost").
  */
final class SkylineSet {
  private val members = mutable.ArrayBuffer.empty[SRoute]

  def size: Int = members.size
  def isEmpty: Boolean = members.isEmpty
  def all: Vector[SRoute] = members.toVector

  /** Insert `r` unless dominated by or equivalent to a member; evict members
    * `r` dominates. Returns true iff `r` was inserted (Lemma 5.1 update).
    */
  def update(r: SRoute): Boolean = {
    var i = 0
    while (i < members.size) {
      val m = members(i)
      if (Skyline.dominatesOrEquiv(m.length, m.semScore, r.length, r.semScore)) return false
      i += 1
    }
    members.filterInPlace(m => !Skyline.dominatesOrEquiv(r.length, r.semScore, m.length, m.semScore))
    val at = members.indexWhere(_.length > r.length)
    if (at < 0) members += r else members.insert(at, r)
    true
  }

  /** Threshold `l̄` of Eq. (3): the smallest length of a member whose
    * semantic score is ≤ the given semantic lower bound; +∞ if none.
    */
  def thresholdFor(semLowerBound: Double): Double = {
    var i = 0
    while (i < members.size) {
      if (members(i).semScore <= semLowerBound) return members(i).length
      i += 1
    }
    Double.PositiveInfinity
  }
}
