package repro

import repro.core.SRoute

object TestUtil {

  /** Two skylines agree iff they have the same (length, semScore) points in
    * order (within tolerance). PoI sequences may differ only when two routes
    * are exactly equivalent (the minimal set keeps an arbitrary
    * representative), so points — not vertex lists — are the contract.
    */
  def assertSameSkyline(label: String, a: Seq[SRoute], b: Seq[SRoute], tol: Double = 1e-9): Unit = {
    val pa = a.map(r => (r.length, r.semScore)).sortBy(identity)
    val pb = b.map(r => (r.length, r.semScore)).sortBy(identity)
    assert(pa.size == pb.size,
      s"$label: skyline sizes differ: ${pa.size} vs ${pb.size}\n  a=$pa\n  b=$pb")
    pa.zip(pb).foreach { case ((l1, s1), (l2, s2)) =>
      assert(math.abs(l1 - l2) <= tol && math.abs(s1 - s2) <= tol,
        s"$label: point mismatch ($l1,$s1) vs ($l2,$s2)\n  a=$pa\n  b=$pb")
    }
  }

  /** Checks that every reported route's scores are consistent with the graph
    * (legs re-derived with exact Dijkstra) — guards against score-accounting
    * bugs that point-set comparison alone could miss.
    */
  def assertRouteScores(g: repro.graph.RoadGraph, forest: repro.semantics.CategoryForest,
                        q: repro.core.Query, routes: Seq[SRoute], tol: Double = 1e-9): Unit = {
    routes.foreach { r =>
      assert(r.size == q.size, s"route size ${r.size} != ${q.size}")
      assert(r.pois.distinct.size == r.size, s"route repeats a PoI: $r")
      var len = 0.0
      var prod = 1.0
      var from = q.start
      r.pois.zipWithIndex.foreach { case (p, i) =>
        len += repro.graph.Dijkstra.distBetween(g, from, p)
        val s = forest.sim(q.categories(i), g.poiCategory(p))
        assert(s > 0.0, s"PoI $p does not semantically match position $i")
        prod *= s
        from = p
      }
      assert(math.abs(len - r.length) <= tol, s"length mismatch: $len vs ${r.length} for $r")
      assert(math.abs((1 - prod) - r.semScore) <= tol, s"sem mismatch for $r")
    }
  }
}
