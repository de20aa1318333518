package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.core.Query
import repro.data.{Datasets, Workload}
import repro.graph.RoadGraph
import repro.semantics.CategoryForest

import scala.collection.mutable

/** The OSR baselines of Sharifzadeh et al. (Dij, PNE) and the iterated-OSR
  * naive SkySR built on them, validated against brute force.
  */
class OsrSpec extends AnyFunSuite {

  private val forest = CategoryForest.foursquareLike

  private val cache = mutable.Map.empty[Long, (RoadGraph, Array[Array[Double]])]
  private def graphFor(seed: Long) =
    cache.getOrElseUpdate(seed, {
      val g = Datasets.tiny(seed, nRoad = 80, nPois = 40)
      (g, Exhaustive.allPairs(g))
    })

  private def matchersFor(g: RoadGraph, q: Query, mins: Seq[Double]): Array[PositionMatcher] =
    mins.zipWithIndex.map { case (m, i) =>
      PositionMatcher(m, Array.tabulate(forest.size)(c => forest.sim(q.categories(i), c)))
    }.toArray

  /** Brute-force optimum under per-position similarity thresholds. */
  private def bruteOsr(g: RoadGraph, d: Array[Array[Double]], q: Query,
                       mins: Seq[Double]): Option[Double] = {
    val routes = Exhaustive.allRoutes(g, forest, q, d).filter { r =>
      r.pois.zipWithIndex.forall { case (p, i) =>
        forest.sim(q.categories(i), g.poiCategory(p)) >= mins(i)
      }
    }
    if (routes.isEmpty) None else Some(routes.map(_.length).min)
  }

  for (seed <- 1L to 10L; useDij <- Seq(true, false)) {
    val name = if (useDij) "Dij" else "PNE"
    test(s"$name OSR finds the optimal sequenced route under thresholds (seed=$seed)") {
      val (g, d) = graphFor(seed)
      val q = Workload.queries(g, forest, 1, 3, seed * 7, minPois = 1).head
      for (mins <- Seq(Seq(1.0, 1.0, 1.0), Seq(0.5, 1.0, 0.5), Seq(0.1, 0.1, 0.1))) {
        val m   = new BaselineMetrics
        val ms  = matchersFor(g, q, mins)
        val got =
          if (useDij) OsrDijkstra.osr(g, q.start, ms, m)
          else OsrPne.osr(g, q.start, ms, m)
        val want = bruteOsr(g, d, q, mins)
        (got, want) match {
          case (Some(r), Some(l)) =>
            assert(math.abs(r.length - l) < 1e-9, s"mins=$mins got=${r.length} want=$l")
            // returned route actually satisfies the thresholds
            r.pois.zipWithIndex.foreach { case (p, i) =>
              assert(forest.sim(q.categories(i), g.poiCategory(p)) >= mins(i))
            }
          case (None, None) => succeed
          case other => fail(s"mins=$mins mismatch: $other")
        }
      }
    }
  }

  for (seed <- 1L to 8L; useDij <- Seq(true, false); len <- 2 to 3) {
    val name = if (useDij) "Dij" else "PNE"
    test(s"iterated-$name SkySR == exhaustive (seed=$seed, |Sq|=$len)") {
      val (g, d) = graphFor(seed)
      val q     = Workload.queries(g, forest, 1, len, seed * 13 + len, minPois = 1).head
      val truth = Exhaustive.skySR(g, forest, q, d)
      val m     = new BaselineMetrics
      val got   = IterativeOsr.skySR(g, forest, q, useDij, m)
      assert(!m.aborted)
      TestUtil.assertSameSkyline(s"$name seed=$seed", got, truth)
      TestUtil.assertRouteScores(g, forest, q, got)
      assert(m.osrRuns == IterativeOsr.comboCount(g, forest, q))
    }
  }

  test("combo count is the product of per-position similarity levels") {
    val (g, _) = graphFor(1)
    val q = Workload.queries(g, forest, 1, 3, 3L, minPois = 1).head
    val levels = IterativeOsr.simLevels(g, forest, q)
    assert(IterativeOsr.comboCount(g, forest, q) == levels.map(_.length.toLong).product)
    levels.foreach(ls => assert(ls.nonEmpty && ls.head == 1.0))
  }

  test("combo count grows exponentially with |Sq| (the naive blow-up of §4)") {
    val (g, _) = graphFor(2)
    // fix one category with >= 2 similarity levels and grow the sequence
    val c = forest.leaves.find { c =>
      IterativeOsr.simLevels(g, forest, Query(0, Vector(c))).head.length >= 2
    }.get
    val counts = (2 to 4).map(len => IterativeOsr.comboCount(g, forest, Query(0, Vector.fill(len)(c))))
    assert(counts(0) < counts(1) && counts(1) < counts(2))
  }

  test("budget cap aborts the iterated OSR") {
    val g = Datasets.testSmall
    val q = Workload.queries(g, forest, 1, 3, 3L, minPois = 3).head
    val m = new BaselineMetrics
    IterativeOsr.skySR(g, forest, q, useDij = true, m, maxSettled = 50)
    assert(m.aborted)
  }

  test("Dij stores routes in its queue: peak queue far larger than PNE's (Table 6 shape)") {
    val g = Datasets.testSmall
    val q = Workload.queries(g, forest, 1, 3, 21L, minPois = 3).head
    val md = new BaselineMetrics
    val mp = new BaselineMetrics
    IterativeOsr.skySR(g, forest, q, useDij = true, md)
    IterativeOsr.skySR(g, forest, q, useDij = false, mp)
    assert(md.peakQueueSize > mp.peakQueueSize)
  }
}
