package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 6: memory comparison at |Sq| = 4 (retained-bytes model; see
  * DESIGN.md §4 for the RSS substitution).
  */
class Table6Bench extends AnyFunSuite {

  test("Table 6: Dij's route-carrying queue dwarfs BSSR's; optimizations shrink BSSR's state") {
    val (txt, rows) = Tables.table6()
    println(txt)
    for (d <- rows.map(_.dataset).distinct) {
      val m = rows.filter(_.dataset == d).map(r => r.algo -> r).toMap
      // the paper's mechanism: Dij must keep routes in its search frontier
      assert(m("Dij").peakRoutes > m("BSSR").peakRoutes,
        s"$d: Dij ${m("Dij").peakRoutes} !> BSSR ${m("BSSR").peakRoutes}")
      assert(m("Dij").modelBytes > m("BSSR").modelBytes, s"$d: model bytes")
      // w/o-Opt sits above BSSR (paper: 497.5 vs 239.6 MB on Tokyo)
      assert(m("BSSR w/o Opt").peakRoutes > m("BSSR").peakRoutes, s"$d: w/o Opt")
      // every model is graph-plus-small-state: BSSR stays within 2x of graph
      assert(m("BSSR").modelBytes < 2L * m("BSSR").graphBytes, s"$d: BSSR not graph-dominated")
    }
  }
}
