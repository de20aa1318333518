package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Fig. 3 (response time) and Fig. 6 (# SkySRs) shapes — the headline claim:
  * BSSR beats iterated-OSR baselines, increasingly so as |Sq| grows.
  */
class ResponseTimeBench extends AnyFunSuite {

  test("response time: BSSR wins at |Sq| >= 3 and never exceeds its budget") {
    val (txt, rows) = Tables.responseTime()
    println(txt)
    val bssr = rows.filter(_.algo == "BSSR")
    assert(bssr.forall(!_.aborted), "BSSR hit the budget cap")
    // BSSR returns at least one route (the perfect-match OSR) everywhere
    assert(bssr.forall(_.avgSkySRs >= 1.0))
    for (d <- rows.map(_.dataset).distinct) {
      val at4 = rows.filter(r => r.dataset == d && r.len == 4)
        .map(r => r.algo -> r).toMap
      // the paper's ranking at larger |Sq|: BSSR fastest (baselines may have
      // been cut off by the cap, which only understates their true time)
      assert(at4("BSSR").avgMs <= at4("Dij").avgMs || at4("Dij").aborted,
        s"$d: BSSR ${at4("BSSR").avgMs} vs Dij ${at4("Dij").avgMs}")
      assert(at4("BSSR").avgMs <= at4("PNE").avgMs || at4("PNE").aborted,
        s"$d: BSSR ${at4("BSSR").avgMs} vs PNE ${at4("PNE").avgMs}")
    }
    // Fig. 6: Cal returns the most SkySRs (deep forest + dense PoIs)
    val skyByDs = rows.filter(r => r.algo == "BSSR" && r.len == 4)
      .map(r => r.dataset -> r.avgSkySRs).toMap
    assert(skyByDs("Cal") >= skyByDs("Tokyo") * 0.5,
      s"Cal SkySR count unexpectedly small: $skyByDs")
  }
}
