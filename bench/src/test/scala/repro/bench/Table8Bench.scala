package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 8: proposed priority queue vs distance-based, vertices visited. */
class Table8Bench extends AnyFunSuite {

  test("Table 8: proposed queue visits no more vertices; gap widens with |Sq|") {
    val (txt, rows) = Tables.table8()
    println(txt)
    rows.foreach { r =>
      assert(r.proposed <= r.distanceBased,
        s"${r.dataset}/${r.len}: proposed ${r.proposed} > distance ${r.distanceBased}")
    }
    for (d <- rows.map(_.dataset).distinct) {
      val rs = rows.filter(_.dataset == d).sortBy(_.len)
      // strictly better somewhere, and the relative gap at the largest |Sq|
      // is at least the gap at the smallest (the paper's widening trend)
      assert(rs.exists(r => r.proposed < r.distanceBased), s"$d: never strict")
      val gapSmall = rs.head.distanceBased.toDouble / rs.head.proposed.max(1)
      val gapLarge = rs.last.distanceBased.toDouble / rs.last.proposed.max(1)
      assert(gapLarge >= gapSmall * 0.8, s"$d: gap shrank: $gapSmall -> $gapLarge")
    }
  }
}
