package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 7: effect of the initial search (NNinit), |Sq| ∈ 2..5. */
class Table7Bench extends AnyFunSuite {

  test("Table 7: NNinit shrinks the first search space; ratio < 1; cheap to run") {
    val (txt, rows) = Tables.table7()
    println(txt)
    rows.foreach { r =>
      // with the initial search the first modified Dijkstra explores far
      // less than the whole graph (the "Existing" row)
      assert(r.weightSum < r.existingWeightSum,
        s"${r.dataset}/${r.len}: ${r.weightSum} !< ${r.existingWeightSum}")
      assert(r.nRoutes >= 1.0, s"${r.dataset}/${r.len}: NNinit found no routes")
      assert(r.ratio > 0.0 && r.ratio <= 1.0 + 1e-9)
      assert(r.initMs >= 0.0)
    }
    // search space grows with the sequence size (paper: weight sum rises with |Sq|)
    for (d <- rows.map(_.dataset).distinct) {
      val ws = rows.filter(_.dataset == d).sortBy(_.len).map(_.weightSum)
      assert(ws.last >= ws.head, s"$d: weight sum not growing: $ws")
    }
  }
}
