package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 5: dataset summary — scaled analogues of Tokyo / NYC / Cal. */
class Table5Bench extends AnyFunSuite {

  test("Table 5: dataset sizes and shape match the paper's structure") {
    val (txt, rows) = Tables.table5()
    println(txt)
    val byName = rows.map(r => r.name -> r).toMap
    // Tokyo/NYC are road-dominated; Cal is PoI-dense (more PoIs than vertices)
    assert(byName("Tokyo").p < byName("Tokyo").v)
    assert(byName("NYC").p < byName("NYC").v)
    assert(byName("Cal").p > byName("Cal").v)
    // NYC is the largest map, as in the paper
    assert(byName("NYC").v > byName("Tokyo").v && byName("NYC").e > byName("Tokyo").e)
    // scale factors roughly 1/100 (Tokyo/NYC) and 1/10 (Cal)
    rows.foreach { r =>
      val s = r.paperV.toDouble / r.v
      assert(s > 5 && s < 300, s"${r.name} scale $s out of band")
    }
  }
}
