package repro.core

import repro.{SparkSpec, TestUtil}
import repro.baselines.Exhaustive
import repro.data.{Datasets, PaperExample, Workload}
import repro.semantics.CategoryForest

/** The distributed DataFrame pipeline must be exactly the sequential BSSR. */
class BulkSkySRSparkSpec extends SparkSpec {

  private val forest = CategoryForest.foursquareLike

  test("Spark pipeline reproduces the paper's worked example (Table 4)") {
    val got = BulkSkySRSpark.run(spark, PaperExample.graph, PaperExample.forest, PaperExample.query)
    val truth = Exhaustive.skySR(PaperExample.graph, PaperExample.forest, PaperExample.query)
    TestUtil.assertSameSkyline("paper-example", got, truth)
  }

  for (seed <- 1L to 4L; len <- 2 to 3) {
    test(s"Spark pipeline == exhaustive == BSSR (seed=$seed, |Sq|=$len)") {
      val g = Datasets.tiny(seed)
      val q = Workload.queries(g, forest, 1, len, seed * 31 + len, minPois = 1).head
      val truth = Exhaustive.skySR(g, forest, q)
      val bssr  = new Bssr(g, forest).run(q).skyline
      val dist  = BulkSkySRSpark.run(spark, g, forest, q)
      TestUtil.assertSameSkyline(s"spark-vs-truth seed=$seed", dist, truth)
      TestUtil.assertSameSkyline(s"spark-vs-bssr seed=$seed", dist, bssr)
      TestUtil.assertRouteScores(g, forest, q, dist)
    }
  }

  test("Spark pipeline handles |Sq| = 1") {
    val g = Datasets.tiny(9)
    val q = Workload.queries(g, forest, 1, 1, 17L, minPois = 1).head
    TestUtil.assertSameSkyline("len1",
      BulkSkySRSpark.run(spark, g, forest, q),
      Exhaustive.skySR(g, forest, q))
  }

  test("Spark pipeline on the small dataset matches BSSR for a |Sq|=4 query") {
    val g = Datasets.testSmall
    val q = Workload.queries(g, forest, 1, 4, 23L, minPois = 3).head
    TestUtil.assertSameSkyline("small-4",
      BulkSkySRSpark.run(spark, g, forest, q),
      new Bssr(g, forest).run(q).skyline)
  }

  test("Spark pipeline is exact for repeated/same-tree categories (used-set states)") {
    val g = Datasets.tiny(14)
    val leaves = forest.leaves.filter(c => g.poisByCategory.contains(c))
    val q = repro.core.Query(0, Vector(leaves.head, leaves.head, leaves.head))
    TestUtil.assertSameSkyline("same-tree",
      BulkSkySRSpark.run(spark, g, forest, q),
      Exhaustive.skySR(g, forest, q))
  }

  test("Spark pipeline supports the §6 destination variation") {
    val g = Datasets.tiny(8)
    val q = Workload.queries(g, forest, 1, 2, 29L, minPois = 1).head
      .copy(destination = Some(3))
    TestUtil.assertSameSkyline("spark-dest",
      BulkSkySRSpark.run(spark, g, forest, q),
      Exhaustive.skySR(g, forest, q))
  }

  test("per-end-PoI skyline prune keeps exactly the non-dominated partials") {
    import spark.implicits._
    val df = Seq(
      (Array(1), 7, 5.0, 1.0),   // kept
      (Array(2), 7, 6.0, 1.0),   // dominated (longer, same prod)
      (Array(3), 7, 4.0, 0.5),   // kept (shorter)
      (Array(4), 7, 5.0, 1.0),   // equivalent duplicate of first -> dropped
      (Array(5), 8, 9.0, 0.25),  // kept (different end PoI)
      (Array(6), 7, 4.5, 0.75),  // dominated by (4.0, 0.5)? prod 0.75 < ... no: len 4.5>4.0, prod 0.75>0.5 -> kept
    ).toDF("pois", "endV", "len", "prod")
    val kept = BulkSkySRSpark.skylinePerEnd(df)
      .select("pois").collect().map(_.getAs[scala.collection.Seq[Int]](0).head).toSet
    assert(kept == Set(1, 3, 5, 6))
  }
}
