package repro.bench

import repro.exp.Datasets

/** Table 1 reproduction: the dataset inventory (paper graphs → analogues). */
class Exp0DatasetsBench extends BenchBase {

  test("Table 1: dataset analogues exist at the declared scales") {
    val report = Datasets.inventoryReport(spark)
    emit("exp0-datasets", report)
    Datasets.graphs.foreach { e =>
      val df = e.gen(spark)
      val m = df.count()
      assert(m > (if (quick) 1000 else 200000), s"${e.abbr} too small: $m edges")
    }
  }

  test("power-law analogues are skewed, uniform analogue is not") {
    import org.apache.spark.sql.functions._
    def topShare(abbr: String): Double = {
      val df = Datasets.graph(spark, abbr)
      val total = df.count().toDouble
      val degs = df.groupBy("dst").count().orderBy(desc("count"))
        .limit((total / 100).toInt max 10).agg(sum("count")).collect()(0).getLong(0)
      degs / total
    }
    assert(topShare("FB-a") > 0.08, "FB-a should be heavy-tailed")
    assert(topShare("ZF-a") < 0.08, "ZF-a should be near-uniform")
  }
}
