package repro.graph

import repro.{Oracle, SparkSpec}

class SnbDataSpec extends SparkSpec {

  private lazy val g = SnbData.generate(spark, nPersons = 200, seed = 7)
  private lazy val v = g.vertices.cache()
  private lazy val ed = g.edges.cache()

  test("vertex labels and counts") {
    val counts = v.groupBy("label").count().collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(counts("PERSON") == 200)
    assert(counts("TAG") == 100)
    assert(counts("POST") == 200 * SnbData.PostsPerPerson)
    assert(counts("COMMENT") == 200 * (SnbData.MsgsPerPerson - SnbData.PostsPerPerson))
  }

  test("vertex ids are globally unique") {
    assert(v.count() == v.select("id").distinct().count())
  }

  test("edge labels present") {
    val labels = ed.select("label").distinct().collect().map(_.getString(0)).toSet
    assert(labels == Set("KNOWS", "HAS_CREATOR", "REPLY_OF", "HAS_TAG", "LIKES"))
  }

  test("referential integrity: every edge endpoint exists (oracle)") {
    val dangling = ed.join(v.select(org.apache.spark.sql.functions.col("id").as("src2")),
        ed("src") === org.apache.spark.sql.functions.col("src2"), "left_anti")
    assert(dangling.count() == 0)
    val dangling2 = ed.join(v.select(org.apache.spark.sql.functions.col("id").as("dst2")),
        ed("dst") === org.apache.spark.sql.functions.col("dst2"), "left_anti")
    assert(dangling2.count() == 0)
  }

  test("HAS_CREATOR edges link messages to persons (oracle cross-check)") {
    import org.apache.spark.sql.functions._
    val got = ed.filter(col("label") === "HAS_CREATOR")
      .join(v.select(col("id"), col("label").as("dlabel")), ed("dst") === col("id"))
      .groupBy("dlabel").agg(count(lit(1)).as("cnt"))
      .select(col("dlabel"), col("cnt"))
    Oracle.assertEquivalent(got,
      """SELECT v.label AS dlabel, count(*) AS cnt
         FROM e JOIN v ON e.dst = v.id WHERE e.label = 'HAS_CREATOR' GROUP BY v.label""",
      "e" -> ed, "v" -> v)
    val rows = got.collect()
    assert(rows.length == 1 && rows(0).getString(0) == "PERSON")
  }

  test("every person creates exactly MsgsPerPerson messages") {
    import org.apache.spark.sql.functions._
    val perCreator = ed.filter(col("label") === "HAS_CREATOR")
      .groupBy("dst").count().select("count").distinct().collect().map(_.getLong(0))
    assert(perCreator.toSeq == Seq(SnbData.MsgsPerPerson.toLong))
  }

  test("REPLY_OF points backwards in message-id order") {
    import org.apache.spark.sql.functions._
    val bad = ed.filter(col("label") === "REPLY_OF").filter(col("dst") >= col("src")).count()
    assert(bad == 0)
  }

  test("KNOWS degrees are skewed (power law tail)") {
    import org.apache.spark.sql.functions._
    val degs = ed.filter(col("label") === "KNOWS").groupBy("src").count()
      .collect().map(_.getLong(1))
    assert(degs.max > 3 * (degs.sum / degs.length), "no heavy tail in KNOWS degrees")
  }

  test("generation is deterministic") {
    val g2 = SnbData.generate(spark, nPersons = 200, seed = 7)
    assert(g2.edges.count() == ed.count())
    val s1 = ed.selectExpr("sum(src * 7 + dst) AS s").collect()(0).getLong(0)
    val s2 = g2.edges.selectExpr("sum(src * 7 + dst) AS s").collect()(0).getLong(0)
    assert(s1 == s2)
  }

  test("fraud graph shape") {
    val fg = SnbData.fraudGraph(spark, nAccounts = 100, nItems = 50, nOrders = 500)
    val labels = fg.vertices.groupBy("label").count().collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(labels("ACCOUNT") == 100 && labels("ITEM") == 50)
    assert(fg.edges.filter("label = 'BUY'").count() == 500)
    assert(fg.edges.filter("label = 'KNOWS' AND src = dst").count() == 0)
  }
}
