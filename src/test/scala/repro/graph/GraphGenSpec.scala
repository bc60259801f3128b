package repro.graph

import repro.SparkSpec

class GraphGenSpec extends SparkSpec {

  test("rmat produces the requested edge count and vertex range") {
    val e = GraphGen.rmat(spark, scale = 10, edges = 5000, seed = 1).cache()
    assert(e.count() == 5000)
    val mx = e.selectExpr("greatest(max(src), max(dst)) AS m").collect()(0).getLong(0)
    assert(mx < 1024)
  }

  test("rmat is deterministic in seed") {
    def sig(seed: Long): Long =
      GraphGen.rmat(spark, 8, 1000, seed = seed)
        .selectExpr("sum(src * 31 + dst) AS s").collect()(0).getLong(0)
    assert(sig(5) == sig(5))
    assert(sig(5) != sig(6))
  }

  test("rmat is skewed: top-1% vertices own a large edge share") {
    val e = GraphGen.rmat(spark, 12, 40000, seed = 2)
    val degs = e.groupBy("dst").count().orderBy(org.apache.spark.sql.functions.desc("count"))
      .collect().map(_.getLong(1))
    val top = degs.take(math.max(1, degs.length / 100)).sum.toDouble
    assert(top / 40000 > 0.05, s"top share ${top / 40000} too uniform for RMAT")
  }

  test("uniform has near-uniform degrees") {
    val e = GraphGen.uniform(spark, n = 1000, edges = 20000, seed = 3)
    assert(e.count() == 20000)
    val degs = e.groupBy("dst").count().collect().map(_.getLong(1))
    assert(degs.max < 60, s"max degree ${degs.max} too skewed for uniform")
  }

  test("highDiameter grid BFS needs many levels") {
    val e = GraphGen.highDiameter(spark, side = 12, shortcutFrac = 0.0, seed = 4)
    val csr = LocalCsr.fromDataFrame(e)
    val dist = repro.analytics.Reference.bfs(csr, 0)
    assert(dist.max >= 10, s"diameter ${dist.max} too small")
  }

  test("simplify removes self-loops and duplicates") {
    import spark.implicits._
    val e = Seq((1L, 1L), (1L, 2L), (1L, 2L), (2L, 1L)).toDF("src", "dst")
    val s = GraphGen.simplify(e).collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(s == Set((1L, 2L), (2L, 1L)))
  }

  test("PropertyGraph.fromEdges builds consistent vertex set") {
    import spark.implicits._
    val g = PropertyGraph.fromEdges(spark, Seq((1L, 2L), (2L, 3L)).toDF("src", "dst"))
    assert(g.vertexCount == 3)
    assert(g.edgeCount == 2)
    assert(g.edges.columns.toSet == Set("src", "dst", "label", "ts", "weight"))
  }

  test("PropertyGraph degree helper matches groupBy") {
    import spark.implicits._
    val g = PropertyGraph.fromEdges(spark, Seq((1L, 2L), (1L, 3L), (2L, 3L)).toDF("src", "dst"))
    val d = g.outDegrees.collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    assert(d == Map(1L -> 2L, 2L -> 1L))
  }
}
