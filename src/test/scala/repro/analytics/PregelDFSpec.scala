package repro.analytics

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.analytics.df.PregelDF
import repro.graph.{GraphGen, LocalCsr}

class PregelDFSpec extends SparkSpec {

  private lazy val edges = GraphGen.simplify(
    GraphGen.rmat(spark, scale = 8, edges = 1200, seed = 41)).cache()
  private lazy val csr = LocalCsr.fromDataFrame(edges)

  test("pageRank(DF) matches the sequential reference") {
    val got = PregelDF.pageRank(spark, edges, iters = 10).collect()
      .map(r => r.getLong(0) -> r.getDouble(1)).toMap
    val want = Reference.pageRank(csr, 10)
    got.foreach { case (ext, r) =>
      assert(math.abs(r - want(csr.idMap.get(ext))) < 1e-9, s"vertex $ext")
    }
    assert(math.abs(got.values.sum - 1.0) < 1e-6)
  }

  test("bfs(DF) matches DuckDB recursive CTE") {
    val src = csr.extIds((0 until csr.n).maxBy(csr.outDegree))
    val got = PregelDF.bfs(spark, edges, src)
      .select(col("id"), col("dist").cast("long").as("dist"))
    Oracle.assertEquivalent(got,
      s"""WITH RECURSIVE r(id, dist) AS (
            SELECT CAST($src AS BIGINT), CAST(0 AS BIGINT)
            UNION
            SELECT CAST(e.dst AS BIGINT), r.dist + 1
            FROM r JOIN e ON CAST(e.src AS BIGINT) = r.id
            WHERE r.dist < 50
          )
          SELECT id, min(dist) AS dist FROM r GROUP BY id""",
      "e" -> edges)
  }

  test("bfs(DF) matches the sequential reference on a high-diameter graph") {
    val grid = GraphGen.highDiameter(spark, side = 10, shortcutFrac = 0.0)
    val gcsr = LocalCsr.fromDataFrame(grid)
    val got = PregelDF.bfs(spark, grid, 0L).collect()
      .map(r => r.getLong(0) -> r.getInt(1)).toMap
    val want = Reference.bfs(gcsr, gcsr.idMap.get(0L))
    (0 until gcsr.n).foreach { v =>
      val ext = gcsr.extIds(v)
      if (want(v) >= 0) assert(got(ext) == want(v), s"vertex $ext")
      else assert(!got.contains(ext))
    }
  }

  test("wcc(DF) partitions vertices like the reference") {
    val got = PregelDF.wcc(spark, edges).collect()
      .map(r => r.getLong(0) -> r.getLong(1)).toMap
    val want = Reference.wcc(csr)
    val gotGroups = got.groupBy(_._2).values.map(_.keys.toSet).toSet
    val wantGroups = want.zipWithIndex.groupBy(_._1).values
      .map(_.map(p => csr.extIds(p._2)).toSet).toSet
    assert(gotGroups == wantGroups)
  }

  test("sssp(DF) matches Dijkstra") {
    val rng = new java.util.Random(47)
    val wEdges = edges.withColumn("weight", (rand(47) * 2 + 0.5)).cache()
    // align weights to CSR edge order by re-reading the same DF
    val rows = wEdges.select("src", "dst", "weight").collect()
    val srcA = rows.map(_.getLong(0)); val dstA = rows.map(_.getLong(1))
    val csr2 = LocalCsr.build(srcA, dstA)
    val weights = new Array[Double](rows.length)
    val pos = java.util.Arrays.copyOf(csr2.outOff, csr2.n)
    rows.foreach { r =>
      val s = csr2.idMap.get(r.getLong(0))
      weights(pos(s)) = r.getDouble(2); pos(s) += 1
    }
    val src = csr2.extIds((0 until csr2.n).maxBy(csr2.outDegree))
    val got = PregelDF.sssp(spark, wEdges, src).collect()
      .map(r => r.getLong(0) -> r.getDouble(1)).toMap
    val want = Reference.sssp(csr2, weights, csr2.idMap.get(src))
    (0 until csr2.n).foreach { v =>
      val ext = csr2.extIds(v)
      if (want(v).isInfinity) assert(!got.contains(ext))
      else assert(math.abs(got(ext) - want(v)) < 1e-9, s"vertex $ext")
    }
  }

  test("pageRank(DF) on a dangling graph stays a distribution") {
    import spark.implicits._
    val e = Seq((1L, 2L), (1L, 3L), (2L, 3L)).toDF("src", "dst")
    val pr = PregelDF.pageRank(spark, e, 20).collect().map(_.getDouble(1))
    assert(math.abs(pr.sum - 1.0) < 1e-9)
  }
}
