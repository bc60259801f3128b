package repro.query

import repro.SparkSpec
import repro.graph.SnbData
import repro.query.ir.IrPlan
import repro.storage.VineyardStore

/** Validates the SNB-lite workload definitions themselves: everything
  * parses/optimizes, and each BI query's TigerGraph-sim SQL is semantically
  * identical to the Cypher executed on Gaia — so Exp-2 compares equal work.
  */
class WorkloadsSpec extends SparkSpec {

  private lazy val pg = SnbData.generate(spark, nPersons = 80, seed = 66)
  private lazy val cat = Catalog.fromPropertyGraph(pg)

  test("all interactive workload queries parse and optimize") {
    (SnbWorkloads.complex ++ SnbWorkloads.short).foreach { case (name, q) =>
      val p = Optimizer.optimize(CypherParser.parse(q), Some(cat), Optimizer.All)
      assert(p.ops.nonEmpty, name)
    }
  }

  test("all optimization-study queries parse in both dialects") {
    SnbWorkloads.q1Fusion.foreach { case (name, q) =>
      assert(GremlinParser.parse(q).ops.nonEmpty, name)
    }
    (SnbWorkloads.q2FilterPush ++ SnbWorkloads.q3Cbo).foreach { case (name, q) =>
      assert(CypherParser.parse(q).ops.nonEmpty, name)
    }
  }

  test("BI comparator SQL matches the Cypher on Gaia, row for row") {
    pg.vertices.createOrReplaceTempView("vertices")
    pg.edges.createOrReplaceTempView("edges")
    val params = Map[String, Any]("country" -> "China")
    SnbWorkloads.bi.foreach { case (name, cypher, sqlT) =>
      val plan: IrPlan = Optimizer.optimize(CypherParser.parse(cypher), Some(cat), Optimizer.All)
      val gaia = GaiaExec.execute(plan, pg, params)
      val sql = spark.sql(sqlT.replace("__COUNTRY__", "China"))
      def canon(df: org.apache.spark.sql.DataFrame): Seq[Seq[String]] = {
        val cols = df.columns.sorted
        df.collect().toSeq.map(r => cols.map { c =>
          r.get(r.fieldIndex(c)) match {
            case null => "null"
            case d: java.lang.Double => f"${d.doubleValue}%.6f"
            case x => x.toString
          }
        }.toSeq).sortBy(_.mkString("|"))
      }
      assert(canon(gaia) == canon(sql), s"$name: Gaia and comparator SQL disagree")
    }
  }

  test("interactive queries all produce results on HiActor without error") {
    val store = VineyardStore.fromPropertyGraph(pg)
    val params = Map[String, Any]("id" -> 40L, "name" -> "Sam", "maxDate" -> 15500L,
      "country" -> "China", "mid" -> (SnbData.MsgBase + 3))
    (SnbWorkloads.complex ++ SnbWorkloads.short).foreach { case (name, q) =>
      val p = Optimizer.optimize(CypherParser.parse(q), Some(cat), Optimizer.All)
      val r = HiActorExec.execute(p, store, params)
      assert(r.columns.nonEmpty, name)
    }
  }

  test("stored procedures are reusable across parameter sets") {
    val store = VineyardStore.fromPropertyGraph(pg)
    val proc = new StoredProcedure("friends",
      Optimizer.optimize(CypherParser.parse(
        "MATCH (p:PERSON {id: $pid})-[:KNOWS]-(f:PERSON) RETURN count(*) AS cnt"),
        Some(cat), Optimizer.All))
    val counts = (1 to 20).map(i => proc.run(store, Map("pid" -> i.toLong)).rows.head.head)
    assert(counts.exists(_.asInstanceOf[Long] > 0))
  }
}
