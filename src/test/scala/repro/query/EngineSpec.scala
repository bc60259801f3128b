package repro.query

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.graph.SnbData
import repro.storage.VineyardStore
import repro.query.ir._

/** Engine correctness: Gaia (DataFrame) against the DuckDB oracle, and
  * HiActor (tuple interpreter over GRIN) against Gaia — the paper's claim
  * that one IR serves both OLAP and OLTP backends.
  */
class EngineSpec extends SparkSpec {

  private lazy val pg = SnbData.generate(spark, nPersons = 150, seed = 3)
  private lazy val store = VineyardStore.fromPropertyGraph(pg)
  private lazy val catalog = Catalog.fromPropertyGraph(pg)
  private lazy val v = pg.vertices.cache()
  private lazy val e = pg.edges.cache()

  private def gaia(cypher: String, params: Map[String, Any] = Map.empty,
                   opts: Optimizer.Options = Optimizer.All) = {
    val plan = Optimizer.optimize(CypherParser.parse(cypher), Some(catalog), opts)
    GaiaExec.execute(plan, pg, params)
  }

  private def hiactor(cypher: String, params: Map[String, Any] = Map.empty,
                      opts: Optimizer.Options = Optimizer.All) = {
    val plan = Optimizer.optimize(CypherParser.parse(cypher), Some(catalog), opts)
    HiActorExec.execute(plan, store, params)
  }

  /** Canonical rendering to compare a DataFrame with a QueryResult. */
  private def canonDf(df: org.apache.spark.sql.DataFrame): Seq[Seq[String]] = {
    val cols = df.columns.sorted
    df.collect().toSeq.map(r => cols.map { c =>
      r.get(r.fieldIndex(c)) match {
        case null => "null"
        case d: java.lang.Double => f"${d.doubleValue}%.6f"
        case x => x.toString
      }
    }.toSeq).sortBy(_.mkString("|"))
  }
  private def canonQr(qr: QueryResult): Seq[Seq[String]] = {
    val order = qr.columns.sorted.map(qr.columns.indexOf)
    qr.rows.map(r => order.map { i =>
      r(i) match {
        case null => "null"
        case d: Double => f"$d%.6f"
        case x => x.toString
      }
    }).sortBy(_.mkString("|"))
  }
  private def assertEnginesAgree(cypher: String, params: Map[String, Any] = Map.empty): Unit = {
    val g = canonDf(gaia(cypher, params))
    val h = canonQr(hiactor(cypher, params))
    assert(g == h, s"Gaia vs HiActor mismatch for:\n$cypher\n gaia=${g.take(3)}\n hi=${h.take(3)}")
  }

  // ---------------------------------------------------------- Gaia vs DuckDB

  test("gaia: label count matches oracle") {
    val got = gaia("MATCH (p:PERSON) RETURN count(*) AS cnt")
    Oracle.assertEquivalent(got,
      "SELECT count(*) AS cnt FROM v WHERE label = 'PERSON'", "v" -> v)
  }

  test("gaia: 1-hop expansion with property projection matches oracle") {
    val got = gaia(
      "MATCH (p:PERSON)-[:KNOWS]->(f:PERSON) RETURN p.id AS pid, f.id AS fid")
    Oracle.assertEquivalent(got,
      """SELECT CAST(e.src AS BIGINT) AS pid, CAST(e.dst AS BIGINT) AS fid
         FROM e WHERE e.label = 'KNOWS'""",
      "e" -> e)
  }

  test("gaia: undirected edge doubles orientation (oracle)") {
    val got = gaia("MATCH (p:PERSON {id: 17})-[:KNOWS]-(f:PERSON) RETURN f.id AS fid")
    Oracle.assertEquivalent(got,
      """SELECT CAST(dst AS BIGINT) AS fid FROM e WHERE label = 'KNOWS' AND src = '17'
         UNION ALL
         SELECT CAST(src AS BIGINT) AS fid FROM e WHERE label = 'KNOWS' AND dst = '17'""",
      "e" -> e)
  }

  test("gaia: two-hop with aggregation matches oracle") {
    val got = gaia(
      """MATCH (p:PERSON)<-[:HAS_CREATOR]-(m)-[:HAS_TAG]->(t:TAG)
         RETURN t.name AS tag, count(*) AS cnt""")
    Oracle.assertEquivalent(got,
      """SELECT t.name AS tag, count(*) AS cnt
         FROM e hc JOIN e ht ON hc.src = ht.src
         JOIN v t ON ht.dst = t.id
         JOIN v p ON hc.dst = p.id
         WHERE hc.label = 'HAS_CREATOR' AND ht.label = 'HAS_TAG'
           AND t.label = 'TAG' AND p.label = 'PERSON'
         GROUP BY t.name""",
      "e" -> e, "v" -> v)
  }

  test("gaia: WHERE with arithmetic and ordering matches oracle") {
    val got = gaia(
      """MATCH (m:POST) WHERE m.length > 100
         RETURN m.country AS country, count(*) AS cnt
         ORDER BY cnt DESC, country ASC LIMIT 5""")
    Oracle.assertEquivalent(got,
      """SELECT country, count(*) AS cnt FROM v
         WHERE label = 'POST' AND CAST(length AS BIGINT) > 100
         GROUP BY country ORDER BY cnt DESC, country ASC LIMIT 5""",
      "v" -> v)
  }

  test("gaia: avg/min/max aggregates match oracle") {
    val got = gaia(
      """MATCH (m:COMMENT) RETURN m.country AS country,
         avg(m.length) AS a, min(m.length) AS mn, max(m.length) AS mx""")
    Oracle.assertEquivalent(got,
      """SELECT country, avg(CAST(length AS DOUBLE)) AS a,
                min(CAST(length AS BIGINT)) AS mn, max(CAST(length AS BIGINT)) AS mx
         FROM v WHERE label = 'COMMENT' GROUP BY country""",
      "v" -> v)
  }

  test("gaia: DISTINCT projection matches oracle") {
    val got = gaia("MATCH (p:PERSON)-[:LIKES]->(m:POST) RETURN DISTINCT p.id AS pid")
    Oracle.assertEquivalent(got,
      """SELECT DISTINCT CAST(e.src AS BIGINT) AS pid
         FROM e JOIN v m ON e.dst = m.id
         WHERE e.label = 'LIKES' AND m.label = 'POST'""",
      "e" -> e, "v" -> v)
  }

  test("gaia: count(DISTINCT) matches oracle") {
    val got = gaia(
      "MATCH (p:PERSON)-[:KNOWS]->(f:PERSON) RETURN count(DISTINCT f) AS cnt")
    Oracle.assertEquivalent(got,
      "SELECT count(DISTINCT dst) AS cnt FROM e WHERE label = 'KNOWS'", "e" -> e)
  }

  test("gaia: edge property predicate matches oracle") {
    val got = gaia(
      """MATCH (a:ACCOUNT)-[b:BUY]->(i:ITEM) WHERE b.ts < 18100
         RETURN count(*) AS cnt""",
      opts = Optimizer.All) // uses the fraud graph below
    // run on fraud graph instead
    val fg = SnbData.fraudGraph(spark, 80, 40, 400)
    val plan = Optimizer.optimize(CypherParser.parse(
      """MATCH (a:ACCOUNT)-[b:BUY]->(i:ITEM) WHERE b.ts < 18100
         RETURN count(*) AS cnt"""), None, Optimizer.All)
    val got2 = GaiaExec.execute(plan, fg)
    Oracle.assertEquivalent(got2,
      "SELECT count(*) AS cnt FROM e WHERE label = 'BUY' AND CAST(ts AS BIGINT) < 18100",
      "e" -> fg.edges)
  }

  // ------------------------------------------------------- HiActor vs Gaia

  test("engines agree: point lookup") {
    assertEnginesAgree("MATCH (p:PERSON {id: 42}) RETURN p.firstName AS fn, p.country AS c")
  }

  test("engines agree: 1-hop friends") {
    assertEnginesAgree("MATCH (p:PERSON {id: 13})-[:KNOWS]-(f:PERSON) RETURN f.id AS fid")
  }

  test("engines agree: filtered expansion") {
    assertEnginesAgree(
      """MATCH (p:PERSON {id: 29})-[:KNOWS]-(f:PERSON)
         WHERE f.firstName = 'Jan' RETURN f.id AS fid, f.lastName AS ln""")
  }

  test("engines agree: aggregation over 2 hops") {
    assertEnginesAgree(
      """MATCH (p:PERSON {id: 5})-[:KNOWS]-(f:PERSON)<-[:HAS_CREATOR]-(m)
         RETURN f.id AS fid, count(m) AS cnt""")
  }

  test("engines agree: order by + limit") {
    assertEnginesAgree(
      """MATCH (p:PERSON {id: 7})-[:KNOWS]-(f:PERSON)
         RETURN f.id AS fid ORDER BY fid LIMIT 5""")
  }

  test("engines agree: parameterized stored query") {
    val q = """MATCH (p:PERSON {id: $pid})-[:KNOWS]-(f:PERSON) RETURN count(*) AS cnt"""
    (1 to 10).foreach { pid =>
      assertEnginesAgree(q, Map("pid" -> pid.toLong))
    }
  }

  test("engines agree on the whole SNB-lite complex suite") {
    val params = Map("id" -> 11L, "name" -> "Sam", "maxDate" -> 15500L,
      "country" -> "China")
    SnbWorkloads.complex.foreach { case (name, q) =>
      val g = canonDf(gaia(q, params))
      val h = canonQr(hiactor(q, params))
      assert(g == h, s"$name: gaia=${g.take(3)} hiactor=${h.take(3)}")
    }
  }

  test("engines agree on the short suite") {
    val params = Map("id" -> 23L, "mid" -> (SnbData.MsgBase + 5))
    SnbWorkloads.short.foreach { case (name, q) =>
      val g = canonDf(gaia(q, params))
      val h = canonQr(hiactor(q, params))
      assert(g == h, s"$name: gaia=${g.take(3)} hiactor=${h.take(3)}")
    }
  }

  test("optimization preserves results (all option combinations, HiActor)") {
    val q = """MATCH (p:PERSON)-[:KNOWS]-(f:PERSON)<-[:HAS_CREATOR]-(m)
               WHERE p.id = 31 RETURN count(*) AS cnt"""
    val combos = for (fp <- Seq(true, false); fu <- Seq(true, false); cb <- Seq(true, false))
      yield Optimizer.Options(fp, fu, cb)
    val results = combos.map(o => canonQr(hiactor(q, opts = o)))
    assert(results.distinct.size == 1, s"plans disagree: ${results.distinct}")
  }

  test("optimization preserves results (CBO reorder, Gaia)") {
    val q = """MATCH (m)-[:HAS_TAG]->(t:TAG {name: 'tag1'}), (m)-[:HAS_CREATOR]->(p:PERSON)
               RETURN p.country AS c, count(*) AS cnt"""
    val a = canonDf(gaia(q, opts = Optimizer.Options(cbo = true)))
    val b = canonDf(gaia(q, opts = Optimizer.Options(cbo = false)))
    assert(a == b)
  }

  test("hiactor runtime: concurrent submissions all complete correctly") {
    val rt = new HiActorRuntime(8)
    val plan = Optimizer.optimize(CypherParser.parse(
      "MATCH (p:PERSON {id: $pid})-[:KNOWS]-(f:PERSON) RETURN count(*) AS cnt"),
      Some(catalog), Optimizer.All)
    val futures = (1 to 100).map { i =>
      val pid = (i % 50) + 1L
      pid -> rt.submit(HiActorExec.execute(plan, store, Map("pid" -> pid)))
    }
    val direct = futures.map(_._1).distinct.map { pid =>
      pid -> HiActorExec.execute(plan, store, Map("pid" -> pid)).rows
    }.toMap
    futures.foreach { case (pid, f) =>
      assert(f.get(10, java.util.concurrent.TimeUnit.SECONDS).rows == direct(pid))
    }
    rt.shutdown()
  }

  test("tugraph-sim returns identical results, serially") {
    val sim = new TuGraphSim(store)
    val unopt = Optimizer.optimize(CypherParser.parse(
      "MATCH (p:PERSON)-[:KNOWS]-(f:PERSON) WHERE p.id = 9 RETURN count(*) AS cnt"),
      None, Optimizer.None_)
    val opt = Optimizer.optimize(CypherParser.parse(
      "MATCH (p:PERSON)-[:KNOWS]-(f:PERSON) WHERE p.id = 9 RETURN count(*) AS cnt"),
      Some(catalog), Optimizer.All)
    assert(sim.run(unopt, Map.empty).rows == HiActorExec.execute(opt, store, Map.empty).rows)
  }

  test("gremlin chain executes on both engines") {
    val plan = Optimizer.optimize(GremlinParser.parse(
      "g.V(25).out('KNOWS').out('KNOWS').count()"), Some(catalog), Optimizer.All)
    val h = HiActorExec.execute(plan, store)
    val g = GaiaExec.execute(plan, pg).collect()
    assert(h.rows.head.head.toString == g(0).get(0).toString)
  }
}
