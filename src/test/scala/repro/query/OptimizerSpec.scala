package repro.query

import org.scalatest.funsuite.AnyFunSuite
import repro.query.ir._

class OptimizerSpec extends AnyFunSuite {

  private def plan(cypher: String) = CypherParser.parse(cypher)

  // ------------------------------------------------------ FilterPushIntoMatch

  test("filter push: single-alias conjunct moves into the vertex spec") {
    val p = plan("MATCH (a:P)-[:K]->(b:P) WHERE a.x = 1 AND b.y > 2 RETURN count(*) AS c")
    val pushed = Optimizer.filterPushIntoMatch(p)
    val m = pushed.ops(0).asInstanceOf[MatchOp]
    assert(m.vertices("a").preds == Vector(Cmp("=", Prop("a", "x"), Lit(1L))))
    assert(m.vertices("b").preds == Vector(Cmp(">", Prop("b", "y"), Lit(2L))))
    assert(!pushed.ops.exists(_.isInstanceOf[SelectOp]), "SELECT should be fully consumed")
  }

  test("filter push: cross-alias conjunct stays in SELECT") {
    val p = plan("MATCH (a)-[:K]->(b) WHERE a.x = b.x AND a.y = 1 RETURN count(*) AS c")
    val pushed = Optimizer.filterPushIntoMatch(p)
    val m = pushed.ops(0).asInstanceOf[MatchOp]
    assert(m.vertices("a").preds.nonEmpty)
    assert(pushed.ops(1) == SelectOp(Cmp("=", Prop("a", "x"), Prop("b", "x"))))
  }

  test("filter push: edge-alias conjunct moves onto the pattern edge") {
    val p = plan("MATCH (a)-[e:BUY]->(b) WHERE e.ts < 100 RETURN count(*) AS c")
    val pushed = Optimizer.filterPushIntoMatch(p)
    val m = pushed.ops(0).asInstanceOf[MatchOp]
    assert(m.edges(0).pred.contains(Cmp("<", Prop("e", "ts"), Lit(100L))))
  }

  // ------------------------------------------------------------ EdgeVertexFusion

  test("fusion: unreferenced edge alias collapses ExpandE+GetV into ExpandV") {
    val p = plan("MATCH (a:P)-[:K]->(b:P) RETURN count(*) AS c")
    val unfused = Optimizer.optimize(p, None, Optimizer.Options(fusion = false, cbo = false))
    assert(unfused.ops.count(_.isInstanceOf[ExpandE]) == 1)
    assert(unfused.ops.count(_.isInstanceOf[GetV]) == 1)
    val fused = Optimizer.optimize(p, None, Optimizer.Options(cbo = false))
    assert(fused.ops.count(_.isInstanceOf[ExpandV]) == 1)
    assert(!fused.ops.exists(_.isInstanceOf[ExpandE]))
  }

  test("fusion: referenced edge alias blocks fusion") {
    val p = plan("MATCH (a)-[e:BUY]->(b) RETURN e.ts AS ts")
    val fused = Optimizer.optimize(p, None, Optimizer.Options(cbo = false))
    assert(fused.ops.exists(_.isInstanceOf[ExpandE]), "edge used downstream must stay bound")
  }

  test("fusion: edge pred carried into the fused op") {
    val p = plan("MATCH (a)-[e:BUY]->(b) WHERE e.ts < 9 RETURN count(*) AS c")
    val fused = Optimizer.optimize(p, None, Optimizer.Options(cbo = false))
    val ev = fused.ops.collectFirst { case x: ExpandV => x }.get
    assert(ev.edgePred.contains(Cmp("<", Prop("e", "ts"), Lit(9L))))
  }

  // ----------------------------------------------------------------- lowering

  test("lowering: chain pattern becomes scan + expands in textual order") {
    val p = plan("MATCH (a:X)-[:E]->(b:Y)-[:F]->(c:Z) RETURN count(*) AS n")
    val low = Optimizer.optimize(p, None, Optimizer.Options(fusion = false, cbo = false))
    val kinds = low.ops.map(_.getClass.getSimpleName)
    assert(kinds == Vector("ScanV", "ExpandE", "GetV", "ExpandE", "GetV", "AggregateOp"))
    assert(low.ops(0).asInstanceOf[ScanV].alias == "a")
  }

  test("lowering: reversed traversal when only the target is bound") {
    val p = plan("MATCH (a:X)-[:E]->(b:Y), (c:Z)-[:F]->(b) RETURN count(*) AS n")
    val low = Optimizer.optimize(p, None, Optimizer.Options(fusion = true, cbo = false))
    // second edge written c->b but b is bound first; engine must expand b<-c
    val expands = low.ops.collect { case e: ExpandV => e }
    assert(expands.length == 2)
    assert(expands(1).from == "b" && expands(1).to == "c" && expands(1).dir == PDir.In)
  }

  test("lowering: second MATCH expands from bound aliases, no rescan") {
    val p = plan(
      """MATCH (v:A {id: 1})-[:B]->(i:I) WITH v, count(i) AS c1
         MATCH (v)-[:K]-(f:A) RETURN count(*) AS c2""")
    val low = Optimizer.optimize(p, None, Optimizer.Options(cbo = false))
    val afterAgg = low.ops.dropWhile(!_.isInstanceOf[AggregateOp]).tail
    assert(!afterAgg.exists(_.isInstanceOf[ScanV]),
      s"second MATCH must not rescan: $afterAgg")
  }

  // ---------------------------------------------------------------------- CBO

  private val cat = Catalog(
    vertexCount = Map("TAG" -> 100L, "MSG" -> 100000L, "PERSON" -> 5000L),
    tripleCount = Map(
      ("MSG", "HAS_TAG", "TAG") -> 100000L,
      ("MSG", "HAS_CREATOR", "PERSON") -> 100000L),
    ndv = Map(("TAG", "name") -> 100L, ("PERSON", "country") -> 25L))

  test("cbo: starts from the most selective vertex") {
    val p = plan(
      """MATCH (m:MSG)-[:HAS_TAG]->(t:TAG {name: 'x'}), (m)-[:HAS_CREATOR]->(p:PERSON)
         RETURN count(*) AS c""")
    val pushed = Optimizer.filterPushIntoMatch(p)
    val m = pushed.ops(0).asInstanceOf[MatchOp]
    val (order, _) = Optimizer.cboOrder(m, Set.empty, cat)
    assert(order.head == Left("t"), s"CBO should start at the 1-row tag scan, got $order")
    val textual = Optimizer.optimize(p, None, Optimizer.Options(cbo = false))
    assert(textual.ops.head.asInstanceOf[ScanV].alias == "m", "textual starts at m")
  }

  test("cbo: estimated cost of the chosen order is lower than textual") {
    val p = plan(
      """MATCH (m:MSG)-[:HAS_TAG]->(t:TAG {name: 'x'}), (m)-[:HAS_CREATOR]->(p:PERSON)
         RETURN count(*) AS c""")
    val m = Optimizer.filterPushIntoMatch(p).ops(0).asInstanceOf[MatchOp]
    val (_, cboCost) = Optimizer.cboOrder(m, Set.empty, cat)
    // textual cost: scan all MSG then expand — lower-bounded by |MSG|
    assert(cboCost < 100000L, s"cbo cost $cboCost should beat scanning all messages")
  }

  test("cbo: catalog fanout estimates") {
    assert(cat.fanout(Some("MSG"), Some("HAS_TAG"), PDir.Out, Some("TAG")) == 1.0)
    assert(cat.fanout(Some("TAG"), Some("HAS_TAG"), PDir.In, Some("MSG")) == 1000.0)
  }

  test("cbo: selectivity of id equality is 1/|V|") {
    val sel = cat.selectivity(Some("PERSON"), Cmp("=", Prop("p", "id"), Lit(1L)))
    assert(math.abs(sel - 1.0 / 5000) < 1e-12)
  }

  test("cbo: selectivity of prop equality uses ndv") {
    val sel = cat.selectivity(Some("PERSON"), Cmp("=", Prop("p", "country"), Lit("China")))
    assert(math.abs(sel - 1.0 / 25) < 1e-12)
  }

  test("optimizer end-to-end: all rules leave plan Match-free") {
    SnbWorkloads.complex.foreach { case (name, q) =>
      val opt = Optimizer.optimize(CypherParser.parse(q), None, Optimizer.All)
      assert(!opt.ops.exists(_.isInstanceOf[MatchOp]), s"$name still has MatchOp")
    }
    SnbWorkloads.bi.foreach { case (name, q, _) =>
      val opt = Optimizer.optimize(CypherParser.parse(q), None, Optimizer.All)
      assert(!opt.ops.exists(_.isInstanceOf[MatchOp]), s"$name still has MatchOp")
    }
  }
}
