package repro.query

import org.scalatest.funsuite.AnyFunSuite
import repro.query.ir._

class ParserSpec extends AnyFunSuite {

  // ---------------------------------------------------------------- Cypher

  test("cypher: simple match-return") {
    val p = CypherParser.parse("MATCH (a:PERSON) RETURN a.id AS id")
    assert(p.ops.length == 2)
    val m = p.ops(0).asInstanceOf[MatchOp]
    assert(m.vertices("a").label.contains("PERSON"))
    assert(m.edges.isEmpty)
    assert(p.ops(1) == ProjectOp(Vector((Prop("a", "id"), "id"))))
  }

  test("cypher: property map becomes an equality predicate") {
    val p = CypherParser.parse("MATCH (a:PERSON {id: 7}) RETURN a.id AS id")
    val m = p.ops(0).asInstanceOf[MatchOp]
    assert(m.vertices("a").preds == Vector(Cmp("=", Prop("a", "id"), Lit(7L))))
  }

  test("cypher: parameterized property map") {
    val p = CypherParser.parse("MATCH (a:PERSON {id: $pid}) RETURN a.id AS id")
    val m = p.ops(0).asInstanceOf[MatchOp]
    assert(m.vertices("a").preds == Vector(Cmp("=", Prop("a", "id"), Param("pid"))))
  }

  test("cypher: directed and undirected edges") {
    val p = CypherParser.parse(
      "MATCH (a)-[:X]->(b), (b)<-[:Y]-(c), (c)-[:Z]-(d) RETURN count(*) AS cnt")
    val m = p.ops(0).asInstanceOf[MatchOp]
    assert(m.edges(0) == PatternEdge("a", Some("X"), PDir.Out, "b", None, None))
    assert(m.edges(1) == PatternEdge("b", Some("Y"), PDir.In, "c", None, None))
    assert(m.edges(2) == PatternEdge("c", Some("Z"), PDir.Both, "d", None, None))
  }

  test("cypher: edge alias is captured") {
    val p = CypherParser.parse("MATCH (a)-[e:BUY]->(b) RETURN e.ts AS ts")
    val m = p.ops(0).asInstanceOf[MatchOp]
    assert(m.edges(0).edgeAlias.contains("e"))
  }

  test("cypher: WHERE becomes SelectOp") {
    val p = CypherParser.parse(
      "MATCH (a:PERSON) WHERE a.age > 30 AND a.name = 'x' RETURN a.id AS id")
    assert(p.ops(1) == SelectOp(And(
      Cmp(">", Prop("a", "age"), Lit(30L)),
      Cmp("=", Prop("a", "name"), Lit("x")))))
  }

  test("cypher: IN list and arithmetic") {
    val p = CypherParser.parse(
      "MATCH (a) WHERE a.id IN [1, 2, 3] AND a.x + a.y * 2 < 10 RETURN count(*) AS c")
    val sel = p.ops(1).asInstanceOf[SelectOp]
    val cs = Expr.conjuncts(sel.pred)
    assert(cs(0) == InList(Prop("a", "id"), Vector(1L, 2L, 3L)))
    assert(cs(1) == Cmp("<", Arith("+", Prop("a", "x"),
      Arith("*", Prop("a", "y"), Lit(2L))), Lit(10L)))
  }

  test("cypher: aggregates with keys") {
    val p = CypherParser.parse(
      "MATCH (a:PERSON)-[:KNOWS]->(b) RETURN a.country AS c, count(b) AS cnt, avg(b.age) AS m")
    val agg = p.ops.last.asInstanceOf[AggregateOp]
    assert(agg.keys == Vector((Prop("a", "country"), "c")))
    assert(agg.aggs == Vector(
      AggCall("count", Some(Ref("b")), distinct = false, "cnt"),
      AggCall("avg", Some(Prop("b", "age")), distinct = false, "m")))
  }

  test("cypher: count(*) and count(DISTINCT x)") {
    val p = CypherParser.parse("MATCH (a) RETURN count(*) AS c, count(DISTINCT a.x) AS d")
    val agg = p.ops.last.asInstanceOf[AggregateOp]
    assert(agg.aggs(0) == AggCall("count", None, distinct = false, "c"))
    assert(agg.aggs(1) == AggCall("count", Some(Prop("a", "x")), distinct = true, "d"))
  }

  test("cypher: ORDER BY and LIMIT") {
    val p = CypherParser.parse(
      "MATCH (a) RETURN a.id AS id ORDER BY id DESC, a.name ASC LIMIT 5")
    assert(p.ops.takeRight(2) == Vector(
      OrderByOp(Vector((Ref("id"), false), (Prop("a", "name"), true))),
      LimitOp(5)))
  }

  test("cypher: WITH pipeline (the fraud query shape)") {
    val p = CypherParser.parse(
      """MATCH (v:ACCOUNT {id: $id})-[b1:BUY]->(i:ITEM)<-[b2:BUY]-(s:ACCOUNT)
         WHERE s.id IN [5, 6] AND b1.ts - b2.ts < 5
         WITH v, count(s) AS cnt1
         MATCH (v)-[:KNOWS]-(f:ACCOUNT)
         RETURN v.id AS vid, cnt1, count(f) AS cnt2""")
    val kinds = p.ops.map(_.getClass.getSimpleName)
    assert(kinds == Vector("MatchOp", "SelectOp", "AggregateOp", "MatchOp", "AggregateOp"))
    val agg1 = p.ops(2).asInstanceOf[AggregateOp]
    assert(agg1.keys == Vector((Ref("v"), "v")))
  }

  test("cypher: DISTINCT return") {
    val p = CypherParser.parse("MATCH (a)-[:K]->(b) RETURN DISTINCT b.id AS id")
    assert(p.ops.last == ProjectOp(Vector((Prop("b", "id"), "id")), distinct = true))
  }

  test("cypher: rejects garbage") {
    intercept[IllegalArgumentException](CypherParser.parse("MATCH a RETURN a"))
    intercept[IllegalArgumentException](CypherParser.parse("SELECT * FROM t"))
  }

  // ---------------------------------------------------------------- Gremlin

  test("gremlin: V().hasLabel().out() chain") {
    val p = GremlinParser.parse("g.V().hasLabel('PERSON').out('KNOWS').count()")
    val m = p.ops(0).asInstanceOf[MatchOp]
    assert(m.edges.length == 1)
    assert(m.edges(0).elabel.contains("KNOWS"))
    assert(m.edges(0).dir == PDir.Out)
    assert(p.ops(1).isInstanceOf[AggregateOp])
  }

  test("gremlin: V(id) becomes an id predicate") {
    val p = GremlinParser.parse("g.V(42).out('K').values('name')")
    val m = p.ops(0).asInstanceOf[MatchOp]
    val start = m.edges(0).from
    assert(m.vertices(start).preds == Vector(Cmp("=", Prop(start, "id"), Lit(42L))))
  }

  test("gremlin: has with comparators") {
    val p = GremlinParser.parse("g.V().hasLabel('P').has('age', gt(30)).has('n', 'x').count()")
    val m = p.ops(0).asInstanceOf[MatchOp]
    val a = m.vertices.keys.head
    assert(m.vertices(a).preds.contains(Cmp(">", Prop(a, "age"), Lit(30L))))
    assert(m.vertices(a).preds.contains(Cmp("=", Prop(a, "n"), Lit("x"))))
  }

  test("gremlin: within() becomes IN") {
    val p = GremlinParser.parse("g.V().has('id', within(1, 2)).count()")
    val m = p.ops(0).asInstanceOf[MatchOp]
    val a = m.vertices.keys.head
    assert(m.vertices(a).preds == Vector(InList(Prop(a, "id"), Vector(1L, 2L))))
  }

  test("gremlin: outE/inV unfused pair keeps the edge alias") {
    val p = GremlinParser.parse("g.V().outE('BUY').inV().count()")
    val m = p.ops(0).asInstanceOf[MatchOp]
    assert(m.edges(0).edgeAlias.nonEmpty)
    assert(m.edges(0).elabel.contains("BUY"))
  }

  test("gremlin: as/select") {
    val p = GremlinParser.parse("g.V().hasLabel('A').as('x').out('K').as('y').select('x', 'y')")
    val proj = p.ops.last.asInstanceOf[ProjectOp]
    assert(proj.items == Vector((Ref("x"), "x"), (Ref("y"), "y")))
    val m = p.ops(0).asInstanceOf[MatchOp]
    assert(m.edges(0).from == "x" && m.edges(0).to == "y")
    assert(m.vertices("x").label.contains("A"))
  }

  test("gremlin: groupCount().by()") {
    val p = GremlinParser.parse("g.V().hasLabel('T').groupCount().by('name')")
    val agg = p.ops.last.asInstanceOf[AggregateOp]
    assert(agg.keys.length == 1 && agg.aggs.length == 1)
  }

  test("gremlin: order and limit") {
    val p = GremlinParser.parse("g.V().values('x').order().by('x', desc).limit(3)")
    assert(p.ops.last == LimitOp(3))
    assert(p.ops(p.ops.length - 2) == OrderByOp(Vector((Ref("x"), false))))
  }

  test("gremlin: rejects unsupported steps") {
    intercept[IllegalArgumentException](GremlinParser.parse("g.V().repeat(out())"))
    intercept[IllegalArgumentException](GremlinParser.parse("g.E().count()"))
  }

  // ------------------------------------------------- Fig. 5: unified IR

  test("gremlin and cypher converge to the same IR (Fig. 5)") {
    val cypher = CypherParser.parse(
      """MATCH (a:BUYER)-[:KNOWS]->(b:BUYER)-[:BUY]->(c:ITEM)
         WHERE a.username = 'A1'
         RETURN c.price AS price""")
    val gremlin = GremlinParser.parse(
      "g.V().hasLabel('BUYER').has('username', 'A1')" +
        ".out('KNOWS').hasLabel('BUYER').out('BUY').hasLabel('ITEM').values('price')")
    // Cypher puts the filter in WHERE; push it so both sides align, then
    // compare the *normalized* plans (alias names differ by construction).
    val c = IrPlan.normalize(Optimizer.filterPushIntoMatch(cypher))
    val g = IrPlan.normalize(gremlin)
    // project aliases differ (price vs p); compare match structure + shape
    assert(c.ops.head == g.ops.head, s"\ncypher: ${c.ops.head}\ngremlin: ${g.ops.head}")
    assert(c.ops.length == g.ops.length)
  }

  test("normalization makes alias choice irrelevant") {
    val p1 = CypherParser.parse("MATCH (x:A)-[:E]->(y:B) RETURN count(*) AS c")
    val p2 = CypherParser.parse("MATCH (u:A)-[:E]->(w:B) RETURN count(*) AS c")
    assert(IrPlan.normalize(p1) == IrPlan.normalize(p2))
  }
}
