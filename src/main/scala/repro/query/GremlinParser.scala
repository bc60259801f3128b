package repro.query

import repro.query.ir._
import Lexer._

/** Gremlin front-end → GraphIR (paper §5.1).
  *
  * Supported traversal subset:
  * {{{
  *   g.V([id...]).hasLabel('L').has('k', v).has('k', gt(v))
  *    .out('T').in('T').both('T').outE('T').inE('T').inV().outV()
  *    .as('x').select('x','y').by('p')
  *    .where(...predicates on bound aliases...)
  *    .values('p').order().by('p'[, desc]).limit(n)
  *    .count().groupCount().by('p').dedup()
  * }}}
  * The chain lowers to the same [[MatchOp]]-based logical plan as Cypher —
  * the unified-IR claim of Fig. 5. `out()` becomes a pattern edge exactly
  * like Cypher's `-[:T]->`; terminal steps become relational operators.
  */
object GremlinParser {

  def parse(query: String): IrPlan = {
    val s = new Stream(tokenize(query))
    val ops = Vector.newBuilder[IrOp]

    val vs = scala.collection.mutable.LinkedHashMap.empty[String, VertexSpec]
    val es = scala.collection.mutable.ArrayBuffer.empty[PatternEdge]
    var fresh = 0
    def freshAlias(): String = { fresh += 1; s"__v$fresh" }

    var cur: String = null            // current vertex alias
    var curEdge: Option[String] = None // set between outE/inE and inV/outV
    var pendingEdgeLabel: Option[String] = None
    var pendingEdgeDir: PDir.Value = PDir.Out
    var matchEmitted = false
    val postMatch = Vector.newBuilder[IrOp]
    var terminal = false

    def addVertexPred(alias: String, pred: Expr): Unit =
      vs(alias) = vs(alias).withPred(pred)

    def flushMatch(): Unit = {
      if (!matchEmitted) {
        ops += MatchOp(vs.toMap, es.toVector)
        matchEmitted = true
      }
    }

    def strArg(): String = s.next() match {
      case Str(v) => v
      case other => s.fail(s"expected string literal, got $other")
    }
    def literal(): Any = s.next() match {
      case Num(v, isInt) => if (isInt) v.toLong else v
      case Str(v) => v
      case Punct("$") => ParamValue(s.ident())
      case other => s.fail(s"expected literal, got $other")
    }

    // g.V(...) prologue
    s.expectKeyword("g")
    s.expectPunct(".")
    val head = s.ident()
    require(head == "V", s"traversal must start with g.V(), got g.$head")
    s.expectPunct("(")
    cur = freshAlias()
    vs(cur) = VertexSpec(None, Vector.empty)
    if (!s.tryPunct(")")) {
      val ids = Vector.newBuilder[Any]
      var more = true
      while (more) { ids += literal(); more = s.tryPunct(",") }
      s.expectPunct(")")
      val idList = ids.result()
      val pred =
        if (idList.size == 1) idList.head match {
          case ParamValue(p) => Cmp("=", Prop(cur, "id"), Param(p))
          case v => Cmp("=", Prop(cur, "id"), Lit(v))
        }
        else InList(Prop(cur, "id"), idList)
      addVertexPred(cur, pred)
    }

    while (!s.eof && !terminal) {
      s.expectPunct(".")
      val step = s.ident()
      s.expectPunct("(")
      step match {
        case "hasLabel" =>
          val l = strArg(); s.expectPunct(")")
          if (curEdge.isDefined) s.fail("hasLabel on edges not supported")
          vs(cur) = vs(cur).copy(label = Some(l))
        case "has" =>
          def litOf(v: Any): Expr = v match {
            case ParamValue(p) => Param(p)
            case other => Lit(other)
          }
          val k = strArg(); s.expectPunct(",")
          // has('k', v) or has('k', gt(v)/lt/gte/lte/neq/within(v...))
          val pred: Expr = s.peek match {
            case Ident(op @ ("gt" | "lt" | "gte" | "lte" | "neq" | "eq")) =>
              s.next(); s.expectPunct("(")
              val v = literal()
              s.expectPunct(")")
              val cmpOp = op match {
                case "gt" => ">"; case "lt" => "<"; case "gte" => ">="
                case "lte" => "<="; case "neq" => "<>"; case _ => "="
              }
              Cmp(cmpOp, Prop(cur, k), litOf(v))
            case Ident("within") =>
              s.next(); s.expectPunct("(")
              val items = Vector.newBuilder[Any]
              var more = true
              while (more) { items += literal(); more = s.tryPunct(",") }
              s.expectPunct(")")
              InList(Prop(cur, k), items.result())
            case _ =>
              val v = literal()
              Cmp("=", Prop(cur, k), litOf(v))
          }
          s.expectPunct(")")
          if (matchEmitted) postMatch += SelectOp(pred) else addVertexPred(cur, pred)
        case "out" | "in" | "both" | "outE" | "inE" =>
          val label = if (s.tryPunct(")")) None else { val l = Some(strArg()); s.expectPunct(")"); l }
          val dir = step match {
            case "out" | "outE" => PDir.Out
            case "in" | "inE" => PDir.In
            case _ => PDir.Both
          }
          if (step == "outE" || step == "inE") {
            // Unfused edge expansion: the edge alias is bound; a following
            // inV()/outV() binds the endpoint (candidate for fusion).
            pendingEdgeLabel = label; pendingEdgeDir = dir
            fresh += 1
            curEdge = Some(s"__e$fresh")
          } else {
            // out()/in()/both() never reference the edge — no edge alias,
            // exactly like Cypher's anonymous `-[:T]->` (and fusable).
            val to = freshAlias()
            vs(to) = VertexSpec(None, Vector.empty)
            es += PatternEdge(cur, label, dir, to, None, None)
            cur = to
          }
        case "inV" | "outV" =>
          s.expectPunct(")")
          require(curEdge.isDefined, s"$step requires a preceding outE/inE")
          val to = freshAlias()
          vs(to) = VertexSpec(None, Vector.empty)
          es += PatternEdge(cur, pendingEdgeLabel, pendingEdgeDir, to, curEdge, None)
          cur = to
          curEdge = None
        case "as" =>
          val name = strArg(); s.expectPunct(")")
          // rebind: rename the fresh alias to the user-provided one
          val old = cur
          val spec = vs.remove(old).getOrElse(VertexSpec(None, Vector.empty))
          vs(name) = spec.copy(preds =
            spec.preds.map(Expr.renameAliases(_, Map(old -> name))))
          for (i <- es.indices) {
            val pe = es(i)
            es(i) = pe.copy(
              from = if (pe.from == old) name else pe.from,
              to = if (pe.to == old) name else pe.to)
          }
          cur = name
        case "values" =>
          val p = strArg(); s.expectPunct(")")
          flushMatch()
          postMatch += ProjectOp(Vector((Prop(cur, p), p)))
        case "select" =>
          val names = Vector.newBuilder[String]
          var more = true
          while (more) { names += strArg(); more = s.tryPunct(",") }
          s.expectPunct(")")
          flushMatch()
          postMatch += ProjectOp(names.result().map(n => (Ref(n), n)))
        case "count" =>
          s.expectPunct(")")
          flushMatch()
          postMatch += AggregateOp(Vector.empty,
            Vector(AggCall("count", None, distinct = false, "count")))
          terminal = false
        case "groupCount" =>
          s.expectPunct(")")
          s.expectPunct("."); s.expectKeyword("by"); s.expectPunct("(")
          val p = strArg(); s.expectPunct(")")
          flushMatch()
          postMatch += AggregateOp(Vector((Prop(cur, p), p)),
            Vector(AggCall("count", None, distinct = false, "count")))
        case "dedup" =>
          s.expectPunct(")")
          flushMatch()
          postMatch += ProjectOp(Vector((Ref(cur), cur)), distinct = true)
        case "order" =>
          s.expectPunct(")")
          s.expectPunct("."); s.expectKeyword("by"); s.expectPunct("(")
          val p = strArg()
          var asc = true
          if (s.tryPunct(",")) {
            val d = s.ident()
            asc = !d.equalsIgnoreCase("desc")
          }
          s.expectPunct(")")
          flushMatch()
          postMatch += OrderByOp(Vector((orderKeyExpr(p), asc)))
        case "limit" =>
          val n = s.next() match {
            case Num(v, true) => v.toInt
            case other => s.fail(s"expected int, got $other")
          }
          s.expectPunct(")")
          flushMatch()
          postMatch += LimitOp(n)
        case other => s.fail(s"unsupported Gremlin step: $other")
      }
    }

    // An order().by(p) after values(p) sorts the projected column; before
    // projection it sorts by the current vertex's property.
    def orderKeyExpr(p: String): Expr = Ref(p)

    flushMatch()
    val post = postMatch.result()
    // Bare traversals with no terminal step return the current vertex ids.
    val finalOps =
      if (post.isEmpty) Vector(ProjectOp(Vector((Ref(cur), cur))))
      else post
    IrPlan(ops.result() ++ finalOps)
  }
}
