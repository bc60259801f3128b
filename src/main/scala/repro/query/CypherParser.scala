package repro.query

import repro.query.ir._
import Lexer._

/** Cypher front-end → GraphIR (paper §5.1).
  *
  * Supported subset (what the SNB-lite and case-study workloads need):
  * {{{
  *   MATCH (a:L {k: v})-[e:T]->(b) [, more patterns]
  *   [WHERE expr]
  *   [WITH item [AS name], ...  [WHERE expr]  MATCH ...]*
  *   RETURN [DISTINCT] item [AS name], ...
  *   [ORDER BY expr [ASC|DESC], ...] [LIMIT n]
  * }}}
  * Aggregates count/sum/avg/min/max (incl. count(*), count(DISTINCT x));
  * parameters `$name`; IN-lists; arithmetic.
  */
object CypherParser {

  def parse(query: String): IrPlan = {
    val s = new Stream(tokenize(query))
    val ops = Vector.newBuilder[IrOp]
    var fresh = 0
    def freshAlias(prefix: String): String = { fresh += 1; s"__$prefix$fresh" }

    // ---- expressions ----
    def parseExpr(): Expr = parseOr()
    def parseOr(): Expr = {
      var l = parseAnd()
      while (s.isKeyword("OR")) { s.next(); l = Or(l, parseAnd()) }
      l
    }
    def parseAnd(): Expr = {
      var l = parseNot()
      while (s.isKeyword("AND")) { s.next(); l = And(l, parseNot()) }
      l
    }
    def parseNot(): Expr =
      if (s.isKeyword("NOT")) { s.next(); Not(parseNot()) } else parseCmp()
    def parseCmp(): Expr = {
      val l = parseAdd()
      s.peek match {
        case Punct(op @ ("=" | "<>" | "<" | "<=" | ">" | ">=")) =>
          s.next(); Cmp(op, l, parseAdd())
        case Ident(k) if k.equalsIgnoreCase("IN") =>
          s.next()
          s.expectPunct("[")
          val vals = Vector.newBuilder[Any]
          if (!s.tryPunct("]")) {
            var done = false
            while (!done) {
              vals += literal()
              if (!s.tryPunct(",")) { s.expectPunct("]"); done = true }
            }
          }
          InList(l, vals.result())
        case _ => l
      }
    }
    def parseAdd(): Expr = {
      var l = parseMul()
      var more = true
      while (more) s.peek match {
        case Punct(op @ ("+" | "-")) => s.next(); l = Arith(op, l, parseMul())
        case _ => more = false
      }
      l
    }
    def parseMul(): Expr = {
      var l = parsePrimary()
      var more = true
      while (more) s.peek match {
        case Punct(op @ ("*" | "/")) => s.next(); l = Arith(op, l, parsePrimary())
        case _ => more = false
      }
      l
    }
    def literal(): Any = s.next() match {
      case Num(v, isInt) => if (isInt) v.toLong else v
      case Str(v) => v
      case Punct("$") => ParamValue(s.ident())
      case Punct("-") => s.next() match {
        case Num(v, isInt) => if (isInt) -v.toLong else -v
        case other => s.fail(s"expected number after '-', got $other")
      }
      case Ident(b) if b.equalsIgnoreCase("true") => true
      case Ident(b) if b.equalsIgnoreCase("false") => false
      case other => s.fail(s"expected literal, got $other")
    }
    def parsePrimary(): Expr = s.peek match {
      case Punct("(") => s.next(); val e = parseExpr(); s.expectPunct(")"); e
      case Punct("$") => s.next(); Param(s.ident())
      case Num(_, _) | Str(_) => Lit(literal())
      case Punct("-") => Lit(literal())
      case Ident(fn) if isAggFn(fn) && s.peek2 == Punct("(") =>
        // Aggregates are handled by item(); inside general expressions they
        // appear only via item() so reaching here is a usage error.
        s.fail(s"aggregate $fn not allowed here")
      case Ident(_) =>
        val name = s.ident()
        if (s.tryPunct(".")) Prop(name, s.ident()) else Ref(name)
      case other => s.fail(s"unexpected token $other")
    }
    def isAggFn(fn: String): Boolean =
      Seq("count", "sum", "avg", "min", "max").exists(_.equalsIgnoreCase(fn))

    // ---- RETURN / WITH items ----
    final case class Item(expr: Either[Expr, AggCall], alias: String)
    def parseItem(idx: Int): Item = {
      s.peek match {
        case Ident(fn) if isAggFn(fn) && s.peek2 == Punct("(") =>
          s.next(); s.expectPunct("(")
          var distinct = false
          if (s.isKeyword("DISTINCT")) { s.next(); distinct = true }
          val arg: Option[Expr] =
            if (s.tryPunct("*")) None
            else Some(parseExpr())
          s.expectPunct(")")
          val alias = if (s.isKeyword("AS")) { s.next(); s.ident() }
                      else s"${fn.toLowerCase}_$idx"
          Item(Right(AggCall(fn.toLowerCase, arg, distinct, alias)), alias)
        case _ =>
          val e = parseExpr()
          val alias = if (s.isKeyword("AS")) { s.next(); s.ident() }
            else e match {
              case Ref(n) => n
              case Prop(a, p) => s"${a}_$p"
              case _ => s"col_$idx"
            }
          Item(Left(e), alias)
      }
    }
    def parseItems(): Vector[Item] = {
      val out = Vector.newBuilder[Item]
      var i = 0
      var more = true
      while (more) {
        out += parseItem(i); i += 1
        more = s.tryPunct(",")
      }
      out.result()
    }
    def emitItems(items: Vector[Item], distinct: Boolean): Unit = {
      if (items.exists(_.expr.isRight)) {
        val keys = items.collect { case Item(Left(e), a) => (e, a) }
        val aggs = items.collect { case Item(Right(c), _) => c }
        ops += AggregateOp(keys, aggs)
      } else {
        ops += ProjectOp(items.map(i => (i.expr.left.toOption.get, i.alias)), distinct)
      }
    }

    // ---- patterns ----
    def parseNode(vs: scala.collection.mutable.Map[String, VertexSpec]): String = {
      s.expectPunct("(")
      val alias = s.peek match {
        case Ident(a) if s.peek2 == Punct(":") || s.peek2 == Punct(")") || s.peek2 == Punct("{") =>
          s.next(); a
        case _ => freshAlias("v")
      }
      var spec = vs.getOrElse(alias, VertexSpec(None, Vector.empty))
      if (s.tryPunct(":")) spec = spec.copy(label = Some(s.ident()))
      if (s.tryPunct("{")) {
        var done = s.tryPunct("}")
        while (!done) {
          val k = s.ident(); s.expectPunct(":")
          val rhs = literal() match {
            case ParamValue(p) => Param(p)
            case v => Lit(v)
          }
          spec = spec.withPred(Cmp("=", Prop(alias, k), rhs))
          if (!s.tryPunct(",")) { s.expectPunct("}"); done = true }
        }
      }
      s.expectPunct(")")
      vs(alias) = spec
      alias
    }
    def parsePattern(vs: scala.collection.mutable.Map[String, VertexSpec],
                     es: scala.collection.mutable.ArrayBuffer[PatternEdge]): Unit = {
      var cur = parseNode(vs)
      var more = true
      while (more) s.peek match {
        case Punct("-") | Punct("<-") =>
          val leftArrow = s.next() == Punct("<-")
          var edgeAlias: Option[String] = None
          var elabel: Option[String] = None
          if (s.tryPunct("[")) {
            s.peek match {
              case Ident(a) => s.next(); edgeAlias = Some(a)
              case _ =>
            }
            if (s.tryPunct(":")) elabel = Some(s.ident())
            s.expectPunct("]")
          }
          val rightArrow = s.peek match {
            case Punct("->") => s.next(); true
            case Punct("-") => s.next(); false
            case other => s.fail(s"expected -> or - after edge, got $other")
          }
          val to = parseNode(vs)
          val dir =
            if (leftArrow) PDir.In
            else if (rightArrow) PDir.Out
            else PDir.Both
          es += PatternEdge(cur, elabel, dir, to, edgeAlias, None)
          cur = to
        case _ => more = false
      }
    }
    def parseMatch(): Unit = {
      s.expectKeyword("MATCH")
      val vs = scala.collection.mutable.LinkedHashMap.empty[String, VertexSpec]
      val es = scala.collection.mutable.ArrayBuffer.empty[PatternEdge]
      parsePattern(vs, es)
      while (s.tryPunct(",")) parsePattern(vs, es)
      ops += MatchOp(vs.toMap, es.toVector)
      if (s.isKeyword("WHERE")) { s.next(); ops += SelectOp(parseExpr()) }
    }

    // ---- top level ----
    var done = false
    while (!done) {
      if (s.isKeyword("MATCH")) parseMatch()
      else if (s.isKeyword("WITH")) {
        s.next()
        val items = parseItems()
        emitItems(items, distinct = false)
        if (s.isKeyword("WHERE")) { s.next(); ops += SelectOp(parseExpr()) }
      } else if (s.isKeyword("RETURN")) {
        s.next()
        var distinct = false
        if (s.isKeyword("DISTINCT")) { s.next(); distinct = true }
        emitItems(parseItems(), distinct)
        if (s.isKeyword("ORDER")) {
          s.next(); s.expectKeyword("BY")
          val keys = Vector.newBuilder[(Expr, Boolean)]
          var moreKeys = true
          while (moreKeys) {
            val e = parseExpr()
            var asc = true
            if (s.isKeyword("ASC")) s.next()
            else if (s.isKeyword("DESC")) { s.next(); asc = false }
            keys += ((e, asc))
            moreKeys = s.tryPunct(",")
          }
          ops += OrderByOp(keys.result())
        }
        if (s.isKeyword("LIMIT")) {
          s.next()
          val n = s.next() match {
            case Num(v, true) => v.toInt
            case other => s.fail(s"expected integer LIMIT, got $other")
          }
          ops += LimitOp(n)
        }
        done = true
      } else s.fail(s"expected MATCH/WITH/RETURN, got ${s.peek}")
    }
    if (!s.eof) s.fail(s"trailing tokens after RETURN: ${s.peek}")
    IrPlan(ops.result())
  }
}
