package repro.query

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.functions.broadcast
import repro.graph.PropertyGraph
import repro.query.ir._

/** Gaia — the data-parallel dataflow engine for OLAP graph queries (§5.3).
  *
  * Physical GraphIR lowers onto Spark DataFrames (Catalyst): SCAN → filtered
  * vertex scan, EXPAND_EDGE → join with the edge table (MAP/FLATMAP in the
  * paper's dataflow), GET_VERTEX → join with the vertex table, the fused
  * EXPAND → a single join with the 2-column adjacency projection, and the
  * relational operators → Catalyst filter/project/aggregate/sort.
  *
  * Column conventions: a bound vertex alias `a` is a LongType column `a`
  * holding the external id; its properties are `a_<prop>`; a bound edge
  * alias `e` contributes `e_ts`, `e_weight`, `e_label`.
  */
object GaiaExec {

  def execute(plan: IrPlan, g: PropertyGraph, params: Map[String, Any] = Map.empty): DataFrame = {
    val ops = plan.ops.map(bindOp(_, params))

    // Which properties each alias needs anywhere in the plan.
    val needed: Map[String, Set[String]] = {
      val all = scala.collection.mutable.Map.empty[String, Set[String]].withDefaultValue(Set.empty)
      def addE(e: Expr): Unit = Expr.props(e).foreach { case (a, p) => all(a) = all(a) + p }
      ops.foreach {
        case ScanV(_, _, preds) => preds.foreach(addE)
        case ExpandE(_, _, _, _, p) => p.foreach(addE)
        case GetV(_, _, _, preds) => preds.foreach(addE)
        case ExpandV(_, _, _, _, _, ep, tp) => { ep.foreach(addE); tp.foreach(addE) }
        case SelectOp(p) => addE(p)
        case ProjectOp(items, _) => items.foreach(i => addE(i._1))
        case AggregateOp(keys, aggs) =>
          keys.foreach(k => addE(k._1)); aggs.foreach(_.arg.foreach(addE))
        case OrderByOp(keys) => keys.foreach(k => addE(k._1))
        case _ =>
      }
      all.toMap
    }

    /** Vertex binding: id column named `alias`, props `alias_p`. */
    def vertexDF(alias: String, label: Option[String]): DataFrame = {
      val props = needed.getOrElse(alias, Set.empty) - "id"
      var df = label.map(l => g.vertices.filter(col("label") === l)).getOrElse(g.vertices)
      var cols = Vector(col("id").as(alias))
      props.foreach { p =>
        cols :+= (if (p == "label") col("label").as(s"${alias}_label")
                  else col(p).as(s"${alias}_$p"))
      }
      df.select(cols: _*)
    }

    def edgeBase(elabel: Option[String], dir: PDir.Value, fromCol: String, toCol: String,
                 ea: Option[String], wantProps: Boolean): DataFrame = {
      val base = elabel.map(l => g.edges.filter(col("label") === l)).getOrElse(g.edges)
      def proj(srcC: String, dstC: String): DataFrame = {
        var cols = Vector(col(srcC).as(fromCol), col(dstC).as(toCol))
        if (wantProps) ea.foreach { e =>
          cols ++= Vector(col("ts").as(s"${e}_ts"), col("weight").as(s"${e}_weight"),
            col("label").as(s"${e}_label"))
        }
        base.select(cols: _*)
      }
      dir match {
        case PDir.Out => proj("src", "dst")
        case PDir.In => proj("dst", "src")
        case PDir.Both => proj("src", "dst").union(proj("dst", "src"))
      }
    }

    var cur: DataFrame = null
    var bound = Set.empty[String]
    var opIdx = 0

    ops.foreach { op =>
      opIdx += 1
      op match {
        case ScanV(alias, label, preds) =>
          var df = vertexDF(alias, label)
          preds.foreach(p => df = df.filter(compile(p)))
          cur = if (cur == null) df else cur.crossJoin(df)
          bound += alias

        case ExpandE(from, elabel, dir, ea, pred) =>
          val fromC = s"__f$opIdx"; val toC = s"${ea}__to"
          var e = edgeBase(elabel, dir, fromC, toC, Some(ea), wantProps = true)
          cur = cur.join(e, cur(from) === e(fromC)).drop(fromC)
          pred.foreach(p => cur = cur.filter(compile(p)))

        case GetV(ea, to, label, preds) =>
          val toC = s"${ea}__to"
          if (bound(to)) {
            cur = cur.filter(col(toC) === col(to)).drop(toC)
          } else {
            // vertex tables per label are dimension-like; the engine knows
            // their cardinality from the graph schema and broadcasts them
            val v = broadcast(vertexDF(to, label))
            cur = cur.join(v, col(toC) === v(to)).drop(toC)
            bound += to
          }
          preds.foreach(p => cur = cur.filter(compile(p)))

        case ExpandV(from, elabel, dir, to, toLabel, ep, tp) =>
          val fromC = s"__f$opIdx"
          // An edge predicate references exactly one (edge) alias — bind its
          // prop columns under that alias so the filter can compile.
          val epAlias: Option[String] = ep.flatMap(p => Expr.refs(p).headOption)
          val toProps = needed.getOrElse(to, Set.empty) - "id"
          val needsVertexJoin = toProps.nonEmpty || toLabel.nonEmpty
          if (bound(to)) {
            val toC = s"__t$opIdx"
            val e = edgeBase(elabel, dir, fromC, toC, epAlias, wantProps = ep.nonEmpty)
            cur = cur.join(e, cur(from) === e(fromC)).drop(fromC)
            ep.foreach(p => cur = cur.filter(compile(p)))
            cur = cur.filter(col(toC) === col(to)).drop(toC)
          } else {
            // the fusion payoff: a single join against the slim adjacency
            val e = edgeBase(elabel, dir, fromC, to, epAlias, wantProps = ep.nonEmpty)
            cur = cur.join(e, cur(from) === e(fromC)).drop(fromC)
            ep.foreach(p => cur = cur.filter(compile(p)))
            if (needsVertexJoin) {
              val idC = s"__vj$opIdx"
              val vdf = toLabel.map(l => g.vertices.filter(col("label") === l))
                .getOrElse(g.vertices)
              val cols = Vector(col("id").as(idC)) ++ toProps.toVector.map { p =>
                (if (p == "label") col("label") else col(p)).as(s"${to}_$p")
              }
              cur = cur.join(broadcast(vdf.select(cols: _*)), col(to) === col(idC)).drop(idC)
            }
            bound += to
          }
          tp.foreach(p => cur = cur.filter(compile(p)))

        case SelectOp(pred) =>
          cur = cur.filter(compile(pred))

        case ProjectOp(items, distinct) =>
          cur = cur.select(items.map { case (e, a) => compile(e).as(a) }: _*)
          if (distinct) cur = cur.distinct()
          bound = items.map(_._2).toSet

        case AggregateOp(keys, aggs) =>
          val aggCols = aggs.map { c =>
            val colE = c.arg.map(compile)
            (c.fn, c.distinct) match {
              case ("count", _) if c.arg.isEmpty => count(lit(1)).as(c.alias)
              case ("count", true) => countDistinct(colE.get).as(c.alias)
              case ("count", false) => count(colE.get).as(c.alias)
              case ("sum", _) => sum(colE.get).as(c.alias)
              case ("avg", _) => avg(colE.get).as(c.alias)
              case ("min", _) => min(colE.get).as(c.alias)
              case ("max", _) => max(colE.get).as(c.alias)
              case other => throw new IllegalArgumentException(s"unknown aggregate $other")
            }
          }
          cur =
            if (keys.isEmpty) cur.agg(aggCols.head, aggCols.tail: _*)
            else cur.groupBy(keys.map { case (e, a) => compile(e).as(a) }: _*)
              .agg(aggCols.head, aggCols.tail: _*)
          bound = (keys.map(_._2) ++ aggs.map(_.alias)).toSet

        case OrderByOp(keys) =>
          cur = cur.orderBy(keys.map { case (e, asc) =>
            if (asc) compile(e).asc else compile(e).desc }: _*)

        case LimitOp(n) =>
          cur = cur.limit(n)

        case m: MatchOp =>
          throw new IllegalStateException(
            s"logical MatchOp reached the engine — run the Optimizer first: $m")
      }
    }
    cur
  }

  private def bindOp(op: IrOp, params: Map[String, Any]): IrOp = {
    def b(e: Expr): Expr = Expr.bind(e, params)
    op match {
      case ScanV(a, l, ps) => ScanV(a, l, ps.map(b))
      case ExpandE(f, l, d, ea, p) => ExpandE(f, l, d, ea, p.map(b))
      case GetV(ea, a, l, ps) => GetV(ea, a, l, ps.map(b))
      case ExpandV(f, l, d, t, tl, ep, tp) => ExpandV(f, l, d, t, tl, ep.map(b), tp.map(b))
      case SelectOp(p) => SelectOp(b(p))
      case ProjectOp(items, dd) => ProjectOp(items.map { case (e, a) => (b(e), a) }, dd)
      case AggregateOp(ks, as) => AggregateOp(ks.map { case (e, a) => (b(e), a) },
        as.map(c => c.copy(arg = c.arg.map(b))))
      case OrderByOp(ks) => OrderByOp(ks.map { case (e, asc) => (b(e), asc) })
      case other => other
    }
  }

  /** Expr → Catalyst Column. */
  def compile(e: Expr): Column = e match {
    case Prop(a, "id") => col(a)
    case Prop(a, p) => col(s"${a}_$p")
    case Ref(n) => col(n)
    case Lit(v) => lit(v)
    case Param(n) => throw new IllegalArgumentException(s"unbound parameter $$$n")
    case Cmp("=", l, r) => compile(l) === compile(r)
    case Cmp("<>", l, r) => compile(l) =!= compile(r)
    case Cmp("<", l, r) => compile(l) < compile(r)
    case Cmp("<=", l, r) => compile(l) <= compile(r)
    case Cmp(">", l, r) => compile(l) > compile(r)
    case Cmp(">=", l, r) => compile(l) >= compile(r)
    case Cmp(op, _, _) => throw new IllegalArgumentException(s"unknown cmp $op")
    case And(l, r) => compile(l) && compile(r)
    case Or(l, r) => compile(l) || compile(r)
    case Not(x) => !compile(x)
    case InList(x, vals) => compile(x).isin(vals: _*)
    case Arith("+", l, r) => compile(l) + compile(r)
    case Arith("-", l, r) => compile(l) - compile(r)
    case Arith("*", l, r) => compile(l) * compile(r)
    case Arith("/", l, r) => compile(l) / compile(r)
    case Arith(op, _, _) => throw new IllegalArgumentException(s"unknown arith $op")
  }
}
