package repro.query.ir

/** GraphIR — the unified intermediate representation (paper §5.1).
  *
  * A plan is a sequence of operators over a stream of data tuples. The
  * *logical* stage keeps pattern matching declarative ([[MatchOp]], bracketed
  * by the paper's MATCH_START/MATCH_END); the *physical* stage lowers each
  * MatchOp to an ordered chain of graph operators (SCAN, EXPAND_EDGE + GET_V,
  * or the fused EXPAND after EdgeVertexFusion) — see [[repro.query.Optimizer]].
  */
object PDir extends Enumeration {
  val Out, In, Both = Value
}

/** Vertex constraint inside a pattern. */
final case class VertexSpec(label: Option[String], preds: Vector[Expr]) {
  def withPred(e: Expr): VertexSpec = copy(preds = preds :+ e)
}

/** One pattern edge `(from)-[edgeAlias:elabel]->(to)`. */
final case class PatternEdge(from: String, elabel: Option[String], dir: PDir.Value,
                             to: String, edgeAlias: Option[String], pred: Option[Expr])

sealed trait IrOp

/** Logical pattern match: vertices + edges, order-free (MATCH_START..END). */
final case class MatchOp(vertices: Map[String, VertexSpec],
                         edges: Vector[PatternEdge]) extends IrOp

// ---- physical graph operators ----

/** SCAN: source vertices of a label, with storage-pushable predicates. */
final case class ScanV(alias: String, label: Option[String], preds: Vector[Expr]) extends IrOp

/** EXPAND_EDGE: traverse adjacent edges, binding the edge itself. */
final case class ExpandE(from: String, elabel: Option[String], dir: PDir.Value,
                         edgeAlias: String, pred: Option[Expr]) extends IrOp

/** GET_VERTEX: bind the far endpoint of the last expanded edge. */
final case class GetV(edgeAlias: String, alias: String, label: Option[String],
                      preds: Vector[Expr]) extends IrOp

/** Fused EXPAND_EDGE+GET_VERTEX (the EdgeVertexFusion result). When `to` is
  * already bound, engines treat this as an edge-existence check.
  */
final case class ExpandV(from: String, elabel: Option[String], dir: PDir.Value,
                         to: String, toLabel: Option[String],
                         edgePred: Option[Expr], toPreds: Vector[Expr]) extends IrOp

// ---- relational operators ----

final case class SelectOp(pred: Expr) extends IrOp
final case class ProjectOp(items: Vector[(Expr, String)], distinct: Boolean = false) extends IrOp
final case class AggCall(fn: String, arg: Option[Expr], distinct: Boolean, alias: String)
final case class AggregateOp(keys: Vector[(Expr, String)], aggs: Vector[AggCall]) extends IrOp
final case class OrderByOp(keys: Vector[(Expr, Boolean)]) extends IrOp
final case class LimitOp(n: Int) extends IrOp

final case class IrPlan(ops: Vector[IrOp]) {
  override def toString: String = ops.mkString("IrPlan(\n  ", ",\n  ", "\n)")
}

object IrPlan {

  /** Canonical alias renaming (first-appearance order) so structurally equal
    * plans from different front-ends compare equal — the Fig. 5 claim that
    * Gremlin and Cypher converge to the same IR.
    */
  def normalize(plan: IrPlan): IrPlan = {
    val m = scala.collection.mutable.LinkedHashMap.empty[String, String]
    def alias(a: String): String = m.getOrElseUpdate(a, s"_${m.size}")
    def ren(e: Expr): Expr = Expr.renameAliases(e, m.toMap)
    // Two passes: discover aliases in order, then rewrite with the full map.
    plan.ops.foreach {
      case MatchOp(vs, es) =>
        es.foreach { pe => alias(pe.from); alias(pe.to); pe.edgeAlias.foreach(alias) }
        vs.keys.foreach(alias)
      case ScanV(a, _, _) => alias(a)
      case ExpandE(f, _, _, ea, _) => { alias(f); alias(ea) }
      case GetV(ea, a, _, _) => { alias(ea); alias(a) }
      case ExpandV(f, _, _, t, _, _, _) => { alias(f); alias(t) }
      case _ =>
    }
    val ops = plan.ops.map {
      case MatchOp(vs, es) => MatchOp(
        vs.map { case (k, v) => alias(k) -> v.copy(preds = v.preds.map(ren)) },
        es.map(pe => pe.copy(from = alias(pe.from), to = alias(pe.to),
          edgeAlias = pe.edgeAlias.map(alias), pred = pe.pred.map(ren))))
      case ScanV(a, l, p) => ScanV(alias(a), l, p.map(ren))
      case ExpandE(f, l, d, ea, p) => ExpandE(alias(f), l, d, alias(ea), p.map(ren))
      case GetV(ea, a, l, p) => GetV(alias(ea), alias(a), l, p.map(ren))
      case ExpandV(f, l, d, t, tl, ep, tp) =>
        ExpandV(alias(f), l, d, alias(t), tl, ep.map(ren), tp.map(ren))
      case SelectOp(p) => SelectOp(ren(p))
      case ProjectOp(items, d) => ProjectOp(items.map { case (e, n) => (ren(e), n) }, d)
      case AggregateOp(ks, as) => AggregateOp(
        ks.map { case (e, n) => (ren(e), n) },
        as.map(a => a.copy(arg = a.arg.map(ren))))
      case OrderByOp(ks) => OrderByOp(ks.map { case (e, asc) => (ren(e), asc) })
      case other => other
    }
    IrPlan(ops)
  }
}
