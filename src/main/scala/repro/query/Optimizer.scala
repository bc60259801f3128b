package repro.query

import repro.query.ir._

/** The IR-based optimizer (paper §5.2): RBO rules *FilterPushIntoMatch* and
  * *EdgeVertexFusion*, plus the GLogue-driven CBO that picks the pattern
  * expansion order, then lowering of logical [[MatchOp]]s into physical
  * SCAN / EXPAND chains.
  *
  * Each strategy can be toggled independently — Exp-2a measures exactly
  * those deltas (fusion 2.9×, filter-push 279×, CBO 11× in the paper).
  */
object Optimizer {

  final case class Options(filterPush: Boolean = true, fusion: Boolean = true,
                           cbo: Boolean = true)
  val All: Options = Options()
  val None_ : Options = Options(filterPush = false, fusion = false, cbo = false)

  def optimize(plan: IrPlan, catalog: Option[Catalog] = None,
               opts: Options = All): IrPlan = {
    val pushed = if (opts.filterPush) filterPushIntoMatch(plan) else plan
    val lowered = lower(pushed, catalog.filter(_ => opts.cbo))
    if (opts.fusion) edgeVertexFusion(lowered) else lowered
  }

  // ---- RBO: FilterPushIntoMatch --------------------------------------------

  /** Moves single-alias conjuncts of a SELECT following a MATCH into the
    * match's vertex specs / edge predicates, so scans become index lookups
    * and predicates propagate down to the store (GRIN pushdown).
    */
  def filterPushIntoMatch(plan: IrPlan): IrPlan = {
    val out = Vector.newBuilder[IrOp]
    var i = 0
    while (i < plan.ops.length) {
      (plan.ops(i), if (i + 1 < plan.ops.length) Some(plan.ops(i + 1)) else None) match {
        case (m: MatchOp, Some(SelectOp(pred))) =>
          var vs = m.vertices
          var es = m.edges
          val rest = Vector.newBuilder[Expr]
          Expr.conjuncts(pred).foreach { c =>
            val rs = Expr.refs(c)
            if (rs.size == 1 && vs.contains(rs.head)) {
              val a = rs.head
              vs = vs.updated(a, vs(a).withPred(c))
            } else if (rs.size == 1 && es.exists(_.edgeAlias.contains(rs.head))) {
              val a = rs.head
              es = es.map(pe => if (pe.edgeAlias.contains(a))
                pe.copy(pred = Some(pe.pred.map(And(_, c)).getOrElse(c))) else pe)
            } else rest += c
          }
          out += MatchOp(vs, es)
          Expr.conjoin(rest.result()).foreach(out += SelectOp(_))
          i += 2
        case (op, _) =>
          out += op
          i += 1
      }
    }
    IrPlan(out.result())
  }

  // ---- lowering (with optional CBO ordering) --------------------------------

  /** Lowers every MatchOp to a ScanV + (ExpandE;GetV)* chain. Without a
    * catalog the textual pattern order is kept (the paper's non-CBO
    * baseline); with one, a greedy minimum-intermediate-cardinality order is
    * chosen (cost = Σ estimated subgraph frequencies, as in GLogue).
    */
  def lower(plan: IrPlan, catalog: Option[Catalog]): IrPlan = {
    val out = Vector.newBuilder[IrOp]
    var bound = Set.empty[String]
    var fresh = 0
    plan.ops.foreach {
      case m: MatchOp =>
        val order = catalog match {
          case Some(c) => cboOrder(m, bound, c)._1
          case None => textualOrder(m, bound)
        }
        order.foreach {
          case Left(alias) =>
            val spec = m.vertices(alias)
            out += ScanV(alias, spec.label, spec.preds)
            bound += alias
          case Right((pe, reversed)) =>
            val (from, to, dir) =
              if (!reversed) (pe.from, pe.to, pe.dir)
              else (pe.to, pe.from, pe.dir match {
                case PDir.Out => PDir.In
                case PDir.In => PDir.Out
                case PDir.Both => PDir.Both
              })
            fresh += 1
            val ea = pe.edgeAlias.getOrElse(s"__fe$fresh")
            val toSpec = m.vertices.getOrElse(to, VertexSpec(None, Vector.empty))
            out += ExpandE(from, pe.elabel, dir, ea, pe.pred)
            out += GetV(ea, to, toSpec.label, if (bound(to)) Vector.empty else toSpec.preds)
            bound += to
        }
      case op =>
        op match {
          case ProjectOp(items, _) => bound = items.map(_._2).toSet
          case AggregateOp(keys, aggs) => bound = (keys.map(_._2) ++ aggs.map(_.alias)).toSet
          case ScanV(a, _, _) => bound += a
          case GetV(_, a, _, _) => bound += a
          case ExpandV(_, _, _, t, _, _, _) => bound += t
          case _ =>
        }
        out += op
    }
    IrPlan(out.result())
  }

  /** Textual order: first unbound vertex of the first edge starts the scan;
    * edges lower in written order. Disconnected components get extra scans.
    */
  private def textualOrder(m: MatchOp, bound0: Set[String])
      : Vector[Either[String, (PatternEdge, Boolean)]] = {
    val out = Vector.newBuilder[Either[String, (PatternEdge, Boolean)]]
    var bound = bound0
    if (m.edges.isEmpty) {
      m.vertices.keys.toVector.sorted.foreach { a =>
        if (!bound(a)) { out += Left(a); bound += a }
      }
      return out.result()
    }
    m.edges.foreach { pe =>
      if (!bound(pe.from) && !bound(pe.to)) { out += Left(pe.from); bound += pe.from }
      if (bound(pe.from)) { out += Right((pe, false)); bound += pe.to }
      else { out += Right((pe, true)); bound += pe.from }
    }
    out.result()
  }

  /** Greedy CBO: returns (order, estimated cost). */
  def cboOrder(m: MatchOp, bound0: Set[String], cat: Catalog)
      : (Vector[Either[String, (PatternEdge, Boolean)]], Double) = {
    val out = Vector.newBuilder[Either[String, (PatternEdge, Boolean)]]
    var bound = bound0.filter(a => m.vertices.contains(a) || bound0(a))
    var patternBound = m.vertices.keySet.intersect(bound0)
    var remaining = m.edges
    var card = 1.0
    var cost = 0.0

    def scanCardOf(a: String): Double = {
      val spec = m.vertices(a)
      cat.scanCard(spec, spec.label)
    }

    while (remaining.nonEmpty || patternBound.size < m.vertices.size) {
      val frontier = remaining.filter(pe => patternBound(pe.from) || patternBound(pe.to))
      if (patternBound.isEmpty || (frontier.isEmpty && remaining.nonEmpty) ||
          (remaining.isEmpty && patternBound.size < m.vertices.size)) {
        // start (or restart for a disconnected component) at the cheapest scan
        val unboundVs = m.vertices.keySet.diff(patternBound)
        if (unboundVs.isEmpty) return (out.result(), cost) // safety
        val start = unboundVs.minBy(scanCardOf)
        out += Left(start)
        patternBound += start
        card *= scanCardOf(start)
        cost += card
      } else {
        // expand the frontier edge with the smallest resulting cardinality
        val scored = frontier.map { pe =>
          val fromFirst = patternBound(pe.from)
          val (f, t) = if (fromFirst) (pe.from, pe.to) else (pe.to, pe.from)
          val closing = patternBound(t)
          val fSpec = m.vertices(f); val tSpec = m.vertices.getOrElse(t, VertexSpec(None, Vector.empty))
          val dirEff = if (fromFirst) pe.dir else (pe.dir match {
            case PDir.Out => PDir.In
            case PDir.In => PDir.Out
            case PDir.Both => PDir.Both
          })
          val fan = math.max(1e-3, cat.fanout(fSpec.label, pe.elabel, dirEff, tSpec.label))
          val sel = tSpec.preds.foldLeft(1.0)((s, p) => s * cat.selectivity(tSpec.label, p))
          val resCard =
            if (closing) card * math.min(1.0, fan / math.max(1.0, cat.countOf(tSpec.label)))
            else card * fan * sel
          (pe, !fromFirst, t, resCard)
        }
        val (pe, reversed, t, resCard) = scored.minBy(_._4)
        out += Right((pe, reversed))
        remaining = remaining.filterNot(_ eq pe)
        patternBound += t
        card = resCard
        cost += card
      }
    }
    (out.result(), cost)
  }

  // ---- RBO: EdgeVertexFusion -------------------------------------------------

  /** Fuses ExpandE+GetV pairs into a single ExpandV whenever the edge alias
    * is not referenced downstream — eliminating the per-edge intermediate
    * binding (the paper's 2.9× rule).
    */
  def edgeVertexFusion(plan: IrPlan): IrPlan = {
    def referencedLater(alias: String, rest: Seq[IrOp]): Boolean = rest.exists {
      case SelectOp(p) => Expr.refs(p)(alias)
      case ProjectOp(items, _) => items.exists(it => Expr.refs(it._1)(alias))
      case AggregateOp(keys, aggs) =>
        keys.exists(k => Expr.refs(k._1)(alias)) ||
          aggs.exists(_.arg.exists(a => Expr.refs(a)(alias)))
      case OrderByOp(keys) => keys.exists(k => Expr.refs(k._1)(alias))
      case ExpandE(f, _, _, _, p) => f == alias || p.exists(Expr.refs(_)(alias))
      case GetV(ea, _, _, preds) => ea == alias || preds.exists(Expr.refs(_)(alias))
      case ExpandV(f, _, _, t, _, ep, tp) =>
        f == alias || t == alias ||
          ep.exists(Expr.refs(_)(alias)) || tp.exists(Expr.refs(_)(alias))
      case _ => false
    }
    val ops = plan.ops
    val out = Vector.newBuilder[IrOp]
    var i = 0
    while (i < ops.length) {
      (ops(i), if (i + 1 < ops.length) Some(ops(i + 1)) else None) match {
        case (ExpandE(f, el, d, ea, ep), Some(GetV(ea2, to, tl, tp)))
            if ea == ea2 && !referencedLater(ea, ops.drop(i + 2)) =>
          out += ExpandV(f, el, d, to, tl, ep, tp)
          i += 2
        case (op, _) => out += op; i += 1
      }
    }
    IrPlan(out.result())
  }
}
