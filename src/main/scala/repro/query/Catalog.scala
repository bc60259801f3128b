package repro.query

import org.apache.spark.sql.functions._
import repro.graph.PropertyGraph
import repro.query.ir._

/** GLogue-lite — the pattern-frequency catalog driving CBO (paper §5.2).
  *
  * The real GLogue materializes frequencies of all patterns up to k
  * vertices; at our scale the single-edge statistics it is built from are
  * enough to rank expansion orders: vertex counts per label, edge counts
  * per (srcLabel, edgeLabel, dstLabel) triple, and per-(label, prop)
  * distinct-value counts for predicate selectivity.
  */
final case class Catalog(
    vertexCount: Map[String, Long],
    tripleCount: Map[(String, String, String), Long],
    ndv: Map[(String, String), Long]) {

  val totalVertices: Long = math.max(1L, vertexCount.values.sum)

  def countOf(label: Option[String]): Double =
    label.map(l => vertexCount.getOrElse(l, 1L).toDouble).getOrElse(totalVertices.toDouble)

  /** Selectivity of a vertex predicate (equality on id → 1/|V(label)|). */
  def selectivity(label: Option[String], pred: Expr): Double = pred match {
    case Cmp("=", Prop(_, "id"), _) | Cmp("=", _, Prop(_, "id")) => 1.0 / countOf(label)
    case Cmp("=", Prop(_, p), _) =>
      1.0 / math.max(1L, ndv.getOrElse((label.getOrElse(""), p), 20L)).toDouble
    case Cmp("=", _, Prop(_, p)) =>
      1.0 / math.max(1L, ndv.getOrElse((label.getOrElse(""), p), 20L)).toDouble
    case InList(Prop(_, "id"), vals) => vals.size.toDouble / countOf(label)
    case InList(Prop(_, p), vals) =>
      vals.size.toDouble / math.max(1L, ndv.getOrElse((label.getOrElse(""), p), 20L)).toDouble
    case Cmp(_, _, _) => 1.0 / 3.0
    case And(l, r) => selectivity(label, l) * selectivity(label, r)
    case Or(l, r) => math.min(1.0, selectivity(label, l) + selectivity(label, r))
    case _ => 0.5
  }

  /** Estimated rows after applying all preds to a labeled scan. */
  def scanCard(spec: VertexSpec, label: Option[String]): Double =
    spec.preds.foldLeft(countOf(label))((c, p) => c * selectivity(label, p))

  /** Average out-fanout of one vertex of `fromLabel` along `elabel` to `toLabel`. */
  def fanout(fromLabel: Option[String], elabel: Option[String],
             dir: PDir.Value, toLabel: Option[String]): Double = {
    def matches(t: (String, String, String), from: Option[String],
                el: Option[String], to: Option[String]): Boolean =
      from.forall(_ == t._1) && el.forall(_ == t._2) && to.forall(_ == t._3)
    val edges = dir match {
      case PDir.Out => tripleCount.filter { case (t, _) => matches(t, fromLabel, elabel, toLabel) }
      case PDir.In => tripleCount.filter { case (t, _) => matches(t, toLabel, elabel, fromLabel) }
      case PDir.Both => tripleCount.filter { case (t, _) =>
        matches(t, fromLabel, elabel, toLabel) || matches(t, toLabel, elabel, fromLabel) }
    }
    val total = edges.values.sum.toDouble
    total / countOf(fromLabel)
  }
}

object Catalog {

  /** Builds the catalog from DataFrame aggregations (one pass each). */
  def fromPropertyGraph(g: PropertyGraph): Catalog = {
    val vCounts = g.vertices.groupBy("label").count().collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap

    val vLabels = g.vertices.select(col("id"), col("label").as("vl"))
    val triples = g.edges.select(col("src"), col("dst"), col("label").as("el"))
      .join(vLabels.withColumnRenamed("vl", "sl"), col("src") === col("id")).drop("id")
      .join(vLabels.withColumnRenamed("vl", "dl"), col("dst") === col("id")).drop("id")
      .groupBy("sl", "el", "dl").count().collect()
      .map(r => (r.getString(0), r.getString(1), r.getString(2)) -> r.getLong(3)).toMap

    val propCols = g.vertices.columns.filterNot(c => c == "id" || c == "label")
    val ndv = propCols.flatMap { p =>
      g.vertices.groupBy("label").agg(countDistinct(col(p)).as("n")).collect()
        .map(r => (r.getString(0), p) -> math.max(1L, r.getLong(1)))
    }.toMap

    Catalog(vCounts, triples, ndv)
  }
}
