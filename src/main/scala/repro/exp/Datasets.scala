package repro.exp

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.graph.{GraphGen, LocalCsr, PropertyGraph, SnbData}

/** The bench dataset registry — laptop-scale analogues of paper Table 1
  * (DESIGN.md substitution 1). Sizes are ~1000× smaller than the paper's
  * billion-edge graphs, with matching degree *shape*.
  */
object Datasets {

  final case class Entry(abbr: String, paperName: String, paperV: String, paperE: String,
                         gen: SparkSession => DataFrame)

  /** Graphalytics-style simple graphs. */
  val graphs: Vector[Entry] = Vector(
    Entry("FB-a", "datagen-9_0-fb (power-law)", "12.8M", "1.05B",
      s => GraphGen.simplify(GraphGen.rmat(s, scale = 17, edges = 1050000, seed = 100))),
    Entry("G500-a", "graph500-26 (power-law, skewed)", "32M", "1.05B",
      s => GraphGen.simplify(GraphGen.rmat(s, scale = 17, edges = 1050000,
        a = 0.57, b = 0.19, c = 0.19, seed = 101))),
    Entry("TW-a", "twitter-2010 (power-law)", "41.7M", "1.47B",
      s => GraphGen.simplify(GraphGen.rmat(s, scale = 17, edges = 1470000, seed = 102))),
    Entry("CF-a", "com-friendster (social)", "65.6M", "1.81B",
      s => GraphGen.simplify(GraphGen.rmat(s, scale = 17, edges = 1810000,
        a = 0.45, b = 0.22, c = 0.22, seed = 103))),
    Entry("ZF-a", "datagen-9_2-zf (near-uniform degree)", "434.9M", "1.04B",
      s => GraphGen.uniform(s, n = 400000, edges = 1040000, seed = 104)),
    Entry("UK-a", "uk-2005 (web crawl, high diameter)", "39.5M", "1.57B",
      s => GraphGen.highDiameter(s, side = 700, shortcutFrac = 0.002, seed = 105)),
  )

  def graph(s: SparkSession, abbr: String): DataFrame =
    graphs.find(_.abbr == abbr).getOrElse(throw new IllegalArgumentException(abbr)).gen(s)

  def csr(s: SparkSession, abbr: String): LocalCsr = LocalCsr.fromDataFrame(graph(s, abbr))

  /** SNB-lite instances (paper: SNB-30/300/1000). */
  def snbInteractive(s: SparkSession): PropertyGraph = SnbData.generate(s, nPersons = 2000, seed = 77)
  def snbBi(s: SparkSession): PropertyGraph = SnbData.generate(s, nPersons = 5000, seed = 78)

  /** ogbn-products analogue for the learning experiments. */
  def gnnGraph(s: SparkSession): DataFrame =
    GraphGen.simplify(GraphGen.rmat(s, scale = 16, edges = 600000, seed = 106))

  def inventoryReport(s: SparkSession): String = {
    val rows = graphs.map { e =>
      val df = e.gen(s).cache()
      val m = df.count()
      val v = df.selectExpr("count(distinct src) AS x").collect()(0).getLong(0) max
        df.selectExpr("count(distinct dst) AS x").collect()(0).getLong(0)
      df.unpersist()
      Seq(e.abbr, e.paperName, e.paperV, e.paperE, v.toString, m.toString)
    }
    "Table 1 analogues (paper dataset -> laptop-scale synthetic analogue)\n" +
      Timing.table(Seq("abbr", "paper dataset", "paper |V|", "paper |E|", "ours |V|~", "ours |E|"), rows)
  }
}
