package repro.exp

import org.apache.spark.sql.SparkSession
import repro.apps.Cybersecurity
import repro.graph.PropertyGraph
import repro.storage.VineyardStore

/** Exp-8 — cybersecurity monitoring (paper §9.2): two-hop Trojan-detection
  * traversals as Gremlin on HiActor/GRIN vs the equivalent SQL double
  * self-join. Paper: 2,400× over the SQL deployment because the traversal
  * "avoids the costly join operations required in SQL queries".
  */
object Exp8Cyber {

  final case class Result(graphUsPerQuery: Double, sqlUsPerQuery: Double, queries: Int)

  def run(spark: SparkSession, quick: Boolean = false): Result = {
    val edges = if (quick)
      repro.graph.GraphGen.simplify(repro.graph.GraphGen.rmat(spark, 11, 20000, seed = 108))
    else
      repro.graph.GraphGen.simplify(repro.graph.GraphGen.rmat(spark, 15, 500000, seed = 108))
    val pg = PropertyGraph.fromEdges(spark, edges, eLabel = "CONN")
    val store = VineyardStore.fromPropertyGraph(pg)
    val pairs = edges.collect().map(r => (r.getLong(0), r.getLong(1)))
    val rng = new java.util.Random(5)
    val nQ = if (quick) 30 else 100
    val seeds = Array.fill(nQ)(pairs(rng.nextInt(pairs.length))._1)

    // warmup + verify equality on a few seeds, then measure
    val sql = new Cybersecurity.SqlBaseline(pairs)
    try {
      seeds.take(3).foreach { s =>
        require(Cybersecurity.twoHopCount(store, store.internalId(s)) == sql.twoHopCount(s),
          s"engines disagree on seed $s")
      }
      val graphMs = Timing.timeMs {
        seeds.foreach(s => Cybersecurity.twoHopCount(store, store.internalId(s)))
      }
      val sqlMs = Timing.timeMs {
        seeds.foreach(sql.twoHopCount)
      }
      Result(graphMs * 1000 / nQ, sqlMs * 1000 / nQ, nQ)
    } finally sql.close()
  }

  def report(r: Result): String =
    "== Exp-8: cybersecurity 2-hop traversal, Gremlin/HiActor vs SQL joins ==\n" +
      Timing.table(Seq("engine", "per-query latency"),
        Seq(Seq("graph traversal (GRIN)", f"${r.graphUsPerQuery}%.1fus"),
          Seq("SQL double join (DuckDB)", f"${r.sqlUsPerQuery}%.1fus"))) +
      f"\n   speedup ${r.sqlUsPerQuery / r.graphUsPerQuery}%.0fx over ${r.queries} seed queries" +
      "   (paper: 2,400x)\n"
}
