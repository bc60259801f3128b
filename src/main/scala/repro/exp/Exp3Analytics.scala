package repro.exp

import org.apache.spark.sql.SparkSession
import repro.analytics.grape._
import repro.graph.LocalCsr

/** Exp-3 — graph analytics performance (paper Fig. 7h–k): PageRank and BFS
  * across four Graphalytics-analogue graphs, GRAPE vs PowerGraph-sim /
  * Gemini-sim (CPU) and Groute-sim / Gunrock-sim (GPU-scheduler analogues).
  * Paper: vs PowerGraph avg 25.1× (max 55.7×), vs Gemini avg 2.3× (3.4×),
  * vs Groute avg 3.3× (9.5×), vs Gunrock avg 3.3× (9.9×).
  */
object Exp3Analytics {

  val Engines = Seq("GRAPE", "PowerGraph", "Gemini", "Groute", "Gunrock")

  final case class Row(algo: String, graph: String, engine: String, ms: Double)
  final case class Result(rows: Seq[Row], varintRatio: Double)

  def run(spark: SparkSession, quick: Boolean = false): Result = {
    val graphAbbrs = if (quick) Seq("ZF-a") else Seq("FB-a", "G500-a", "TW-a", "UK-a")
    val nFrags = Runtime.getRuntime.availableProcessors()
    val prIters = 10
    val reps = if (quick) 1 else 3

    val rows = graphAbbrs.flatMap { abbr =>
      val csr = Datasets.csr(spark, abbr)
      val frags = Fragment.partition(csr, nFrags)
      val src = (0 until csr.n).maxBy(csr.outDegree)

      val pr = Seq(
        Row("PageRank", abbr, "GRAPE", Timing.bestOfMs(reps)(GrapeEngine.pageRank(frags, prIters))),
        Row("PageRank", abbr, "PowerGraph",
          Timing.bestOfMs(reps)(Baselines.PowerGraphSim.pageRank(csr, prIters))),
        Row("PageRank", abbr, "Gemini",
          Timing.bestOfMs(reps)(Baselines.GeminiSim.pageRank(csr, prIters))),
        Row("PageRank", abbr, "Groute",
          Timing.bestOfMs(reps)(Baselines.GrouteSim.pageRank(csr, prIters))),
        Row("PageRank", abbr, "Gunrock",
          Timing.bestOfMs(reps)(Baselines.GunrockSim.pageRank(csr, prIters))),
      )
      val bfs = Seq(
        Row("BFS", abbr, "GRAPE", Timing.bestOfMs(reps)(GrapeEngine.bfs(frags, src))),
        Row("BFS", abbr, "PowerGraph", Timing.bestOfMs(reps)(Baselines.PowerGraphSim.bfs(csr, src))),
        Row("BFS", abbr, "Gemini", Timing.bestOfMs(reps)(Baselines.GeminiSim.bfs(csr, src))),
        Row("BFS", abbr, "Groute", Timing.bestOfMs(reps)(Baselines.GrouteSim.bfs(csr, src))),
        Row("BFS", abbr, "Gunrock", Timing.bestOfMs(reps)(Baselines.GunrockSim.bfs(csr, src))),
      )
      pr ++ bfs
    }

    // §6's varint message-size claim, measured on a realistic message batch
    val vids = Array.tabulate(100000)(i => i * 5)
    val (varint, raw) = GrapeEngine.messageBytesVarint(vids, Array.fill(100000)(3L))
    Result(rows, raw.toDouble / varint)
  }

  def report(r: Result): String = {
    val sb = new StringBuilder
    Seq("PageRank", "BFS").foreach { algo =>
      sb.append(s"== Exp-3 (Fig 7h-k): $algo runtime ==\n")
      val graphs = r.rows.filter(_.algo == algo).map(_.graph).distinct
      sb.append(Timing.table(Seq("graph") ++ Engines ++ Seq("vs PG", "vs Gem", "vs Gro", "vs Gun"),
        graphs.map { g =>
          def of(e: String) = r.rows.find(x => x.algo == algo && x.graph == g && x.engine == e).get.ms
          Seq(g) ++ Engines.map(e => Timing.fmt(of(e))) ++
            Seq("PowerGraph", "Gemini", "Groute", "Gunrock").map(e => f"${of(e) / of("GRAPE")}%.1fx")
        }))
      sb.append("\n")
    }
    def agg(base: String): (Double, Double) = {
      val sp = r.rows.filter(_.engine == "GRAPE").map { g =>
        r.rows.find(x => x.algo == g.algo && x.graph == g.graph && x.engine == base).get.ms / g.ms
      }
      (math.exp(sp.map(math.log).sum / sp.size), sp.max)
    }
    sb.append("GRAPE speedups (mean / max):\n")
    Seq("PowerGraph" -> "25.1x / 55.7x", "Gemini" -> "2.3x / 3.4x",
      "Groute" -> "3.3x / 9.5x", "Gunrock" -> "3.3x / 9.9x").foreach { case (e, paper) =>
      val (m, mx) = agg(e)
      sb.append(f"  vs $e%-11s ${m}%5.1fx / ${mx}%5.1fx   (paper: $paper)\n")
    }
    sb.append(f"\nGRAPE varint message encoding: ${r.varintRatio}%.1fx smaller than raw records\n")
    sb.toString
  }
}
