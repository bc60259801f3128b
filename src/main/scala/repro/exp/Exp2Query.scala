package repro.exp

import org.apache.spark.sql.SparkSession
import repro.graph.SnbData
import repro.query._
import repro.query.ir.IrPlan
import repro.storage.{GartStore, VineyardStore}

/** Exp-2 — graph query performance (paper Fig. 7e–g).
  *
  *  (a) optimization study: EdgeVertexFusion (paper 2.9×),
  *      FilterPushIntoMatch (paper 279×), CBO (paper 11×);
  *  (b) SNB Interactive on HiActor vs TuGraph-sim (paper 8.92× latency,
  *      2.45× throughput);
  *  (c) SNB-BI on Gaia vs TigerGraph-sim/plain SQL (paper ~10×).
  */
object Exp2Query {

  final case class OptRow(set: String, query: String, offMs: Double, onMs: Double)
  final case class LatRow(cls: String, query: String, flexUs: Double, tugraphUs: Double)
  final case class BiRow(query: String, gaiaMs: Double, tigerMs: Double)
  final case class Result(opt: Seq[OptRow], interactive: Seq[LatRow],
                          flexOps: Double, tugraphOps: Double, bi: Seq[BiRow])

  private def plan(q: String, cat: Option[Catalog], opts: Optimizer.Options): IrPlan = {
    val parsed = if (q.startsWith("g.")) GremlinParser.parse(q) else CypherParser.parse(q)
    Optimizer.optimize(parsed, cat, opts)
  }

  def run(spark: SparkSession, quick: Boolean = false): Result = {
    val pg = if (quick) SnbData.generate(spark, 300, seed = 77) else Datasets.snbInteractive(spark)
    pg.vertices.cache().count(); pg.edges.cache().count()
    val store = VineyardStore.fromPropertyGraph(pg)
    val cat = Catalog.fromPropertyGraph(pg)
    val nPersons = if (quick) 300 else 2000
    val reps = if (quick) 5 else 20

    def lat(p: IrPlan, params: Map[String, Any], n: Int = reps): Double =
      Timing.meanOfMs(n)(HiActorExec.execute(p, store, params))

    // ---- (a) optimization study ---------------------------------------------
    val paramSets = (1 to 5).map(i => Map[String, Any](
      "id" -> (i * 37 % nPersons + 1).toLong, "tag" -> "tag1", "country" -> "China"))
    def study(set: String, queries: Seq[(String, String)],
              on: Optimizer.Options, off: Optimizer.Options): Seq[OptRow] =
      queries.map { case (name, q) =>
        val pOn = plan(q, Some(cat).filter(_ => on.cbo), on)
        val pOff = plan(q, Some(cat).filter(_ => off.cbo), off)
        val onMs = paramSets.map(ps => lat(pOn, ps, math.max(3, reps / 4))).sum / paramSets.size
        val offMs = paramSets.map(ps => lat(pOff, ps, math.max(3, reps / 4))).sum / paramSets.size
        OptRow(set, name, offMs, onMs)
      }
    // Q1 (EdgeVertexFusion): fused ExpandV avoids the per-edge intermediate
    // binding + second operator stage. Measured on HiActor with interleaved
    // best-of runs so JIT profile drift cannot favor either plan.
    val fusion = SnbWorkloads.q1Fusion.map { case (name, q) =>
      val pOn = plan(q, None, Optimizer.Options(filterPush = true, fusion = true, cbo = false))
      val pOff = plan(q, None, Optimizer.Options(filterPush = true, fusion = false, cbo = false))
      val ps = paramSets.head
      // warm both, then alternate
      HiActorExec.execute(pOn, store, ps); HiActorExec.execute(pOff, store, ps)
      var onBest = Double.MaxValue; var offBest = Double.MaxValue
      (0 until (if (quick) 6 else 15)).foreach { _ =>
        onBest = math.min(onBest, Timing.timeMs(HiActorExec.execute(pOn, store, ps)))
        offBest = math.min(offBest, Timing.timeMs(HiActorExec.execute(pOff, store, ps)))
      }
      OptRow("Q1-fusion", name, offBest, onBest)
    }
    val opt = fusion ++
      study("Q2-filterpush", SnbWorkloads.q2FilterPush,
        Optimizer.Options(filterPush = true, fusion = true, cbo = false),
        Optimizer.Options(filterPush = false, fusion = true, cbo = false)) ++
      study("Q3-cbo", SnbWorkloads.q3Cbo,
        Optimizer.Options(filterPush = true, fusion = true, cbo = true),
        Optimizer.Options(filterPush = true, fusion = true, cbo = false))

    // ---- (b) SNB interactive: HiActor vs TuGraph-sim -------------------------
    val gart = GartStore.fromPropertyGraph(pg)
    val tug = new TuGraphSim(store)
    val interactiveQs = SnbWorkloads.complex.map(("IC", _)) ++ SnbWorkloads.short.map(("IS", _))
    val params = Map[String, Any]("id" -> (nPersons / 3).toLong, "name" -> "Sam",
      "maxDate" -> 15500L, "country" -> "China", "mid" -> (SnbData.MsgBase + 11))
    val latencies = interactiveQs.map { case (cls, (name, q)) =>
      val pOpt = plan(q, Some(cat), Optimizer.All)
      val pNone = plan(q, None, Optimizer.None_)
      LatRow(cls, name, lat(pOpt, params) * 1000,
        Timing.meanOfMs(math.max(2, reps / 4))(tug.run(pNone, params)) * 1000)
    }
    // update operations (IU class) against GART
    var nextId = 10000000L
    val updates = Seq(
      LatRow("IU", "IU1-addPerson", Timing.meanOfMs(reps) {
        nextId += 1
        gart.addVertex(nextId, "PERSON", Map("firstName" -> "New"))
        gart.commit()
      } * 1000, Double.NaN),
      LatRow("IU", "IU2-addLike", Timing.meanOfMs(reps) {
        gart.addEdge(5L, SnbData.MsgBase + 3, "LIKES", 15000L, 1.0)
        gart.commit()
      } * 1000, Double.NaN),
      LatRow("IU", "IU3-addPost", Timing.meanOfMs(reps) {
        nextId += 1
        gart.addVertex(nextId, "POST", Map("creationDate" -> 15000L))
        gart.addEdge(nextId, 7L, "HAS_CREATOR", 15000L, 1.0)
        gart.commit()
      } * 1000, Double.NaN),
    )

    // throughput: mixed short+complex point queries, 16 workers
    val mixPlans = (SnbWorkloads.short ++ SnbWorkloads.complex.take(3)).map { case (_, q) =>
      plan(q, Some(cat), Optimizer.All)
    }
    val nOps = if (quick) 2000 else 20000
    val rt = new HiActorRuntime(16)
    val rng = new java.util.Random(1)
    val flexOps = {
      val t0 = System.nanoTime()
      val futs = (0 until nOps).map { i =>
        val p = mixPlans(i % mixPlans.size)
        val ps = params + ("id" -> (rng.nextInt(nPersons) + 1).toLong)
        rt.submit(HiActorExec.execute(p, store, ps))
      }
      futs.foreach(_.get())
      nOps / ((System.nanoTime() - t0) / 1e9)
    }
    rt.shutdown()
    val mixPlansNone = (SnbWorkloads.short ++ SnbWorkloads.complex.take(3)).map { case (_, q) =>
      plan(q, None, Optimizer.None_)
    }
    val nOpsTug = math.max(200, nOps / 50) // unoptimized plans are slow; scale count
    val tugOps = {
      val t0 = System.nanoTime()
      val threads = (0 until 16).map { t =>
        val th = new Thread(() => {
          val r2 = new java.util.Random(t)
          (0 until nOpsTug / 16).foreach { i =>
            val p = mixPlansNone(i % mixPlansNone.size)
            tug.run(p, params + ("id" -> (r2.nextInt(nPersons) + 1).toLong))
          }
        })
        th.start(); th
      }
      threads.foreach(_.join())
      (nOpsTug / 16 * 16) / ((System.nanoTime() - t0) / 1e9)
    }

    // ---- (c) SNB-BI: Gaia vs TigerGraph-sim (plain Spark SQL) ----------------
    val biPg = if (quick) pg else Datasets.snbBi(spark)
    biPg.vertices.cache().count(); biPg.edges.cache().count()
    val biCat = if (quick) cat else Catalog.fromPropertyGraph(biPg)
    biPg.vertices.createOrReplaceTempView("vertices")
    biPg.edges.createOrReplaceTempView("edges")
    val biParams = Map[String, Any]("country" -> "China")
    val biReps = if (quick) 2 else 3
    val bi = SnbWorkloads.bi.map { case (name, cypher, sqlT) =>
      val p = plan(cypher, Some(biCat), Optimizer.All)
      val gaiaMs = Timing.bestOfMs(biReps)(GaiaExec.execute(p, biPg, biParams).collect())
      val sql = sqlT.replace("__COUNTRY__", "China")
      val tigerMs = Timing.bestOfMs(biReps)(spark.sql(sql).collect())
      BiRow(name, gaiaMs, tigerMs)
    }

    Result(opt, latencies ++ updates, flexOps, tugOps, bi)
  }

  def report(r: Result): String = {
    val sb = new StringBuilder
    sb.append("== Exp-2a (Fig 7e): optimization study on HiActor ==\n")
    sb.append(Timing.table(Seq("set", "query", "rule off", "rule on", "speedup"),
      r.opt.map(o => Seq(o.set, o.query, Timing.fmt(o.offMs), Timing.fmt(o.onMs),
        f"${o.offMs / o.onMs}%.1fx"))))
    def gmean(xs: Seq[Double]) = math.exp(xs.map(math.log).sum / xs.size)
    Seq("Q1-fusion" -> "2.9x", "Q2-filterpush" -> "279x", "Q3-cbo" -> "11x").foreach {
      case (set, paper) =>
        val s = gmean(r.opt.filter(_.set == set).map(o => o.offMs / o.onMs))
        sb.append(f"   $set%-14s mean speedup ${s}%.1fx   (paper: $paper)\n")
    }
    sb.append("\n== Exp-2b (Fig 7f): SNB Interactive, HiActor+Flex vs TuGraph-sim ==\n")
    sb.append(Timing.table(Seq("class", "query", "Flex", "TuGraph-sim", "speedup"),
      r.interactive.map(l => Seq(l.cls, l.query, f"${l.flexUs}%.0fus",
        if (l.tugraphUs.isNaN) "-" else f"${l.tugraphUs}%.0fus",
        if (l.tugraphUs.isNaN) "-" else f"${l.tugraphUs / l.flexUs}%.1fx"))))
    val reads = r.interactive.filterNot(_.tugraphUs.isNaN)
    val gm = math.exp(reads.map(l => math.log(l.tugraphUs / l.flexUs)).sum / reads.size)
    sb.append(f"   mean read speedup ${gm}%.1fx (paper: 8.92x)\n")
    sb.append(f"   throughput: Flex ${r.flexOps}%.0f ops/s vs TuGraph-sim ${r.tugraphOps}%.0f ops/s" +
      f" = ${r.flexOps / r.tugraphOps}%.2fx (paper: 33,261 vs 13,532 = 2.45x)\n")
    sb.append("\n== Exp-2c (Fig 7g): SNB-BI, Gaia vs TigerGraph-sim (plain SQL) ==\n")
    sb.append(Timing.table(Seq("query", "Gaia", "TigerGraph-sim", "speedup"),
      r.bi.map(b => Seq(b.query, Timing.fmt(b.gaiaMs), Timing.fmt(b.tigerMs),
        f"${b.tigerMs / b.gaiaMs}%.2fx"))))
    val bgm = math.exp(r.bi.map(b => math.log(b.tigerMs / b.gaiaMs)).sum / r.bi.size)
    sb.append(f"   mean BI speedup ${bgm}%.2fx (paper: ~10x)\n")
    sb.toString
  }
}
