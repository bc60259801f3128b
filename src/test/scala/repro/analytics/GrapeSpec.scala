package repro.analytics

import repro.SparkSpec
import repro.analytics.grape._
import repro.graph.{GraphGen, LocalCsr}

class GrapeSpec extends SparkSpec {

  private lazy val rmatCsr = LocalCsr.fromDataFrame(
    GraphGen.simplify(GraphGen.rmat(spark, scale = 11, edges = 12000, seed = 21)))
  private lazy val uniCsr = LocalCsr.fromDataFrame(
    GraphGen.uniform(spark, n = 1500, edges = 9000, seed = 22))
  private lazy val csrs = Seq("rmat" -> rmatCsr, "uniform" -> uniCsr)

  private def maxDiff(a: Array[Double], b: Array[Double]): Double =
    a.zip(b).map { case (x, y) => math.abs(x - y) }.max

  test("fragment partition preserves every edge exactly once") {
    csrs.foreach { case (name, csr) =>
      val frags = Fragment.partition(csr, 8)
      assert(frags.map(_.edgeCount).sum == csr.m, name)
      assert(frags.map(_.innerCount).sum == csr.n, name)
      // spot-check adjacency of 50 vertices
      val bs = frags(0).blockSize
      (0 until math.min(50, csr.n)).foreach { v =>
        val f = frags(v / bs)
        val i = v % bs
        val got = (f.off(i) until f.off(i + 1)).map(f.dst).sorted
        val want = (csr.outOff(v) until csr.outOff(v + 1)).map(csr.outDst).sorted
        assert(got == want, s"$name vertex $v")
      }
    }
  }

  test("grape PageRank matches the sequential reference") {
    csrs.foreach { case (name, csr) =>
      val frags = Fragment.partition(csr, 8)
      val got = GrapeEngine.pageRank(frags, iters = 15)
      val want = Reference.pageRank(csr, iters = 15)
      assert(maxDiff(got, want) < 1e-9, name)
      assert(math.abs(got.sum - 1.0) < 1e-6, s"$name ranks must sum to 1")
    }
  }

  test("grape BFS matches the sequential reference") {
    csrs.foreach { case (name, csr) =>
      val frags = Fragment.partition(csr, 8)
      val src = (0 until csr.n).maxBy(csr.outDegree)
      assert(GrapeEngine.bfs(frags, src).toSeq == Reference.bfs(csr, src).toSeq, name)
    }
  }

  test("grape works with any fragment count") {
    Seq(1, 3, 16).foreach { nF =>
      val frags = Fragment.partition(uniCsr, nF)
      val got = GrapeEngine.pageRank(frags, 5)
      assert(maxDiff(got, Reference.pageRank(uniCsr, 5)) < 1e-9, s"nFrags=$nF")
    }
  }

  test("PowerGraph-sim PageRank matches reference") {
    val got = Baselines.PowerGraphSim.pageRank(uniCsr, 10)
    assert(maxDiff(got, Reference.pageRank(uniCsr, 10)) < 1e-9)
  }

  test("Gemini-sim PageRank matches reference") {
    val got = Baselines.GeminiSim.pageRank(uniCsr, 10)
    assert(maxDiff(got, Reference.pageRank(uniCsr, 10)) < 1e-9)
  }

  test("Groute-sim PageRank matches reference") {
    val got = Baselines.GrouteSim.pageRank(uniCsr, 10)
    assert(maxDiff(got, Reference.pageRank(uniCsr, 10)) < 1e-9)
  }

  test("Gunrock-sim PageRank matches reference") {
    val got = Baselines.GunrockSim.pageRank(uniCsr, 10)
    assert(maxDiff(got, Reference.pageRank(uniCsr, 10)) < 1e-9)
  }

  test("all BFS engines agree with the reference") {
    csrs.foreach { case (name, csr) =>
      val src = (0 until csr.n).maxBy(csr.outDegree)
      val want = Reference.bfs(csr, src).toSeq
      assert(Baselines.PowerGraphSim.bfs(csr, src).toSeq == want, s"$name powergraph")
      assert(Baselines.GeminiSim.bfs(csr, src).toSeq == want, s"$name gemini")
      assert(Baselines.GrouteSim.bfs(csr, src).toSeq == want, s"$name groute")
      assert(Baselines.GunrockSim.bfs(csr, src).toSeq == want, s"$name gunrock")
    }
  }

  test("WCC via PIE matches reference components (symmetrized)") {
    val sym = symmetrize(uniCsr)
    val frags = Fragment.partition(sym, 8)
    val pie = new WccPie(frags)
    val rounds = Pie.run(frags, pie)
    val got = pie.result(sym.n)
    val want = Reference.wcc(sym)
    // same partition of vertices into components
    val gotGroups = got.zipWithIndex.groupBy(_._1).values.map(_.map(_._2).toSet).toSet
    val wantGroups = want.zipWithIndex.groupBy(_._1).values.map(_.map(_._2).toSet).toSet
    assert(gotGroups == wantGroups)
    assert(rounds < 50, s"PIE should converge quickly, took $rounds rounds")
  }

  test("PIE converges in fewer rounds than vertex-centric would need") {
    // local fixpoint inside fragments ⇒ rounds ≈ fragment-hop diameter, far
    // below the graph's vertex-hop diameter (GRAPE's PEval advantage)
    val grid = LocalCsr.fromDataFrame(GraphGen.highDiameter(spark, side = 14, shortcutFrac = 0.0))
    val sym = symmetrize(grid)
    val frags = Fragment.partition(sym, 4)
    val pie = new WccPie(frags)
    val rounds = Pie.run(frags, pie)
    val vertexDiameter = Reference.bfs(sym, 0).max
    assert(rounds < vertexDiameter, s"PIE rounds $rounds vs diameter $vertexDiameter")
  }

  test("SSSP in the Pregel model matches Dijkstra") {
    val rng = new java.util.Random(31)
    val weights = Array.fill(uniCsr.m)(0.5 + rng.nextDouble())
    val frags = Fragment.partition(uniCsr, 8, weights)
    val src = 0
    val states = Pregel.run(frags, new SsspPregel(src), maxSupersteps = 200)
    val want = Reference.sssp(uniCsr, weights, src)
    val bs = frags(0).blockSize
    var v = 0
    while (v < uniCsr.n) {
      val got = states(v / bs)(v % bs).asInstanceOf[Double]
      assert(math.abs(got - want(v)) < 1e-9 || (got.isInfinity && want(v).isInfinity), s"v=$v")
      v += 1
    }
  }

  test("k-core via FLASH matches reference peeling") {
    val sym = symmetrize(rmatCsr)
    (2 to 5).foreach { k =>
      assert(Flash.kCore(sym, k).toSeq == Reference.kCore(sym, k).toSeq, s"k=$k")
    }
  }

  test("FLASH vertexMap/edgeMap primitives") {
    val csr = LocalCsr.build(Array(0L, 0L, 1L), Array(1L, 2L, 2L))
    val u = Flash.vertexMap(Flash.all(3), _ == 0)
    assert(u.size == 1)
    val touched = Flash.edgeMap(csr, u, (_, _) => true)
    assert((0 until 3).filter(touched.contains) == Seq(1, 2))
  }

  test("varint message encoding shrinks sorted-vid batches (§6 claim)") {
    val vids = Array.tabulate(10000)(i => i * 3)
    val values = Array.fill(10000)(7L)
    val (varintBytes, rawBytes) = GrapeEngine.messageBytesVarint(vids, values)
    assert(varintBytes < rawBytes / 4,
      s"varint $varintBytes should be <25% of raw $rawBytes")
  }

  test("dangling vertices keep PageRank a distribution") {
    // a star where leaves dangle
    val csr = LocalCsr.build(Array(0L, 0L, 0L), Array(1L, 2L, 3L))
    val frags = Fragment.partition(csr, 2)
    val pr = GrapeEngine.pageRank(frags, 30)
    assert(math.abs(pr.sum - 1.0) < 1e-9)
    assert(pr(1) > pr(0), "leaves receive mass from the hub")
  }

  private def symmetrize(csr: LocalCsr): LocalCsr = {
    val src = new scala.collection.mutable.ArrayBuffer[Long]()
    val dst = new scala.collection.mutable.ArrayBuffer[Long]()
    val seen = scala.collection.mutable.HashSet.empty[(Int, Int)]
    var v = 0
    while (v < csr.n) {
      var e = csr.outOff(v)
      while (e < csr.outOff(v + 1)) {
        val u = csr.outDst(e)
        if (seen.add((v, u))) { src += v; dst += u }
        if (seen.add((u, v))) { src += u; dst += v }
        e += 1
      }
      v += 1
    }
    LocalCsr.build(src.toArray, dst.toArray, Array.tabulate(csr.n)(_.toLong))
  }
}
