package repro.storage

import repro.SparkSpec
import repro.graph.SnbData
import repro.grin._
import repro.storage.graphar.{GraphArGraph, GraphArWriter}

/** GRIN conformance across the three backends — the "implement once, deploy
  * on any storage" property behind Exp-1a. Every check runs identically on
  * Vineyard (immutable in-memory), GART (dynamic MVCC) and GraphAr
  * (external archive).
  */
class GrinBackendsSpec extends SparkSpec {

  private lazy val pg = SnbData.generate(spark, nPersons = 120, seed = 9)
  private lazy val garDir = {
    val dir = java.nio.file.Files.createTempDirectory("grin-gar").toString
    GraphArWriter.exportGraph(pg, dir, chunkSize = 512)
    dir
  }
  private lazy val backends: Seq[(String, GrinGraph)] = Seq(
    "vineyard" -> VineyardStore.fromPropertyGraph(pg),
    "gart" -> GartStore.fromPropertyGraph(pg).snapshot(),
    "graphar" -> new GraphArGraph(garDir),
  )

  private lazy val vRows = pg.vertices.collect()
  private lazy val eRows = pg.edges.select("src", "dst", "label", "ts", "weight").collect()
  private lazy val outModel: Map[Long, Seq[Long]] =
    eRows.groupBy(_.getLong(0)).map { case (s, rs) => s -> rs.map(_.getLong(1)).toSeq.sorted }
  private lazy val inModel: Map[Long, Seq[Long]] =
    eRows.groupBy(_.getLong(1)).map { case (d, rs) => d -> rs.map(_.getLong(0)).toSeq.sorted }

  private def adjacency(g: GrinGraph, v: Int, dir: Direction.Value): Seq[Long] = {
    val c = g.newCursor(dir).seek(v)
    val out = Seq.newBuilder[Long]
    while (c.moveNext()) out += g.externalId(c.neighbor)
    out.result().sorted
  }

  for (name <- Seq("vineyard", "gart", "graphar")) {
    // deferred lookup so backend construction happens inside the test
    def g: GrinGraph = backends.find(_._1 == name).get._2

    test(s"[$name] vertex and edge counts") {
      assert(g.vertexCount == vRows.length)
      assert(g.edgeCount == eRows.length)
    }

    test(s"[$name] external-id index is a bijection") {
      vRows.foreach { r =>
        val v = g.internalId(r.getLong(0))
        assert(v >= 0)
        assert(g.externalId(v) == r.getLong(0))
      }
      assert(g.internalId(-12345L) == -1)
    }

    test(s"[$name] out-adjacency matches the edge list") {
      vRows.take(200).foreach { r =>
        val ext = r.getLong(0)
        val got = adjacency(g, g.internalId(ext), Direction.Out)
        assert(got == outModel.getOrElse(ext, Seq.empty), s"vertex $ext")
      }
    }

    test(s"[$name] in-adjacency matches the edge list") {
      vRows.take(200).foreach { r =>
        val ext = r.getLong(0)
        val got = adjacency(g, g.internalId(ext), Direction.In)
        assert(got == inModel.getOrElse(ext, Seq.empty), s"vertex $ext")
      }
    }

    test(s"[$name] degree agrees with cursor count") {
      vRows.take(100).foreach { r =>
        val v = g.internalId(r.getLong(0))
        assert(g.degree(v, Direction.Out) == adjacency(g, v, Direction.Out).size)
        assert(g.degree(v, Direction.In) == adjacency(g, v, Direction.In).size)
      }
    }

    test(s"[$name] vertex labels round-trip") {
      vRows.take(200).foreach { r =>
        val v = g.internalId(r.getLong(0))
        assert(g.vertexLabelName(g.vertexLabelId(v)) == r.getString(1))
      }
    }

    test(s"[$name] label index returns exactly the labeled vertices") {
      val personId = g.vertexLabelIdOf("PERSON")
      assert(personId >= 0)
      val got = g.verticesByLabel(personId).map(g.externalId).toSet
      val want = vRows.filter(_.getString(1) == "PERSON").map(_.getLong(0)).toSet
      assert(got == want)
    }

    test(s"[$name] edge labels and fast-path props visible on the cursor") {
      val knowsRows = eRows.filter(_.getString(2) == "KNOWS")
      val someSrc = knowsRows.head.getLong(0)
      val v = g.internalId(someSrc)
      val knowsId = g.edgeLabelIdOf("KNOWS")
      val c = g.newCursor(Direction.Out).seek(v)
      var seen = 0
      while (c.moveNext()) {
        if (c.edgeLabelId == knowsId) {
          assert(c.weight == 1.0)
          assert(c.ts > 0)
          seen += 1
        }
      }
      assert(seen == knowsRows.count(_.getLong(0) == someSrc))
    }

    test(s"[$name] declares iterator adjacency capability") {
      assert(g.capabilities(Capability.IteratorAdjacency))
    }
  }

  test("capability negotiation differs by backend (GRIN's trait feasibility)") {
    val caps = backends.toMap
    assert(caps("vineyard").capabilities(Capability.ArrayLikeAdjacency))
    assert(!caps("gart").capabilities(Capability.ArrayLikeAdjacency))
    assert(caps("gart").capabilities(Capability.VersionedSnapshot))
    assert(!caps("vineyard").capabilities(Capability.VersionedSnapshot))
  }

  test("vertex properties readable through GRIN (vineyard + gart + graphar)") {
    val persons = vRows.filter(_.getString(1) == "PERSON").take(20)
    backends.foreach { case (name, g) =>
      persons.foreach { r =>
        val v = g.internalId(r.getLong(0))
        val fn = g.vertexProp(v, "firstName")
        assert(fn == r.getString(2), s"[$name] firstName of ${r.getLong(0)}: got $fn")
        assert(g.vertexProp(v, "id") == r.getLong(0), s"[$name]")
      }
    }
  }

  test("predicate pushdown default scan agrees with manual filter (vineyard)") {
    val g = backends.head._2
    val personId = g.vertexLabelIdOf("PERSON")
    val got = g.scanVerticesWhere(personId, "firstName", "=", "Jan").map(g.externalId).toSet
    val want = vRows.filter(r => r.getString(1) == "PERSON" && r.getString(2) == "Jan")
      .map(_.getLong(0)).toSet
    assert(got == want)
  }

  test("array-like adjacency (vineyard) agrees with the cursor") {
    val g = backends.head._2
    vRows.take(50).foreach { r =>
      val v = g.internalId(r.getLong(0))
      val viaIdx = (0 until g.degree(v, Direction.Out))
        .map(i => g.externalId(g.neighborAt(v, Direction.Out, i))).sorted
      assert(viaIdx == adjacency(g, v, Direction.Out))
    }
  }
}
