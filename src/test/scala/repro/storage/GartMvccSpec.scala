package repro.storage

import org.scalatest.funsuite.AnyFunSuite
import repro.grin.Direction

class GartMvccSpec extends AnyFunSuite {

  private def neighbors(s: GartSnapshot, v: Int, dir: Direction.Value = Direction.Out): Seq[Long] = {
    val c = s.newCursor(dir).seek(v)
    val out = Seq.newBuilder[Long]
    while (c.moveNext()) out += s.externalId(c.neighbor)
    out.result().sorted
  }

  test("uncommitted writes are invisible") {
    val g = new GartStore(8)
    g.addVertex(1, "V"); g.addVertex(2, "V")
    g.commit()
    val snap = g.snapshot()
    g.addEdge(1, 2, "E", 0, 1.0)
    assert(neighbors(snap, snap.internalId(1)).isEmpty)
    assert(neighbors(g.snapshot(), 0).isEmpty, "still uncommitted")
    g.commit()
    assert(neighbors(g.snapshot(), g.snapshot().internalId(1)) == Seq(2L))
    assert(neighbors(snap, snap.internalId(1)).isEmpty, "old snapshot stays frozen")
  }

  test("snapshots are versioned and stable") {
    val g = new GartStore(8)
    (1 to 5).foreach(i => g.addVertex(i, "V"))
    g.commit()
    val versions = (1 to 4).map { i =>
      g.addEdge(i, i + 1, "E", i, 1.0)
      g.commit()
    }
    assert(versions == (2 to 5))
    (1 to 4).foreach { k =>
      val s = g.snapshotAt(versions(k - 1))
      val total = (0 until s.vertexCount).map(v => neighbors(s, v).size).sum
      assert(total == k, s"snapshot at version ${versions(k - 1)} sees $total edges")
    }
  }

  test("new vertices become visible only after commit") {
    val g = new GartStore(4)
    g.addVertex(1, "A")
    g.commit()
    val s1 = g.snapshot()
    g.addVertex(2, "A")
    assert(s1.vertexCount == 1)
    assert(g.snapshot().vertexCount == 1)
    g.commit()
    assert(g.snapshot().vertexCount == 2)
    assert(s1.internalId(2) == -1, "old snapshot must not resolve the new id")
  }

  test("in-direction mirrors out-direction") {
    val g = new GartStore(8)
    (1 to 3).foreach(i => g.addVertex(i, "V"))
    g.addEdge(1, 3, "E", 0, 1.0)
    g.addEdge(2, 3, "E", 0, 1.0)
    g.commit()
    val s = g.snapshot()
    assert(neighbors(s, s.internalId(3), Direction.In) == Seq(1L, 2L))
    assert(neighbors(s, s.internalId(3), Direction.Out).isEmpty)
  }

  test("block chaining handles high-degree vertices") {
    val g = new GartStore(4)
    g.addVertex(0, "V")
    (1 to 5000).foreach(i => g.addVertex(i, "V"))
    (1 to 5000).foreach(i => g.addEdge(0, i, "E", i, 1.0))
    g.commit()
    val s = g.snapshot()
    assert(s.degree(s.internalId(0), Direction.Out) == 5000)
    assert(neighbors(s, s.internalId(0)) == (1 to 5000).map(_.toLong))
  }

  test("edge properties survive through the cursor") {
    val g = new GartStore(4)
    g.addVertex(1, "V"); g.addVertex(2, "V")
    g.addEdge(1, 2, "BUY", ts = 777, weight = 2.5)
    g.commit()
    val s = g.snapshot()
    val c = s.newCursor(Direction.Out).seek(s.internalId(1))
    assert(c.moveNext())
    assert(c.ts == 777 && c.weight == 2.5)
    assert(s.edgeLabelName(c.edgeLabelId) == "BUY")
    assert(!c.moveNext())
  }

  test("concurrent reader sees a consistent edge count while writer appends") {
    val g = new GartStore(128)
    (0 until 100).foreach(i => g.addVertex(i, "V"))
    g.commit()
    val rng = new java.util.Random(5)
    @volatile var stop = false
    val errors = new java.util.concurrent.atomic.AtomicInteger(0)
    val readers = (0 until 4).map { _ =>
      val t = new Thread(() => {
        while (!stop) {
          val s = g.snapshot()
          val c1 = (0 until s.vertexCount).map(v => s.degree(v, Direction.Out)).sum
          // the same snapshot must count the same edges on a second pass
          val c2 = (0 until s.vertexCount).map(v => s.degree(v, Direction.Out)).sum
          if (c1 != c2) errors.incrementAndGet()
        }
      })
      t.start(); t
    }
    (0 until 200).foreach { _ =>
      (0 until 20).foreach { _ =>
        g.addEdge(rng.nextInt(100), rng.nextInt(100), "E", 0, 1.0)
      }
      g.commit()
    }
    stop = true
    readers.foreach(_.join())
    assert(errors.get() == 0, "snapshot reads were not repeatable")
    val s = g.snapshot()
    assert((0 until s.vertexCount).map(v => s.degree(v, Direction.Out)).sum == 4000)
  }

  test("vertex props are readable through the snapshot") {
    val g = new GartStore(4)
    g.addVertex(1, "PERSON", Map("firstName" -> "Ana", "age" -> 30L))
    g.commit()
    val s = g.snapshot()
    val v = s.internalId(1)
    assert(s.vertexProp(v, "firstName") == "Ana")
    assert(s.vertexProp(v, "age") == 30L)
    assert(s.vertexProp(v, "missing") == null)
    assert(s.vertexProp(v, "label") == "PERSON")
  }

  test("LiveGraph-sim snapshot agrees with GART on the same inserts") {
    val rng = new java.util.Random(11)
    val gart = new GartStore(64)
    val live = new LiveGraphSim(64)
    (0 until 50).foreach { i => gart.addVertex(i, "V"); live.addVertex(i, "V") }
    (0 until 500).foreach { _ =>
      val s = rng.nextInt(50); val d = rng.nextInt(50)
      gart.addEdge(s, d, "E", 0, 1.0); live.addEdge(s, d, "E", 0, 1.0)
    }
    gart.commit(); live.commit()
    val gs = gart.snapshot(); val ls = live.snapshot()
    (0 until 50).foreach { v =>
      assert(neighbors(gs, v) == {
        val c = ls.newCursor(Direction.Out).seek(v)
        val out = Seq.newBuilder[Long]
        while (c.moveNext()) out += ls.externalId(c.neighbor)
        out.result().sorted
      })
    }
    assert(ls.edgeCount == 500)
  }
}
