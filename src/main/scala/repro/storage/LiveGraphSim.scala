package repro.storage

import repro.graph.PropertyGraph
import repro.grin._
import repro.util.LongIntMap

/** LiveGraph-style dynamic storage baseline (paper Exp-1c comparator).
  *
  * Models the published LiveGraph design dimension that GART's blocked
  * arrays improve on: adjacency held as chains of *individually allocated
  * per-edge records*, each carrying its own creation/invalidation timestamps
  * that every scan must check. Scans therefore chase one pointer and touch
  * one small heap object per edge — no array striding, poor locality —
  * which is exactly the read-path cost the paper's 3.88× GART speedup
  * comes from.
  */
final class LiveGraphSim(expectedVertices: Int) {

  import LiveGraphSim.EdgeRec

  private val idMap = new LongIntMap(expectedVertices)
  private var extIds = new Array[Long](math.max(16, expectedVertices))
  private var vlabel = new Array[Byte](extIds.length)
  private var outHead = new Array[EdgeRec](extIds.length)
  private var inHead = new Array[EdgeRec](extIds.length)
  private var nV = 0
  private var nE = 0L

  private var vLabelNames = Vector.empty[String]
  private var eLabelNames = Vector.empty[String]

  @volatile private var committedVersion = 0
  private var writeVersion = 1

  def addVertex(extId: Long, label: String): Int = {
    if (nV == extIds.length) {
      val c = extIds.length * 2
      extIds = java.util.Arrays.copyOf(extIds, c)
      vlabel = java.util.Arrays.copyOf(vlabel, c)
      outHead = java.util.Arrays.copyOf(outHead, c)
      inHead = java.util.Arrays.copyOf(inHead, c)
    }
    var li = vLabelNames.indexOf(label)
    if (li < 0) { vLabelNames :+= label; li = vLabelNames.length - 1 }
    val v = nV
    extIds(v) = extId; vlabel(v) = li.toByte
    idMap.put(extId, v); nV += 1
    v
  }

  def addEdge(srcExt: Long, dstExt: Long, label: String, ts: Long, weight: Double): Unit = {
    val s = idMap.get(srcExt); val d = idMap.get(dstExt)
    require(s >= 0 && d >= 0, "unknown endpoint")
    var li = eLabelNames.indexOf(label)
    if (li < 0) { eLabelNames :+= label; li = eLabelNames.length - 1 }
    val out = new EdgeRec(d, li.toByte, writeVersion, ts, weight)
    out.next = outHead(s); outHead(s) = out
    val in = new EdgeRec(s, li.toByte, writeVersion, ts, weight)
    in.next = inHead(d); inHead(d) = in
    nE += 1
  }

  def commit(): Int = { val v = writeVersion; writeVersion += 1; committedVersion = v; v }

  def snapshot(): LiveGraphSnapshot =
    new LiveGraphSnapshot(nV, extIds, vlabel, outHead, inHead, vLabelNames, eLabelNames,
      idMap, committedVersion, nE)
}

final class LiveGraphSnapshot(
    nVis: Int, extIds: Array[Long], vlabel: Array[Byte],
    outHead: Array[LiveGraphSim.EdgeRec], inHead: Array[LiveGraphSim.EdgeRec],
    vLabelNames: Vector[String], eLabelNames: Vector[String],
    idMap: LongIntMap, version: Int, nE: Long) extends GrinGraph {

  override val capabilities: Set[Capability.Value] = Set(
    Capability.IteratorAdjacency, Capability.EdgeProperty,
    Capability.ExternalIdIndex, Capability.VersionedSnapshot)

  def vertexCount: Int = nVis
  def edgeCount: Long = nE

  def newCursor(dir: Direction.Value): NeighborCursor =
    new RecCursor(if (dir == Direction.Out) outHead else inHead)

  private final class RecCursor(heads: Array[LiveGraphSim.EdgeRec]) extends NeighborCursor {
    private var cur: LiveGraphSim.EdgeRec = _
    private var nextRec: LiveGraphSim.EdgeRec = _
    def seek(v: Int): NeighborCursor = { cur = null; nextRec = if (v < nVis) heads(v) else null; this }
    def moveNext(): Boolean = {
      // Per-edge version window check on every record — the LiveGraph scan.
      while (nextRec != null) {
        val r = nextRec
        nextRec = r.next
        if (r.cver <= version && r.dver > version) { cur = r; return true }
      }
      false
    }
    def neighbor: Int = cur.dst
    def edgeLabelId: Int = cur.elabel
    def ts: Long = cur.ts
    def weight: Double = cur.weight
  }

  def vertexLabelId(v: Int): Int = vlabel(v)
  def vertexLabelName(id: Int): String = vLabelNames(id)
  def vertexLabelIdOf(name: String): Int = vLabelNames.indexOf(name)
  def edgeLabelName(id: Int): String = eLabelNames(id)
  def edgeLabelIdOf(name: String): Int = eLabelNames.indexOf(name)
  def vertexProp(v: Int, name: String): Any = name match {
    case "id" => extIds(v)
    case "label" => vLabelNames(vlabel(v))
    case _ => null
  }
  def internalId(extId: Long): Int = idMap.get(extId)
  def externalId(v: Int): Long = extIds(v)
  def verticesByLabel(labelId: Int): Array[Int] = {
    val out = new scala.collection.mutable.ArrayBuilder.ofInt
    var v = 0
    while (v < nVis) { if (vlabel(v) == labelId) out += v; v += 1 }
    out.result()
  }
}

object LiveGraphSim {

  /** One per-edge record: individually allocated, pointer-chained, carrying
    * its own version window — LiveGraph's per-edge log-entry layout.
    */
  final class EdgeRec(val dst: Int, val elabel: Byte, val cver: Int,
                      val ts: Long, val weight: Double) {
    var dver: Int = Int.MaxValue
    var next: EdgeRec = _
  }
  def fromPropertyGraph(g: PropertyGraph): LiveGraphSim = {
    val vRows = g.vertices.select("id", "label").collect()
    val s = new LiveGraphSim(vRows.length)
    vRows.foreach(r => s.addVertex(r.getLong(0), r.getString(1)))
    g.edges.select("src", "dst", "label", "ts", "weight").collect().foreach { r =>
      s.addEdge(r.getLong(0), r.getLong(1), r.getString(2), r.getLong(3), r.getDouble(4))
    }
    s.commit()
    s
  }
}
