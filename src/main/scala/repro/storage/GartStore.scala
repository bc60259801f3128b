package repro.storage

import repro.graph.PropertyGraph
import repro.grin._
import repro.util.LongIntMap

/** GART — mutable in-memory graph store with MVCC (paper §4.2).
  *
  * Like the real GART, it provides consistent snapshots identified by a
  * version: a single writer appends vertices/edges tagged with the current
  * `writeVersion`; `commit()` publishes them atomically; readers open
  * [[GartSnapshot]]s that only see edges with `createVersion <= version`.
  *
  * The adjacency structure is the paper's "efficient and mutable CSR-like
  * data structure": per-vertex chains of fixed-capacity *blocks* of parallel
  * primitive arrays — appends are O(1) at the tail block, scans stride
  * arrays with good locality (vs LiveGraph's per-edge linked records), and
  * the only per-edge read cost is one version compare.
  *
  * Concurrency model: one writer thread, any number of reader threads.
  * `commit()`'s volatile write to `committedVersion` is the publication
  * point (happens-before for everything the writer wrote earlier).
  */
final class GartStore(expectedVertices: Int) {

  import GartStore.Block

  private val idMap = new LongIntMap(expectedVertices)
  private var extIds = new Array[Long](math.max(16, expectedVertices))
  private var vlabel = new Array[Byte](extIds.length)
  private var vcver = new Array[Int](extIds.length)
  private var vprops = new Array[Map[String, Any]](extIds.length)
  private var nV = 0

  private var outHead = new Array[Block](extIds.length)
  private var outTail = new Array[Block](extIds.length)
  private var inHead = new Array[Block](extIds.length)
  private var inTail = new Array[Block](extIds.length)

  private var vLabelNames = Vector.empty[String]
  private var eLabelNames = Vector.empty[String]

  @volatile private var committedVersion = 0
  private var writeVersion = 1
  private var nEdgesCommitted = 0L
  private var nEdgesPending = 0L

  private val FirstBlockCap = 8
  private val MaxBlockCap = 256

  // ---- writer API (single-threaded) ----------------------------------------

  def vertexLabelIdOrCreate(name: String): Int = {
    val i = vLabelNames.indexOf(name)
    if (i >= 0) i else { vLabelNames :+= name; vLabelNames.length - 1 }
  }
  def edgeLabelIdOrCreate(name: String): Int = {
    val i = eLabelNames.indexOf(name)
    if (i >= 0) i else { eLabelNames :+= name; eLabelNames.length - 1 }
  }

  def addVertex(extId: Long, label: String,
                props: Map[String, Any] = Map.empty): Int = {
    require(idMap.get(extId) < 0, s"vertex $extId already exists")
    if (nV == extIds.length) grow()
    val v = nV
    extIds(v) = extId
    vlabel(v) = vertexLabelIdOrCreate(label).toByte
    if (props.nonEmpty) vprops(v) = props
    vcver(v) = writeVersion
    idMap.put(extId, v)
    nV += 1
    v
  }

  def addEdge(srcExt: Long, dstExt: Long, label: String, ts: Long, weight: Double): Unit = {
    val s = idMap.get(srcExt); val d = idMap.get(dstExt)
    require(s >= 0 && d >= 0, s"unknown endpoint for edge $srcExt -> $dstExt")
    val l = edgeLabelIdOrCreate(label).toByte
    append(outHead, outTail, s, d, l, ts, weight)
    append(inHead, inTail, d, s, l, ts, weight)
    nEdgesPending += 1
  }

  private def append(heads: Array[Block], tails: Array[Block], v: Int,
                     other: Int, l: Byte, tsV: Long, w: Double): Unit = {
    var b = tails(v)
    if (b == null) { b = new Block(FirstBlockCap); heads(v) = b; tails(v) = b }
    else if (b.used == b.cap) {
      val nb = new Block(math.min(MaxBlockCap, b.cap * 2))
      b.next = nb; tails(v) = nb; b = nb
    }
    val i = b.used
    b.dst(i) = other; b.elabel(i) = l; b.ts(i) = tsV; b.weight(i) = w
    b.cver(i) = writeVersion
    // Publish the slot *after* its payload: readers gate on cver <= snapshot,
    // and the snapshot version is only advanced by commit()'s volatile write.
    b.used = i + 1
  }

  /** Publishes everything written since the last commit; returns the version. */
  def commit(): Int = {
    val v = writeVersion
    nEdgesCommitted += nEdgesPending
    nEdgesPending = 0
    writeVersion += 1
    committedVersion = v // volatile publication point
    v
  }

  def currentVersion: Int = committedVersion
  def committedEdges: Long = nEdgesCommitted

  private def grow(): Unit = {
    val c = extIds.length * 2
    extIds = java.util.Arrays.copyOf(extIds, c)
    vlabel = java.util.Arrays.copyOf(vlabel, c)
    vcver = java.util.Arrays.copyOf(vcver, c)
    vprops = java.util.Arrays.copyOf(vprops, c)
    outHead = java.util.Arrays.copyOf(outHead, c)
    outTail = java.util.Arrays.copyOf(outTail, c)
    inHead = java.util.Arrays.copyOf(inHead, c)
    inTail = java.util.Arrays.copyOf(inTail, c)
  }

  // ---- reader API -----------------------------------------------------------

  /** Opens a consistent snapshot at the latest committed version. */
  def snapshot(): GartSnapshot = new GartSnapshot(this, committedVersion)
  def snapshotAt(version: Int): GartSnapshot = new GartSnapshot(this, version)

  private[storage] def snapState: (Int, Array[Long], Array[Byte], Array[Int],
      Array[GartStore.Block], Array[GartStore.Block], Vector[String], Vector[String], LongIntMap) =
    (nV, extIds, vlabel, vcver, outHead, inHead, vLabelNames, eLabelNames, idMap)

  private[storage] def vpropsRef: Array[Map[String, Any]] = vprops
}

/** A consistent MVCC read view of a [[GartStore]] — a full GRIN backend
  * minus array-like adjacency (random indexed access is infeasible on the
  * versioned structure, which GRIN's capability negotiation surfaces).
  */
final class GartSnapshot(store: GartStore, val version: Int) extends GrinGraph {
  // Capture array refs once; version filtering makes later appends invisible.
  private val (nAll, extIds, vlabel, vcver, outHead, inHead, vLabelNames, eLabelNames, idMap) =
    store.snapState

  private val nVis = {
    var i = nAll - 1
    while (i >= 0 && vcver(i) > version) i -= 1
    i + 1
  }

  override val capabilities: Set[Capability.Value] = Set(
    Capability.IteratorAdjacency, Capability.VertexProperty, Capability.EdgeProperty,
    Capability.LabelIndex, Capability.ExternalIdIndex, Capability.VersionedSnapshot)

  def vertexCount: Int = nVis
  def edgeCount: Long = {
    var acc = 0L
    var v = 0
    val c = newCursor(Direction.Out)
    while (v < nVis) { c.seek(v); while (c.moveNext()) acc += 1; v += 1 }
    acc
  }

  def newCursor(dir: Direction.Value): NeighborCursor =
    new BlockCursor(if (dir == Direction.Out) outHead else inHead)

  private final class BlockCursor(heads: Array[GartStore.Block]) extends NeighborCursor {
    private var b: GartStore.Block = _
    private var i = 0
    private var lim = 0
    def seek(v: Int): NeighborCursor = {
      b = if (v < nVis) heads(v) else null
      i = -1; lim = if (b == null) 0 else b.used
      this
    }
    def moveNext(): Boolean = {
      while (b != null) {
        i += 1
        while (i < lim) {
          if (b.cver(i) <= version) return true
          i += 1
        }
        b = b.next
        i = -1
        lim = if (b == null) 0 else b.used
        if (b != null) i = -1
      }
      false
    }
    def neighbor: Int = b.dst(i)
    def edgeLabelId: Int = b.elabel(i)
    def ts: Long = b.ts(i)
    def weight: Double = b.weight(i)
  }

  def vertexLabelId(v: Int): Int = vlabel(v)
  def vertexLabelName(id: Int): String = vLabelNames(id)
  def vertexLabelIdOf(name: String): Int = vLabelNames.indexOf(name)
  def edgeLabelName(id: Int): String = eLabelNames(id)
  def edgeLabelIdOf(name: String): Int = eLabelNames.indexOf(name)

  private val vprops = store.vpropsRef
  def vertexProp(v: Int, name: String): Any = name match {
    case "id" => extIds(v)
    case "label" => vLabelNames(vlabel(v))
    case _ =>
      // Vertex payloads are append-only maps (not MVCC-versioned; the
      // dynamic workloads only version topology, like GART's hot path).
      val m = vprops(v)
      if (m == null) null else m.getOrElse(name, null)
  }

  def internalId(extId: Long): Int = {
    val v = idMap.get(extId)
    if (v >= 0 && v < nVis) v else -1
  }
  def externalId(v: Int): Long = extIds(v)
  def verticesByLabel(labelId: Int): Array[Int] = {
    val out = new scala.collection.mutable.ArrayBuilder.ofInt
    var v = 0
    while (v < nVis) { if (vlabel(v) == labelId) out += v; v += 1 }
    out.result()
  }
}

object GartStore {

  /** One adjacency block: parallel arrays + chain pointer. */
  private[storage] final class Block(val cap: Int) {
    val dst = new Array[Int](cap)
    val elabel = new Array[Byte](cap)
    val cver = new Array[Int](cap)
    val ts = new Array[Long](cap)
    val weight = new Array[Double](cap)
    var used = 0
    var next: Block = _
  }

  /** Bulk-loads a [[PropertyGraph]] (with vertex properties) and commits
    * once (snapshot v1).
    */
  def fromPropertyGraph(g: PropertyGraph): GartStore = {
    val schema = g.vertices.schema
    val propFields = schema.fields.filter(f => f.name != "id" && f.name != "label")
    val vRows = g.vertices.collect()
    val store = new GartStore(vRows.length)
    vRows.foreach { r =>
      val props = propFields.flatMap { f =>
        val i = schema.fieldIndex(f.name)
        if (r.isNullAt(i)) None else Some(f.name -> r.get(i))
      }.toMap
      store.addVertex(r.getLong(0), r.getString(1), props)
    }
    g.edges.select("src", "dst", "label", "ts", "weight").collect().foreach { r =>
      store.addEdge(r.getLong(0), r.getLong(1), r.getString(2), r.getLong(3), r.getDouble(4))
    }
    store.commit()
    store
  }
}
