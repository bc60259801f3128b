package repro.util

/** Open-addressing Long→Int hash map with no boxing.
  *
  * This is the "internal ID assignment" index the paper attributes to
  * Vineyard (§4.2) and the "perfect hash" GRAPE uses for ghost-vertex
  * lookup (§6): external 64-bit vertex ids are mapped to dense ints so
  * adjacency can live in flat arrays.
  */
final class LongIntMap(expected: Int) {
  private var capacity = java.lang.Integer.highestOneBit(math.max(16, expected * 2) - 1) * 2
  private var keys = new Array[Long](capacity)
  private var vals = new Array[Int](capacity)
  private var used = new Array[Boolean](capacity)
  private var n = 0

  def size: Int = n

  @inline private def slot(k: Long): Int = {
    // Stafford mix 13 — good avalanche so clustering stays low.
    var h = k
    h = (h ^ (h >>> 30)) * 0xbf58476d1ce4e5b9L
    h = (h ^ (h >>> 27)) * 0x94d049bb133111ebL
    (h ^ (h >>> 31)).toInt & (capacity - 1)
  }

  def put(key: Long, value: Int): Unit = {
    if (n * 2 >= capacity) grow()
    var i = slot(key)
    while (used(i) && keys(i) != key) i = (i + 1) & (capacity - 1)
    if (!used(i)) { used(i) = true; keys(i) = key; n += 1 }
    vals(i) = value
  }

  /** Returns the mapped value, or -1 when absent. */
  def get(key: Long): Int = {
    var i = slot(key)
    while (used(i)) {
      if (keys(i) == key) return vals(i)
      i = (i + 1) & (capacity - 1)
    }
    -1
  }

  def contains(key: Long): Boolean = get(key) >= 0

  private def grow(): Unit = {
    val ok = keys; val ov = vals; val ou = used
    capacity *= 2
    keys = new Array[Long](capacity); vals = new Array[Int](capacity); used = new Array[Boolean](capacity)
    n = 0
    var i = 0
    while (i < ok.length) { if (ou(i)) put(ok(i), ov(i)); i += 1 }
  }
}
