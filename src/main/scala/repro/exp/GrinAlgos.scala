package repro.exp

import repro.grin.{Direction, GrinGraph}

/** Analytics written once against GRIN — the Exp-1a point: the same
  * implementation runs unchanged on Vineyard, GART and GraphAr.
  */
object GrinAlgos {

  /** PageRank through GRIN cursors (no backend-specific access). */
  def pageRank(g: GrinGraph, iters: Int, d: Double = 0.85): Array[Double] = {
    val n = g.vertexCount
    var rank = Array.fill(n)(1.0 / n)
    val deg = new Array[Int](n)
    val c0 = g.newCursor(Direction.Out)
    var v = 0
    while (v < n) { deg(v) = g.degree(v, Direction.Out); v += 1 }
    var it = 0
    while (it < iters) {
      val next = Array.fill(n)((1 - d) / n)
      var dangling = 0.0
      val c = g.newCursor(Direction.Out)
      v = 0
      while (v < n) {
        if (deg(v) == 0) dangling += rank(v)
        else {
          val contrib = d * rank(v) / deg(v)
          val cur = c.seek(v)
          while (cur.moveNext()) next(cur.neighbor) += contrib
        }
        v += 1
      }
      val share = d * dangling / n
      v = 0
      while (v < n) { next(v) += share; v += 1 }
      rank = next
      it += 1
    }
    rank
  }

  /** Full out-edge scan; returns (sum, edges) — the storage read kernel. */
  def edgeScan(g: GrinGraph): (Long, Long) = {
    var acc = 0L
    var m = 0L
    val c = g.newCursor(Direction.Out)
    var v = 0
    val n = g.vertexCount
    while (v < n) {
      val cur = c.seek(v)
      while (cur.moveNext()) { acc += cur.neighbor; m += 1 }
      v += 1
    }
    (acc, m)
  }

  /** BFS through GRIN cursors. */
  def bfs(g: GrinGraph, source: Int): Array[Int] = {
    val n = g.vertexCount
    val dist = Array.fill(n)(-1)
    dist(source) = 0
    var frontier = new repro.analytics.grape.IntBuf
    frontier.add(source)
    val c = g.newCursor(Direction.Out)
    var level = 0
    while (frontier.size > 0) {
      val next = new repro.analytics.grape.IntBuf
      var k = 0
      while (k < frontier.size) {
        val cur = c.seek(frontier(k))
        while (cur.moveNext()) {
          val u = cur.neighbor
          if (dist(u) < 0) { dist(u) = level + 1; next.add(u) }
        }
        k += 1
      }
      frontier = next
      level += 1
    }
    dist
  }
}
