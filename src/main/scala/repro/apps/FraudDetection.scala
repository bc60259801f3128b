package repro.apps

import repro.grin.{Direction, GrinGraph}

/** Real-time fraud detection (paper §8, Fig. 6a; Exp-5 / Table 2).
  *
  * The production deployment is HiActor + GART: orders stream into GART as
  * (Account)-[BUY]->(Item) edges while concurrent queries check each new
  * order against *fraud seeds*. [[check]] is the compiled stored-procedure
  * form of the paper's Cypher query — the Cypher text itself is parsed and
  * cross-checked against this implementation in the test suite:
  *
  * {{{
  * MATCH (v:ACCOUNT {id:$id})-[b1:BUY]->(:ITEM)<-[b2:BUY]-(s:ACCOUNT)
  * WHERE s.id IN SEEDS AND b1.ts - b2.ts < 5 AND b1.ts - b2.ts > -5
  * WITH v, COUNT(s) AS cnt1
  * MATCH (v)-[:KNOWS]-(f:ACCOUNT), (f)-[b3:BUY]->(:ITEM)<-[b4:BUY]-(s2:ACCOUNT)
  * WHERE s2.id IN SEEDS
  * WITH v, cnt1, COUNT(s2) AS cnt2 ...
  * }}}
  */
object FraudDetection {

  final case class Verdict(cnt1: Long, cnt2: Long, alert: Boolean)

  /** Direct + indirect co-purchase counts against the seed set.
    * `seeds` holds *internal* vertex ids for O(1) membership tests.
    */
  def check(g: GrinGraph, account: Int, seeds: java.util.BitSet,
            w1: Double = 1.0, w2: Double = 0.5, threshold: Double = 3.0,
            windowDays: Long = 5): Verdict = {
    val buyId = g.edgeLabelIdOf("BUY")
    val knowsId = g.edgeLabelIdOf("KNOWS")

    /** Rows of (item, seedAccount) co-purchases for one account. */
    def coPurchases(v: Int, window: Boolean): Long = {
      var cnt = 0L
      val out = g.newCursor(Direction.Out).seek(v)
      val in = g.newCursor(Direction.In)
      while (out.moveNext()) {
        if (out.edgeLabelId == buyId) {
          val item = out.neighbor
          val ts1 = out.ts
          val c2 = in.seek(item)
          while (c2.moveNext()) {
            if (c2.edgeLabelId == buyId && c2.neighbor != v && seeds.get(c2.neighbor) &&
                (!window || math.abs(ts1 - c2.ts) < windowDays))
              cnt += 1
          }
        }
      }
      cnt
    }

    val cnt1 = coPurchases(account, window = true)
    var cnt2 = 0L
    // KNOWS is undirected: walk both orientations, dedup friends
    val seen = new java.util.BitSet()
    def friendPass(dir: Direction.Value): Unit = {
      val c = g.newCursor(dir).seek(account)
      while (c.moveNext()) {
        if (c.edgeLabelId == knowsId && !seen.get(c.neighbor)) {
          seen.set(c.neighbor)
          cnt2 += coPurchases(c.neighbor, window = false)
        }
      }
    }
    friendPass(Direction.Out)
    friendPass(Direction.In)

    Verdict(cnt1, cnt2, w1 * cnt1 + w2 * cnt2 > threshold)
  }

  /** Builds the seed bitset from external account ids. */
  def seedBitSet(g: GrinGraph, seedExtIds: Seq[Long]): java.util.BitSet = {
    val bs = new java.util.BitSet(g.vertexCount)
    seedExtIds.foreach { id =>
      val v = g.internalId(id)
      if (v >= 0) bs.set(v)
    }
    bs
  }
}
