package repro.apps

import java.sql.{Connection, DriverManager}
import repro.grin.{Direction, GrinGraph}

/** Cybersecurity monitoring (paper §8; Exp-8): Trojan detection is a two-hop
  * traversal from seed hosts. "Since the Trojan detection queries are
  * two-hop graph traversals, they avoid the costly join operations required
  * in SQL queries" — the 2,400× claim.
  *
  *  - [[twoHopCount]]: the Gremlin path (`g.V(seed).out('CONN').out('CONN')
  *    .count()`), compiled onto HiActor/GRIN — two adjacency walks.
  *  - [[SqlBaseline]]: the same query as a relational double self-join on a
  *    real SQL engine (DuckDB), one statement per seed, as the previous
  *    production solution ran it.
  */
object Cybersecurity {

  /** Two-hop out-neighbor row count from `seed` (counts paths, matching the
    * SQL JOIN semantics).
    */
  def twoHopCount(g: GrinGraph, seed: Int): Long = {
    var cnt = 0L
    val c1 = g.newCursor(Direction.Out).seek(seed)
    val c2 = g.newCursor(Direction.Out)
    while (c1.moveNext()) {
      val m = c2.seek(c1.neighbor)
      while (m.moveNext()) cnt += 1
    }
    cnt
  }

  /** DuckDB-backed SQL comparator: loads the edge table once, then answers
    * each seed with `SELECT count(*) FROM e e1 JOIN e e2 ON e1.dst = e2.src
    * WHERE e1.src = ?`.
    */
  final class SqlBaseline(edges: Array[(Long, Long)]) extends AutoCloseable {
    Class.forName("org.duckdb.DuckDBDriver")
    private val conn: Connection = DriverManager.getConnection("jdbc:duckdb:")
    locally {
      val st = conn.createStatement()
      st.execute("CREATE TABLE e (src BIGINT, dst BIGINT)")
      st.close()
      val ps = conn.prepareStatement("INSERT INTO e VALUES (?, ?)")
      var i = 0
      edges.foreach { case (s, d) =>
        ps.setLong(1, s); ps.setLong(2, d); ps.addBatch()
        i += 1
        if (i % 10000 == 0) ps.executeBatch()
      }
      ps.executeBatch(); ps.close()
    }

    private val q = conn.prepareStatement(
      "SELECT count(*) FROM e e1 JOIN e e2 ON e1.dst = e2.src WHERE e1.src = ?")

    def twoHopCount(seed: Long): Long = {
      q.setLong(1, seed)
      val rs = q.executeQuery()
      rs.next()
      val c = rs.getLong(1)
      rs.close()
      c
    }

    def close(): Unit = conn.close()
  }
}
