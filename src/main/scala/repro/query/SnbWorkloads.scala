package repro.query

/** SNB-lite workload definitions (DESIGN.md substitution 6).
  *
  * The official LDBC SNB Interactive workload has 14 complex, 7 short and
  * 8 update operations; SNB-BI has 20 queries. We keep a reduced but
  * representative suite over the [[repro.graph.SnbData]] schema: 6 complex
  * (IC*), 4 short (IS*), 3 update (IU*) interactive operations, and 6 BI
  * queries. All parameterized the LDBC way (`$id`, `$name`, ...).
  */
object SnbWorkloads {

  /** Complex interactive reads (the IC class of Fig. 7f). */
  val complex: Vector[(String, String)] = Vector(
    "IC1" ->
      """MATCH (p:PERSON {id: $id})-[:KNOWS]-(f:PERSON)
         WHERE f.firstName = $name
         RETURN f.id AS id, f.lastName AS lastName ORDER BY id LIMIT 20""",
    "IC2" ->
      """MATCH (p:PERSON {id: $id})-[:KNOWS]-(f:PERSON)<-[:HAS_CREATOR]-(m)
         WHERE m.creationDate <= $maxDate
         RETURN f.id AS fid, m.id AS mid, m.creationDate AS date
         ORDER BY date DESC, mid ASC LIMIT 20""",
    "IC3" ->
      """MATCH (p:PERSON {id: $id})-[:KNOWS]-(f:PERSON)
         WHERE f.country = $country
         RETURN count(*) AS cnt""",
    "IC5" ->
      """MATCH (p:PERSON {id: $id})-[:KNOWS]-(f:PERSON)<-[:HAS_CREATOR]-(m)
         RETURN f.id AS fid, count(m) AS cnt ORDER BY cnt DESC, fid ASC LIMIT 20""",
    "IC6" ->
      """MATCH (p:PERSON {id: $id})-[:KNOWS]-(f:PERSON)<-[:HAS_CREATOR]-(m)-[:HAS_TAG]->(t:TAG)
         RETURN t.name AS name, count(*) AS cnt ORDER BY cnt DESC, name ASC LIMIT 10""",
    "IC9" ->
      """MATCH (p:PERSON {id: $id})-[:KNOWS]-(f:PERSON)-[:KNOWS]-(ff:PERSON)<-[:HAS_CREATOR]-(m)
         WHERE m.creationDate <= $maxDate
         RETURN ff.id AS fid, m.id AS mid, m.creationDate AS date
         ORDER BY date DESC, mid ASC LIMIT 20""",
  )

  /** Short interactive reads (the IS class). */
  val short: Vector[(String, String)] = Vector(
    "IS1" ->
      """MATCH (p:PERSON {id: $id})
         RETURN p.firstName AS firstName, p.lastName AS lastName, p.country AS country""",
    "IS2" ->
      """MATCH (p:PERSON {id: $id})<-[:HAS_CREATOR]-(m)
         RETURN m.id AS id, m.creationDate AS date ORDER BY date DESC, id ASC LIMIT 10""",
    "IS3" ->
      """MATCH (p:PERSON {id: $id})-[:KNOWS]-(f:PERSON)
         RETURN f.id AS id ORDER BY id""",
    "IS4" ->
      """MATCH (m {id: $mid}) RETURN m.length AS length, m.creationDate AS date""",
  )

  /** BI reads (the SNB-BI class of Fig. 7g), executed on Gaia. Each comes
    * with the TigerGraph-sim comparator: the same logical query as plain
    * Spark SQL over the vertex/edge tables in *textual* join order (Spark
    * does not reorder joins without CBO stats), i.e. a relational engine
    * without graph-aware optimization.
    */
  val bi: Vector[(String, String, String)] = Vector(
    ("BI1",
      """MATCH (m:POST) RETURN m.country AS country, count(*) AS cnt, avg(m.length) AS avgLen
         ORDER BY cnt DESC, country ASC""",
      """SELECT v.country AS country, count(*) AS cnt, avg(v.length) AS avgLen
         FROM vertices v WHERE v.label = 'POST'
         GROUP BY v.country ORDER BY cnt DESC, country ASC"""),
    ("BI2",
      """MATCH (m)-[:HAS_TAG]->(t:TAG)
         RETURN t.name AS tag, count(*) AS cnt ORDER BY cnt DESC, tag ASC LIMIT 20""",
      """SELECT t.name AS tag, count(*) AS cnt
         FROM vertices m JOIN edges e ON m.id = e.src JOIN vertices t ON e.dst = t.id
         WHERE e.label = 'HAS_TAG' AND t.label = 'TAG'
         GROUP BY t.name ORDER BY cnt DESC, tag ASC LIMIT 20"""),
    ("BI3",
      """MATCH (p:PERSON)<-[:HAS_CREATOR]-(m:POST)
         RETURN p.country AS country, count(*) AS cnt ORDER BY cnt DESC, country ASC""",
      """SELECT p.country AS country, count(*) AS cnt
         FROM vertices m JOIN edges e ON m.id = e.src JOIN vertices p ON e.dst = p.id
         WHERE e.label = 'HAS_CREATOR' AND m.label = 'POST' AND p.label = 'PERSON'
         GROUP BY p.country ORDER BY cnt DESC, country ASC"""),
    ("BI4",
      """MATCH (p:PERSON)-[:KNOWS]-(f:PERSON)<-[:HAS_CREATOR]-(m:COMMENT)-[:HAS_TAG]->(t:TAG)
         WHERE p.country = $country
         RETURN t.name AS tag, count(*) AS cnt ORDER BY cnt DESC, tag ASC LIMIT 10""",
      """SELECT t.name AS tag, count(*) AS cnt
         FROM (SELECT src, dst FROM edges WHERE label = 'KNOWS'
               UNION ALL
               SELECT dst AS src, src AS dst FROM edges WHERE label = 'KNOWS') k
           JOIN vertices p ON k.src = p.id
           JOIN vertices f ON k.dst = f.id
           JOIN edges hc ON hc.dst = f.id
           JOIN vertices m ON hc.src = m.id
           JOIN edges ht ON ht.src = m.id
           JOIN vertices t ON ht.dst = t.id
         WHERE p.label = 'PERSON' AND f.label = 'PERSON'
           AND hc.label = 'HAS_CREATOR' AND m.label = 'COMMENT'
           AND ht.label = 'HAS_TAG' AND t.label = 'TAG' AND p.country = '__COUNTRY__'
         GROUP BY t.name ORDER BY cnt DESC, tag ASC LIMIT 10"""),
    ("BI5",
      """MATCH (p:PERSON)-[:LIKES]->(m:POST)
         RETURN p.id AS id, count(*) AS cnt ORDER BY cnt DESC, id ASC LIMIT 100""",
      """SELECT p.id AS id, count(*) AS cnt
         FROM vertices p JOIN edges e ON p.id = e.src JOIN vertices m ON e.dst = m.id
         WHERE e.label = 'LIKES' AND p.label = 'PERSON' AND m.label = 'POST'
         GROUP BY p.id ORDER BY cnt DESC, id ASC LIMIT 100"""),
    ("BI6",
      """MATCH (c:COMMENT)-[:REPLY_OF]->(m:POST)-[:HAS_CREATOR]->(p:PERSON)
         RETURN p.country AS country, count(*) AS cnt ORDER BY cnt DESC, country ASC""",
      """SELECT p.country AS country, count(*) AS cnt
         FROM vertices c JOIN edges r ON c.id = r.src JOIN vertices m ON r.dst = m.id
           JOIN edges hc ON hc.src = m.id JOIN vertices p ON hc.dst = p.id
         WHERE c.label = 'COMMENT' AND r.label = 'REPLY_OF' AND m.label = 'POST'
           AND hc.label = 'HAS_CREATOR' AND p.label = 'PERSON'
         GROUP BY p.country ORDER BY cnt DESC, country ASC"""),
  )

  /** Optimization-study query sets (Exp-2a; the paper's Q1/Q2/Q3 from [24]).
    * Q1 exercises EdgeVertexFusion, Q2 FilterPushIntoMatch, Q3 CBO.
    */
  val q1Fusion: Vector[(String, String)] = Vector(
    "Q1a" -> "g.V($id).out('KNOWS').out('KNOWS').count()",
    "Q1b" -> "g.V($id).out('KNOWS').out('KNOWS').out('KNOWS').count()",
    "Q1c" -> "g.V($id).out('KNOWS').in('HAS_CREATOR').count()",
    "Q1d" -> "g.V($id).out('KNOWS').in('HAS_CREATOR').out('HAS_TAG').count()",
  )

  val q2FilterPush: Vector[(String, String)] = Vector(
    "Q2a" -> """MATCH (p:PERSON)-[:KNOWS]-(f:PERSON) WHERE p.id = $id RETURN count(*) AS cnt""",
    "Q2b" -> """MATCH (p:PERSON)<-[:HAS_CREATOR]-(m) WHERE p.id = $id RETURN count(*) AS cnt""",
    "Q2c" -> """MATCH (p:PERSON)-[:LIKES]->(m:POST) WHERE p.id = $id RETURN count(*) AS cnt""",
    "Q2d" -> """MATCH (p:PERSON)-[:KNOWS]-(f:PERSON)<-[:HAS_CREATOR]-(m)
                WHERE p.id = $id RETURN count(*) AS cnt""",
  )

  val q3Cbo: Vector[(String, String)] = Vector(
    "Q3a" -> """MATCH (m)-[:HAS_TAG]->(t:TAG {name: $tag}), (m)-[:HAS_CREATOR]->(p:PERSON)
                RETURN count(*) AS cnt""",
    "Q3b" -> """MATCH (m)-[:HAS_TAG]->(t:TAG {name: $tag}), (m)-[:HAS_CREATOR]->(p:PERSON)
                WHERE p.country = $country RETURN count(*) AS cnt""",
    "Q3c" -> """MATCH (m:COMMENT)-[:REPLY_OF]->(m2:POST), (m2)-[:HAS_TAG]->(t:TAG {name: $tag})
                RETURN count(*) AS cnt""",
    "Q3d" -> """MATCH (p:PERSON)-[:LIKES]->(m:POST)-[:HAS_TAG]->(t:TAG {name: $tag})
                RETURN count(*) AS cnt""",
  )
}
