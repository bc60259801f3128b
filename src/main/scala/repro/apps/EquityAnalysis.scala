package repro.apps

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Equity analysis (paper §8, Fig. 6b; Exp-6): find each company's real
  * controller — the shareholder whose *effective* (transitively multiplied)
  * share exceeds 51%.
  *
  * Two implementations, exactly as the paper contrasts them:
  *  - [[effectiveShares]]: the graph deployment — a modified label/weight
  *    propagation written against the DataFrame "GraphX API" path,
  *    aggregating per (person, company) every iteration, so intermediate
  *    size stays bounded by #pairs.
  *  - [[effectiveSharesSql]]: the SQL baseline — relational path
  *    enumeration via iterated self-joins with aggregation only at the end;
  *    path count multiplies per hop, which is why the production SQL
  *    baseline needed approximations and >1 h for a subset.
  */
object EquityAnalysis {

  /** Synthetic ownership DAG: persons own companies directly; companies own
    * lower-index companies, so cycles are impossible and depth is bounded.
    * Share weights per company sum to ~1. Person ids 1..nPersons; company
    * ids CompanyBase+0..nCompanies-1.
    */
  val CompanyBase: Long = 5000000000L

  def equityGraph(spark: SparkSession, nCompanies: Int, nPersons: Int,
                  seed: Long = 23): DataFrame = {
    import spark.implicits._
    spark.range(0, nCompanies.toLong).mapPartitions { it =>
      it.flatMap { c =>
        val rng = new java.util.Random(repro.util.Rng.mix(seed * 7919 + c))
        val nOwners = 2 + rng.nextInt(2)
        val cuts = Array.fill(nOwners)(0.2 + rng.nextDouble()).map(_.toDouble)
        val norm = cuts.sum
        (0 until nOwners).iterator.map { k =>
          // Companies with smaller index may own larger-index ones (DAG).
          // Corporate ownership is the common case (as in real registries),
          // which is what makes ownership *paths* multiply per hop while
          // (person, company) *pairs* stay bounded — the Exp-6 mechanism.
          val owner: Long =
            if (c > 20 && rng.nextDouble() < 0.72) CompanyBase + rng.nextInt(c.toInt)
            else rng.nextInt(nPersons).toLong + 1
          (owner, CompanyBase + c, cuts(k) / norm)
        }
      }
    }.toDF("owner", "company", "share")
  }

  private def isPerson(c: org.apache.spark.sql.Column) = c < CompanyBase

  /** Graph path: level-synchronous propagation that *aggregates each level
    * to (person, company) pairs* before the next hop — the "modified label
    * propagation" of §8. Intermediate size stays bounded by the number of
    * pairs, no matter how many ownership paths exist. Returns
    * (person, company, share).
    */
  def effectiveShares(spark: SparkSession, owns: DataFrame, maxDepth: Int = 12): DataFrame = {
    val o = owns.cache()
    val direct = o.filter(isPerson(col("owner")))
      .select(col("owner").as("person"), col("company"), col("share"))
    val corp = o.filter(!isPerson(col("owner")))
      .select(col("owner").as("mid"), col("company").as("c2"), col("share").as("s2"))

    var level = direct
    var acc = direct
    var depth = 0
    var levelCount = level.count()
    while (depth < maxDepth && levelCount > 0) {
      // one hop up the ownership chains, aggregated per (person, company)
      level = level.join(corp, col("company") === col("mid"))
        .select(col("person"), col("c2").as("company"), (col("share") * col("s2")).as("share"))
        .groupBy("person", "company").agg(sum("share").as("share"))
      level = level.localCheckpoint(true)
      levelCount = level.count()
      if (levelCount > 0) acc = acc.union(level)
      depth += 1
    }
    acc.groupBy("person", "company").agg(sum("share").as("share"))
  }

  /** SQL baseline: enumerate ownership paths (no intermediate aggregation),
    * sum products at the end. Semantically identical on DAGs up to
    * `maxDepth`, but intermediate cardinality is the number of *paths*.
    */
  def effectiveSharesSql(spark: SparkSession, owns: DataFrame, maxDepth: Int = 12): DataFrame = {
    owns.createOrReplaceTempView("owns")
    var paths = spark.sql(
      s"SELECT owner AS person, company, share FROM owns WHERE owner < $CompanyBase")
    var level = spark.sql(
      s"SELECT owner AS person, company, share FROM owns WHERE owner < $CompanyBase")
    var depth = 0
    var levelCount = level.count()
    while (depth < maxDepth && levelCount > 0) {
      level.createOrReplaceTempView("level")
      level = spark.sql(
        s"""SELECT l.person, o.company, l.share * o.share AS share
            FROM level l JOIN owns o ON l.company = o.owner""")
      level = level.localCheckpoint(true)
      levelCount = level.count()
      if (levelCount > 0) paths = paths.union(level)
      depth += 1
    }
    paths.groupBy("person", "company").agg(sum("share").as("share"))
  }

  /** Controllers: the shareholder holding > `cut` of a company. */
  def controllers(eff: DataFrame, cut: Double = 0.5): DataFrame =
    eff.filter(col("share") > cut)
      .select(col("company"), col("person").as("controller"), col("share"))
}
