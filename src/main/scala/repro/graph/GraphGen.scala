package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Synthetic graph generators standing in for the paper's Table 1 datasets.
  *
  * The billion-edge LDBC Graphalytics / SNAP / webgraph datasets cannot fit
  * this environment; we generate graphs with the same *degree shape* at
  * laptop scale (see DESIGN.md substitution 1):
  *  - `rmat`: power-law graphs — analogues of graph500-26, datagen-fb,
  *    twitter-2010, com-friendster.
  *  - `uniform`: near-uniform degree — analogue of datagen-zf.
  *  - `grid`-ish high-diameter graphs — analogue of uk-2005/webbase crawls
  *    (large diameter matters for BFS).
  *
  * All generators are deterministic in (params, seed): per-partition RNGs
  * are seeded with `seed * 7919 + partitionId`.
  */
object GraphGen {

  /** Recursive-matrix (R-MAT) generator: 2^scale vertices, m edges. */
  def rmat(spark: SparkSession, scale: Int, edges: Long,
           a: Double = 0.57, b: Double = 0.19, c: Double = 0.19,
           seed: Long = 42): DataFrame = {
    import spark.implicits._
    val sc = scale
    spark.range(edges).mapPartitions { it =>
      // Seed per element id, NOT per partition id: partition ids depend on
      // how the plan is evaluated (unions offset them, AQE renumbers them),
      // which would make the graph change between evaluations.
      it.map { idx =>
        val rng = new java.util.Random(repro.util.Rng.mix(seed * 7919 + idx))
        var srcV = 0L; var dstV = 0L
        var i = 0
        while (i < sc) {
          val r = rng.nextDouble()
          if (r < a) { /* top-left quadrant: no bits set */ }
          else if (r < a + b) { dstV |= 1L << i }
          else if (r < a + b + c) { srcV |= 1L << i }
          else { srcV |= 1L << i; dstV |= 1L << i }
          i += 1
        }
        (srcV, dstV)
      }
    }.toDF("src", "dst")
  }

  /** Uniform random graph: n vertices, m edges, near-uniform degrees. */
  def uniform(spark: SparkSession, n: Long, edges: Long, seed: Long = 43): DataFrame = {
    import spark.implicits._
    spark.range(edges).mapPartitions { it =>
      it.map { idx =>
        val rng = new java.util.Random(repro.util.Rng.mix(seed * 7919 + idx))
        (math.floorMod(rng.nextLong(), n), math.floorMod(rng.nextLong(), n))
      }
    }.toDF("src", "dst")
  }

  /** High-diameter "web-crawl" analogue: a torus grid plus a few shortcuts.
    * BFS on this graph needs many supersteps, like uk-2005/webbase.
    */
  def highDiameter(spark: SparkSession, side: Int, shortcutFrac: Double = 0.01,
                   seed: Long = 44): DataFrame = {
    import spark.implicits._
    val n = side.toLong * side
    spark.range(n).mapPartitions { it =>
      it.flatMap { v =>
        val rng = new java.util.Random(repro.util.Rng.mix(seed * 7919 + v))
        val row = v / side; val colI = v % side
        val right = row * side + (colI + 1) % side
        val down = ((row + 1) % side) * side + colI
        val base = Seq((v, right), (v, down))
        if (rng.nextDouble() < shortcutFrac) base :+ ((v, math.floorMod(rng.nextLong(), n)))
        else base
      }
    }.toDF("src", "dst")
  }

  /** Drops self-loops and duplicate edges — Graphalytics graphs are simple. */
  def simplify(edges: DataFrame): DataFrame =
    edges.filter("src <> dst").dropDuplicates("src", "dst")
}
