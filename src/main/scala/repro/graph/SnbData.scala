package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** LDBC Social Network Benchmark "lite" generator.
  *
  * Stands in for the official SNB datagen (SNB-30/300/1000 in Table 1):
  * same schema shape — Person/Message(Post|Comment)/Tag vertices; KNOWS /
  * HAS_CREATOR / REPLY_OF / HAS_TAG / LIKES edges — with a power-law KNOWS
  * degree distribution and zipfian tag popularity, at a scale set by
  * `nPersons`. Interactive and BI benches run on this graph.
  *
  * Id spaces are disjoint so ids are globally unique:
  * persons [1, P], tags [TagBase, TagBase+nTags), messages [MsgBase, ...).
  */
object SnbData {
  val TagBase: Long = 1000000000L
  val MsgBase: Long = 2000000000L
  val MsgsPerPerson = 10
  val PostsPerPerson = 3 // message j of a person is a post if j < 3

  val Countries: Array[String] = Array(
    "China", "India", "Germany", "France", "Brazil", "Japan", "Italy", "Spain",
    "Mexico", "Egypt", "Canada", "Kenya", "Peru", "Chile", "Norway", "Sweden",
    "Poland", "Turkey", "Greece", "Austria", "Belgium", "Hungary", "Finland",
    "Ireland", "Portugal")
  val FirstNames: Array[String] = Array(
    "Jan", "Sam", "Ana", "Leo", "Mia", "Tom", "Eva", "Max", "Ida", "Ben",
    "Lea", "Kim", "Ali", "Joe", "Amy", "Tim", "Zoe", "Dan", "Lin", "Rob",
    "Sue", "Ray", "Fay", "Gus", "Ivy", "Ned", "Ola", "Pia", "Quin", "Rex")
  val LastNames: Array[String] = Array(
    "Smith", "Chen", "Kumar", "Garcia", "Mueller", "Rossi", "Sato", "Silva",
    "Novak", "Haddad", "Olsen", "Kowalski", "Papas", "Doyle", "Costa",
    "Weber", "Moreau", "Ekberg", "Toth", "Ozturk")

  private val DayMs = 86400000L
  private val Epoch2010 = 14610L * DayMs / DayMs // epoch days for 2010-01-01 ≈ 14610

  /** Generates the full SNB-lite property graph. */
  def generate(spark: SparkSession, nPersons: Int, seed: Long = 7,
               nTags: Int = 100, avgKnows: Int = 10, likesPerPerson: Int = 5): PropertyGraph = {
    import spark.implicits._
    val P = nPersons.toLong

    // ---- Person vertices ---------------------------------------------------
    val persons = spark.range(1, P + 1).mapPartitions { it =>
      it.map { id =>
        val rng = new java.util.Random(repro.util.Rng.mix(seed * 7919 + id))
        val country = Countries((id % Countries.length).toInt)
        val city = country + "-City-" + (id % 4)
        (id, "PERSON",
          FirstNames((rng.nextInt(FirstNames.length))),
          LastNames(rng.nextInt(LastNames.length)),
          10000L + rng.nextInt(12000), // birthday, epoch days
          country, city, null.asInstanceOf[String],
          Epoch2010 + rng.nextInt(1500), // creationDate, epoch days
          0L)
      }
    }.toDF("id", "label", "firstName", "lastName", "birthday", "country", "city",
           "name", "creationDate", "length")

    // ---- Tag vertices ------------------------------------------------------
    val tags = spark.range(0, nTags.toLong).map { i =>
      (TagBase + i, "TAG", null.asInstanceOf[String], null.asInstanceOf[String],
        0L, null.asInstanceOf[String], null.asInstanceOf[String],
        "tag" + i, 0L, 0L)
    }.toDF("id", "label", "firstName", "lastName", "birthday", "country", "city",
           "name", "creationDate", "length")

    // ---- Message vertices (posts + comments) -------------------------------
    val nMsgs = P * MsgsPerPerson
    val messages = spark.range(0, nMsgs).mapPartitions { it =>
      it.map { i =>
        val rng = new java.util.Random(repro.util.Rng.mix(seed * 6271 + i))
        val creator = i / MsgsPerPerson + 1
        val j = i % MsgsPerPerson
        val lbl = if (j < PostsPerPerson) "POST" else "COMMENT"
        val country = Countries((creator % Countries.length).toInt)
        (MsgBase + i, lbl, null.asInstanceOf[String], null.asInstanceOf[String],
          0L, country, null.asInstanceOf[String], null.asInstanceOf[String],
          Epoch2010 + 100 + (i % 1400), // creationDate grows with id
          (rng.nextInt(200) + 5).toLong)
      }
    }.toDF("id", "label", "firstName", "lastName", "birthday", "country", "city",
           "name", "creationDate", "length")

    // ---- KNOWS edges (power-law degrees) -----------------------------------
    val knows = spark.range(1, P + 1).mapPartitions { it =>
      it.flatMap { src =>
        val rng = new java.util.Random(repro.util.Rng.mix(seed * 104729 + src))
        // Pareto-ish degree: most persons have a few friends, some have many.
        val k = math.min(nPersons - 1,
          (avgKnows / 2 + avgKnows / (rng.nextDouble() * 4 + 0.12)).toInt)
        (0 until k).iterator.map { _ =>
          var dst = rng.nextInt(nPersons).toLong + 1
          if (dst == src) dst = src % P + 1
          (src, dst, "KNOWS", Epoch2010 + rng.nextInt(1500).toLong, 1.0)
        }
      }
    }.toDF("src", "dst", "label", "ts", "weight")
      .filter("src <> dst").dropDuplicates("src", "dst")

    // ---- HAS_CREATOR / REPLY_OF / HAS_TAG ----------------------------------
    val msgEdges = spark.range(0, nMsgs).mapPartitions { it =>
      it.flatMap { i =>
        val rng = new java.util.Random(repro.util.Rng.mix(seed * 15485863 + i))
        val id = MsgBase + i
        val creator = i / MsgsPerPerson + 1
        val created = Epoch2010 + 100 + (i % 1400)
        val base = Seq((id, creator, "HAS_CREATOR", created, 1.0))
        val reply = if (i % MsgsPerPerson >= PostsPerPerson && i > 0)
          Seq((id, MsgBase + rng.nextInt(i.toInt).toLong, "REPLY_OF", created, 1.0))
        else Seq.empty
        // Zipfian tag popularity: low tag indices are hot.
        val tagIdx = math.min(nTags - 1,
          (math.pow(rng.nextDouble(), 2.5) * nTags).toInt)
        val tag = Seq((id, TagBase + tagIdx, "HAS_TAG", created, 1.0))
        base ++ reply ++ tag
      }
    }.toDF("src", "dst", "label", "ts", "weight")

    // ---- LIKES edges --------------------------------------------------------
    val likes = spark.range(1, P + 1).mapPartitions { it =>
      it.flatMap { p =>
        val rng = new java.util.Random(repro.util.Rng.mix(seed * 24593 + p))
        (0 until likesPerPerson).iterator.map { _ =>
          (p, MsgBase + math.floorMod(rng.nextLong(), nMsgs),
            "LIKES", Epoch2010 + 200 + rng.nextInt(1300).toLong, 1.0)
        }
      }
    }.toDF("src", "dst", "label", "ts", "weight")

    PropertyGraph(
      persons.union(tags).union(messages),
      knows.union(msgEdges).union(likes))
  }

  /** Fraud-scenario graph (Fig. 6a): ACCOUNT/ITEM vertices, BUY and KNOWS
    * edges with timestamps. `ts` on BUY is the purchase epoch-day.
    */
  def fraudGraph(spark: SparkSession, nAccounts: Int, nItems: Int,
                 nOrders: Long, avgKnows: Int = 4, seed: Long = 11): PropertyGraph = {
    import spark.implicits._
    val accounts = spark.range(1, nAccounts.toLong + 1)
      .select(col("id"), lit("ACCOUNT").as("label"))
    val items = spark.range(TagBase, TagBase + nItems)
      .select(col("id"), lit("ITEM").as("label"))
    val buys = spark.range(nOrders).mapPartitions { it =>
      it.map { idx =>
        val rng = new java.util.Random(repro.util.Rng.mix(seed * 7919 + idx))
        // Zipf-ish item popularity so co-purchase neighborhoods are non-trivial.
        val item = TagBase + math.min(nItems - 1, (math.pow(rng.nextDouble(), 2.0) * nItems).toInt)
        (rng.nextInt(nAccounts).toLong + 1, item, "BUY", 18000L + rng.nextInt(400).toLong, 1.0)
      }
    }.toDF("src", "dst", "label", "ts", "weight")
    val knows = spark.range(1, nAccounts.toLong + 1).mapPartitions { it =>
      it.flatMap { src =>
        val rng = new java.util.Random(repro.util.Rng.mix(seed * 104729 + src))
        (0 until avgKnows).iterator.map { _ =>
          (src, rng.nextInt(nAccounts).toLong + 1, "KNOWS", 18000L, 1.0)
        }
      }
    }.toDF("src", "dst", "label", "ts", "weight").filter("src <> dst")
    PropertyGraph(accounts.union(items), buys.union(knows))
  }
}
