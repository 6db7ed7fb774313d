package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import scala.util.hashing.MurmurHash3

/** Hashing helpers for fingerprint-based deduplication. */
object Hashing {
  /** 64-bit string hash from two seeded 32-bit murmur hashes. */
  def h64(s: String, seed: Int = 0): Long = {
    val a = MurmurHash3.stringHash(s, seed)
    val b = MurmurHash3.stringHash(s, seed ^ 0x5bd1e995)
    (a.toLong << 32) | (b.toLong & 0xffffffffL)
  }

  /** Normalized content hash used for exact deduplication: lowercased,
    * whitespace-collapsed — near-identical copies with trivial spacing
    * differences collapse to one fingerprint.
    */
  def contentHash(text: String): Long =
    h64(if (text == null) "" else text.toLowerCase.replaceAll("\\s+", " ").trim)

  /** MinHash signature over word-shingle 64-bit hashes.
    * perm_i(h) = a_i*h + b_i (odd a_i, wraparound multiply is a fine 2^64 hash
    * family for LSH purposes); signature_i = min over shingles.
    */
  def minhash(tokens: Array[String], numPerm: Int, shingle: Int, seed: Int): Array[Long] = {
    val shingles: Array[Long] =
      if (tokens.length < shingle) Array(h64(tokens.mkString(" "), seed))
      else Array.tabulate(tokens.length - shingle + 1) { i =>
        h64(tokens.slice(i, i + shingle).mkString(" "), seed)
      }
    val rnd = new java.util.Random(seed)
    val out = new Array[Long](numPerm)
    var p = 0
    while (p < numPerm) {
      val a = rnd.nextLong() | 1L
      val b = rnd.nextLong()
      var m = Long.MaxValue
      var i = 0
      while (i < shingles.length) {
        val v = a * shingles(i) + b
        if (v < m) m = v
        i += 1
      }
      out(p) = m
      p += 1
    }
    out
  }

  /** 64-bit SimHash over word counts. */
  def simhash(tokens: Array[String]): Long = {
    val acc = new Array[Int](64)
    val counts = tokens.groupBy(identity).view.mapValues(_.length)
    counts.foreach { case (w, c) =>
      val h = h64(w)
      var b = 0
      while (b < 64) {
        if (((h >>> b) & 1L) == 1L) acc(b) += c else acc(b) -= c
        b += 1
      }
    }
    var sig = 0L
    var b = 0
    while (b < 64) { if (acc(b) > 0) sig |= (1L << b); b += 1 }
    sig
  }

  def hamming(a: Long, b: Long): Int = java.lang.Long.bitCount(a ^ b)
}

/** Distributed connected components over an undirected edge list, via
  * iterative min-label propagation (the standard bounded-diameter dataflow
  * formulation). Used to turn LSH candidate pairs into duplicate clusters.
  */
object ConnectedComponents {
  /** @param edges (src: Long, dst: Long) undirected
    * @return (id, comp) — comp is the minimum id reachable from `id`
    */
  def run(spark: SparkSession, edges: DataFrame, maxIter: Int = 25): DataFrame = {
    val e = edges.select(col("src").cast("long"), col("dst").cast("long"))
      .filter(col("src") =!= col("dst"))
      .select(least(col("src"), col("dst")) as "src", greatest(col("src"), col("dst")) as "dst")
      .distinct()
      .localCheckpoint(true)
    var labels = e.select(col("src") as "id").union(e.select(col("dst") as "id"))
      .distinct().withColumn("comp", col("id"))
      .localCheckpoint(true)
    var converged = false
    var iter = 0
    while (!converged && iter < maxIter) {
      // Candidate labels flowing across each edge, both directions.
      val bySrc = e.join(labels.withColumnRenamed("id", "src"), "src")
        .select(col("dst") as "id", col("comp"))
      val byDst = e.join(labels.withColumnRenamed("id", "dst"), "dst")
        .select(col("src") as "id", col("comp"))
      val next = labels.select(col("id"), col("comp"))
        .union(bySrc).union(byDst)
        .groupBy("id").agg(min("comp") as "comp")
        .localCheckpoint(true)
      val changed = next.join(labels.withColumnRenamed("comp", "prev"), "id")
        .filter(col("comp") =!= col("prev")).limit(1).count()
      labels = next
      converged = changed == 0
      iter += 1
    }
    labels
  }

  /** Keep one row per duplicate cluster: components from `edges` lose all but
    * their minimum-id member; rows not in any edge survive untouched.
    */
  def keepClusterHeads(df: DataFrame, edges: DataFrame): DataFrame = {
    val spark = df.sparkSession
    val comp = run(spark, edges)
    val losers = comp.filter(col("comp") =!= col("id")).select(col("id"))
    df.join(losers, Seq(Schema.Id), "left_anti")
  }
}

/** The Deduplicator pool: dataset-level duplication removal (paper Table 1,
  * "hash-based and vector-based deduplication methods").
  */
object Deduplicators {

  /** Exact document deduplication on a normalized content hash; keeps the
    * smallest-id member of each hash group (deterministic).
    */
  final case class ExactDocDeduplicator() extends Deduplicator {
    val name = "exact_doc_deduplicator"
    def computeHash(df: DataFrame): DataFrame = {
      val f = udf((t: String) => Hashing.contentHash(t))
      df.withColumn(HashCol, f(col(Schema.Text)))
    }
    def process(df: DataFrame): DataFrame = OpUtil.keepFirstBy(df, HashCol)
  }

  /** Dataset-level paragraph deduplication: a paragraph that occurs in many
    * documents is kept only at its first occurrence (smallest (id, offset));
    * documents are reassembled without their removed paragraphs, and samples
    * left empty are dropped. This is the cross-document boilerplate killer.
    */
  final case class ParagraphDeduplicator() extends Deduplicator {
    val name = "paragraph_deduplicator"
    def computeHash(df: DataFrame): DataFrame = df
    def process(df: DataFrame): DataFrame = {
      val split = udf((t: String) => new TextContext(if (t == null) "" else t).paragraphs)
      val ph    = udf((p: String) => Hashing.contentHash(p))
      val exploded = df
        .select(col(Schema.Id), posexplode(split(col(Schema.Text))))
        .toDF(Schema.Id, "__idx", "__para")
        .withColumn("__ph", ph(col("__para")))
      val w = Window.partitionBy(col("__ph")).orderBy(col(Schema.Id), col("__idx"))
      val kept = exploded.withColumn("__rn", row_number().over(w)).filter(col("__rn") === 1)
      val reassembled = kept
        .groupBy(Schema.Id)
        .agg(concat_ws("\n\n", array_sort(collect_list(struct(col("__idx"), col("__para"))))
          .getField("__para")) as "__text")
        .filter(length(col("__text")) > 0)
      df.drop(Schema.Text)
        .join(reassembled, Schema.Id)
        .withColumnRenamed("__text", Schema.Text)
    }
  }

  /** Near-duplicate removal via MinHash-LSH over word shingles: signatures →
    * band buckets → candidate pairs → signature-estimated Jaccard check →
    * connected components → keep cluster heads.
    *
    * Defaults (128 perms, 16 bands × 8 rows) put the S-curve threshold near
    * Jaccard ≈ 0.7, matching common LLM-corpus dedup settings.
    */
  final case class MinHashDeduplicator(
      numPerm: Int = 128,
      bands: Int = 16,
      shingle: Int = 3,
      jaccard: Double = 0.7,
      seed: Int = 42,
      maxBucket: Int = 1000,
  ) extends Deduplicator {
    val name = "minhash_deduplicator"
    require(numPerm % bands == 0, "numPerm must be divisible by bands")
    private val rows = numPerm / bands

    def computeHash(df: DataFrame): DataFrame = {
      val f = udf((t: String) => Hashing.minhash(Tokenizers.words(t), numPerm, shingle, seed))
      df.withColumn(HashCol, f(col(Schema.Text)))
    }

    def process(df: DataFrame): DataFrame = {
      val sigs = df.select(col(Schema.Id), col(HashCol) as "sig").localCheckpoint(true)
      val bandKey = udf { (sig: Seq[Long], band: Int) =>
        MurmurHash3.arrayHash(sig.slice(band * rows, (band + 1) * rows).toArray, seed)
      }
      val buckets = sigs
        .withColumn("band", explode(lit((0 until bands).toArray)))
        .withColumn("bkey", bandKey(col("sig"), col("band")))
        .groupBy("band", "bkey").agg(sort_array(collect_list(col(Schema.Id))) as "ids")
        .filter(size(col("ids")).between(2, maxBucket))
      // Star edges to the bucket minimum keep pair count linear in bucket size.
      val candidates = buckets
        .select(col("ids")(0) as "src", explode(slice(col("ids"), 2, maxBucket)) as "dst")
        .distinct()
      val estJaccard = udf { (a: Seq[Long], b: Seq[Long]) =>
        a.iterator.zip(b.iterator).count { case (x, y) => x == y }.toDouble / a.size
      }
      val verified = candidates
        .join(sigs.withColumnRenamed(Schema.Id, "src").withColumnRenamed("sig", "sigA"), "src")
        .join(sigs.withColumnRenamed(Schema.Id, "dst").withColumnRenamed("sig", "sigB"), "dst")
        .filter(estJaccard(col("sigA"), col("sigB")) >= jaccard)
        .select("src", "dst")
      ConnectedComponents.keepClusterHeads(df.drop(HashCol), verified)
    }
  }

  /** Near-duplicate removal via 64-bit SimHash: block decomposition (4×16
    * bits) yields candidates, exact Hamming distance verifies, connected
    * components cluster — the "vector-based" method of Table 1.
    */
  final case class SimHashDeduplicator(hammingMax: Int = 3, maxBucket: Int = 1000) extends Deduplicator {
    val name = "simhash_deduplicator"
    private val BlockBits = 16
    private val Blocks = 4

    def computeHash(df: DataFrame): DataFrame = {
      val f = udf((t: String) => Hashing.simhash(Tokenizers.words(t)))
      df.withColumn(HashCol, f(col(Schema.Text)))
    }

    def process(df: DataFrame): DataFrame = {
      val sigs = df.select(col(Schema.Id), col(HashCol) as "sig").localCheckpoint(true)
      val blockOf = udf { (sig: Long, block: Int) => (sig >>> (block * BlockBits)) & 0xffffL }
      val buckets = sigs
        .withColumn("block", explode(lit((0 until Blocks).toArray)))
        .withColumn("bkey", blockOf(col("sig"), col("block")))
        .groupBy("block", "bkey").agg(sort_array(collect_list(col(Schema.Id))) as "ids")
        .filter(size(col("ids")).between(2, maxBucket))
      val candidates = buckets
        .select(col("ids")(0) as "src", explode(slice(col("ids"), 2, maxBucket)) as "dst")
        .distinct()
      val ham = udf((a: Long, b: Long) => Hashing.hamming(a, b))
      val verified = candidates
        .join(sigs.withColumnRenamed(Schema.Id, "src").withColumnRenamed("sig", "sigA"), "src")
        .join(sigs.withColumnRenamed(Schema.Id, "dst").withColumnRenamed("sig", "sigB"), "dst")
        .filter(ham(col("sigA"), col("sigB")) <= hammingMax)
        .select("src", "dst")
      ConnectedComponents.keepClusterHeads(df.drop(HashCol), verified)
    }
  }

  /** All built-in deduplicators with default parameters. */
  def all: Seq[Deduplicator] = Seq(
    ExactDocDeduplicator(), ParagraphDeduplicator(), MinHashDeduplicator(), SimHashDeduplicator(),
  )
}
