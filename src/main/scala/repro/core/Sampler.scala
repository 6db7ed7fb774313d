package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Enhanced samplers for LLM data (paper Sec. 6.2): stratified extraction
  * over meta/stats fields, plus a diversity-aware quality sampler that
  * allocates the budget across linguistic-signature strata — the sampler the
  * post-tuning experiments credit for beating random sampling (Table 3).
  */
object Sampler {

  /** Stratified sampling by a meta field: per-stratum fractions, seeded. */
  def stratifiedByMeta(df: DataFrame, key: String, fractions: Map[String, Double], seed: Long): DataFrame = {
    val withStratum = df.withColumn("__stratum", col(Schema.Meta).getItem(key))
    withStratum.stat.sampleBy("__stratum", fractions, seed).drop("__stratum")
  }

  /** Top-n samples by a stats key (quality score, negated perplexity, …). */
  def topByStat(df: DataFrame, statKey: String, n: Int, ascending: Boolean = false): DataFrame = {
    val v = col(Schema.Stats).getItem(statKey)
    df.orderBy(if (ascending) v.asc_nulls_last else v.desc_nulls_last, col(Schema.Id)).limit(n)
  }

  /** Diversity-aware quality sampling: bucket samples by a linguistic
    * signature (leading content-word bigram — the verb–noun proxy), rank
    * within each bucket by the quality stat, then take rounds across buckets
    * (rank-1 of every bucket first, then rank-2, …) until `n` samples are
    * drawn. High quality AND high expression diversity, unlike a pure top-n.
    */
  def diversitySample(df: DataFrame, qualityKey: String, n: Int, nBuckets: Int = 64): DataFrame = {
    val sig = udf { (t: String) =>
      val content = Tokenizers.words(t).filterNot(WordLists.stopwords.contains)
      val key = content.take(2).mkString(" ")
      math.floorMod(scala.util.hashing.MurmurHash3.stringHash(key), nBuckets)
    }
    val q = coalesce(col(Schema.Stats).getItem(qualityKey), lit(Double.MinValue))
    val w = Window.partitionBy("__bucket").orderBy(q.desc, col(Schema.Id))
    df.withColumn("__bucket", sig(col(Schema.Text)))
      .withColumn("__rank", row_number().over(w))
      .orderBy(col("__rank"), q.desc, col(Schema.Id))
      .limit(n)
      .drop("__bucket", "__rank")
  }

  /** Random sample of exactly `n` rows, seeded (the Table 3 baseline). */
  def randomSample(df: DataFrame, n: Int, seed: Long): DataFrame =
    df.orderBy(xxhash64(col(Schema.Id), lit(seed))).limit(n)
}
