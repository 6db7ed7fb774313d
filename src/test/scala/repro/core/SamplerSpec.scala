package repro.core

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestData}

class SamplerSpec extends SparkSpec with TestData {

  private def withQuality(df: org.apache.spark.sql.DataFrame, scores: Seq[Double]) = {
    val session = spark
    import session.implicits._
    val sdf = scores.zipWithIndex.map { case (s, i) => (i.toLong, s) }.toDF(Schema.Id, "__q")
    df.join(sdf, Schema.Id)
      .withColumn(Schema.Stats, map_concat(col(Schema.Stats), map(lit("doc_score"), col("__q"))))
      .drop("__q")
  }

  test("stratified sampling by meta respects per-stratum fractions") {
    val rows = (0 until 300).map(i => (s"doc $i", Map("language" -> (if (i % 3 == 0) "EN" else "ZH"))))
    val df = docsWithMeta(rows: _*)
    val out = Sampler.stratifiedByMeta(df, "language", Map("EN" -> 1.0, "ZH" -> 0.0), seed = 5L)
    val langs = out.select(col(Schema.Meta).getItem("language")).distinct().collect().map(_.getString(0))
    assert(langs.toSeq == Seq("EN"))
    assert(out.count() == 100)
  }

  test("topByStat returns the n best by the stat") {
    val df = withQuality(docsDf("a", "b", "c", "d"), Seq(0.1, 0.9, 0.5, 0.7))
    assert(texts(Sampler.topByStat(df, "doc_score", 2).orderBy(Schema.Id)) == Seq("b", "d"))
  }

  test("topByStat ascending picks the lowest") {
    val df = withQuality(docsDf("a", "b", "c"), Seq(0.9, 0.1, 0.5))
    assert(texts(Sampler.topByStat(df, "doc_score", 1, ascending = true)) == Seq("b"))
  }

  test("diversity sample spreads across signatures instead of pure top-n") {
    // Bucket A: many high-quality near-identical openings; bucket B: one lower-quality distinct opening.
    val dupes = (0 until 10).map(_ => "alpha beta something unique here")
    val rare  = Seq("gamma delta a rare expression style")
    val df = withQuality(docsDf(dupes ++ rare: _*), (0 until 10).map(_ => 0.9) :+ 0.5)
    val picked = texts(Sampler.diversitySample(df, "doc_score", 2))
    assert(picked.exists(_.startsWith("gamma delta")), s"diversity pick missing: $picked")
    val topOnly = texts(Sampler.topByStat(df, "doc_score", 2))
    assert(!topOnly.exists(_.startsWith("gamma delta"))) // the contrast
  }

  test("random sample is seeded-deterministic and exact-sized") {
    val df = docsDf((0 until 50).map(i => s"doc $i"): _*)
    val a = texts(Sampler.randomSample(df, 10, 7L).orderBy(Schema.Id))
    val b = texts(Sampler.randomSample(df, 10, 7L).orderBy(Schema.Id))
    assert(a == b && a.size == 10)
    val c = texts(Sampler.randomSample(df, 10, 8L).orderBy(Schema.Id))
    assert(a != c)
  }
}
