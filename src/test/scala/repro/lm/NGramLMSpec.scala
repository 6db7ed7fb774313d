package repro.lm

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestData}
import repro.core.Schema
import repro.corpus.TextGen

class NGramLMSpec extends SparkSpec with TestData {

  test("countTokens matches the tokenizer") {
    val df = docsDf("one two three", "four five")
    assert(NGramLM.countTokens(df) == 5L)
    assert(NGramLM.countTokens(df.limit(0)) == 0L)
  }

  test("trigram counts match a DuckDB oracle on a tiny corpus") {
    val df = docsDf("a b c a b c", "a b d")
    val m = NGramLM.train(df)
    // expected trigrams: (a,b,c)x2 (b,c,a) (c,a,b) (a,b,d)
    val spark2 = m.tri.select(col("w1"), col("w2"), col("w3"), col("cnt"))
    val session = spark
    import session.implicits._
    val grams = Seq(("a","b","c"),("b","c","a"),("c","a","b"),("a","b","c"),("a","b","d"))
      .toDF("w1","w2","w3")
    Oracle.assertEquivalent(
      spark2,
      "SELECT w1, w2, w3, COUNT(*) AS cnt FROM grams GROUP BY w1, w2, w3",
      "grams" -> grams)
  }

  test("sampleBudget keeps everything when under budget") {
    val df = docsDf("a b c", "d e")
    val (s, n) = NGramLM.sampleBudget(df, 100L, 1L)
    assert(s.count() == 2 && n == 5L)
  }

  test("sampleBudget downsamples to roughly the budget") {
    val df = docsDf((0 until 200).map(i => s"w$i x$i y$i z$i q$i"): _*) // 5 tokens each
    val (s, _) = NGramLM.sampleBudget(df, 250L, 1L)
    val kept = s.count()
    assert(kept > 20 && kept < 80, s"kept $kept docs for a 50-doc budget")
  }

  test("model predicts the high-probability grammar continuation") {
    val train = TextGen.docs(spark, Seq("clean" -> 1.0), 400, seed = 71L, docWords = 200)
    val m = NGramLM.train(train)
    val eval = TextGen.docs(spark, Seq("clean" -> 1.0), 60, seed = 72L, docWords = 150)
    val acc = NGramLM.accuracy(m, eval)
    assert(acc > 0.35, s"clean-on-clean accuracy $acc")
  }

  test("accuracy degrades when trained on gibberish") {
    val junk = TextGen.docs(spark, Seq("gibberish" -> 1.0), 400, seed = 73L, docWords = 200)
    val mJunk = NGramLM.train(junk)
    val eval = TextGen.docs(spark, Seq("clean" -> 1.0), 60, seed = 74L, docWords = 150)
    val clean = TextGen.docs(spark, Seq("clean" -> 1.0), 400, seed = 75L, docWords = 200)
    val mClean = NGramLM.train(clean)
    assert(NGramLM.accuracy(mClean, eval) > NGramLM.accuracy(mJunk, eval) + 0.2)
  }

  test("boilerplate-heavy training corrupts argmax vs deduplicated training") {
    val clean = TextGen.docs(spark, Seq("clean" -> 1.0), 300, seed = 76L, docWords = 200)
    val boiler = TextGen.docs(spark, Seq("boilerplate" -> 1.0), 900, seed = 77L)
    val corrupted = NGramLM.train(clean.unionByName(boiler.select(Schema.columns.map(col): _*)))
    val deduped = NGramLM.train(
      repro.core.Deduplicators.ExactDocDeduplicator()(
        repro.core.Formatters.mix(Seq(clean -> 1.0, boiler -> 1.0))))
    val eval = TextGen.docs(spark, Seq("clean" -> 1.0), 60, seed = 78L, docWords = 150)
    val accCorrupted = NGramLM.accuracy(corrupted, eval)
    val accDeduped = NGramLM.accuracy(deduped, eval)
    assert(accDeduped > accCorrupted, s"dedup $accDeduped vs corrupted $accCorrupted")
  }

  test("avgLogProb prefers grammar text over junk") {
    val m = NGramLM.train(TextGen.docs(spark, Seq("clean" -> 1.0), 300, seed = 79L, docWords = 200))
    val docs = docsDf(TextGen.cleanText(99L, 60), TextGen.gibberish(99L, 60))
    val lp = NGramLM.avgLogProb(m, docs).collect().map(r => r.getLong(0) -> r.getDouble(1)).toMap
    assert(lp(0L) > lp(1L), s"clean ${lp(0L)} vs junk ${lp(1L)}")
  }

  test("HELM-lite evaluates 16 named tasks with harder tasks scoring lower") {
    val m = NGramLM.train(TextGen.docs(spark, Seq("clean" -> 1.0), 400, seed = 80L, docWords = 200))
    val scores = HelmLite.evaluate(spark, m, nDocs = 10)
    assert(scores.size == 16)
    assert(scores.map(_._1) == HelmLite.tasks.map(_.name))
    val byName = scores.toMap
    // XSUM (75% token noise) must score well below IMDB (5% noise)
    assert(byName("XSUM") < byName("IMDB"))
    assert(HelmLite.averageScore(scores) > 0.0)
  }
}
