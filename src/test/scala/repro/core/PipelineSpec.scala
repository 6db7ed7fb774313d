package repro.core

import repro.{SparkSpec, TestData}

class PipelineSpec extends SparkSpec with TestData {

  test("pipeline chains mapper → filter → dedup and keeps the unified schema") {
    val df = docsDf(
      "  The   SAME document  ", "the same document", "tiny", "A different KEEPER document")
    val out = Pipeline(Seq(
      Mappers.LowercaseMapper(), Mappers.WhitespaceNormalizationMapper(),
      Filters.TextLengthFilter(minLen = 8), Deduplicators.ExactDocDeduplicator(),
    )).run(df)
    assert(out.columns.toSeq == Schema.columns)
    assert(texts(out.orderBy(Schema.Id)) == Seq("the same document", "a different keeper document"))
  }

  test("pipeline accepts non-unified input by unifying it first") {
    val session = spark
    import session.implicits._
    val raw = Seq("only a text column that is long enough").toDF(Schema.Text)
    assert(Pipeline(Seq(Filters.TextLengthFilter(minLen = 5))).run(raw).count() == 1)
  }

  test("an empty op list is the identity (modulo unification)") {
    val df = docsDf("a", "b")
    assert(texts(Pipeline(Nil).run(df).orderBy(Schema.Id)) == Seq("a", "b"))
  }

  test("stats accumulate across filters in one pipeline") {
    val df = docsDf("the quick brown fox jumps over whatever else is needed here")
    val out = Pipeline(Seq(Filters.TextLengthFilter(1), Filters.WordCountFilter(1))).run(df)
    val stats = out.select(Schema.Stats).collect()(0).getAs[Map[String, Double]](0)
    assert(stats.contains("text_len") && stats.contains("num_words"))
  }

  test("meta survives the whole pipeline") {
    val df = docsWithMeta(("a sufficiently long document", Map("source" -> "unit")))
    val out = Pipeline(Seq(Mappers.LowercaseMapper(), Filters.TextLengthFilter(5))).run(df)
    assert(out.select(Schema.Meta).collect()(0).getAs[Map[String, String]](0) == Map("source" -> "unit"))
  }

  test("pipeline ordering matters across mapper barriers") {
    // lowercase AFTER a case-sensitive-ish filter vs before: different results
    val df = docsDf("SHOUTING TEXT WITH MANY WORDS HERE OK")
    val filterThenMap = Pipeline(Seq(Filters.TextLengthFilter(5), Mappers.LowercaseMapper())).run(df)
    assert(texts(filterThenMap) == Seq("shouting text with many words here ok"))
  }
}
