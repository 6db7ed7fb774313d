package repro.corpus

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestData}
import repro.core.{Filters, Schema, TextContext, Tokenizers, WordLists}

class TextGenSpec extends SparkSpec with TestData {

  test("clean text is deterministic in seed") {
    assert(TextGen.cleanText(1L, 100) == TextGen.cleanText(1L, 100))
    assert(TextGen.cleanText(1L, 100) != TextGen.cleanText(2L, 100))
  }

  test("clean text has the statistical signature of prose") {
    val ctx = new TextContext(TextGen.cleanText(7L, 300))
    val stop = Filters.StopwordRatioFilter().computeStatsRow(ctx)("stopword_ratio")
    assert(stop > 0.15 && stop < 0.7, s"stopword ratio $stop")
    val rep = Filters.WordRepetitionFilter().computeStatsRow(ctx)("word_rep_ratio")
    assert(rep < 0.2, s"rep $rep")
  }

  test("grammar candidates are fixed per state and shared across draws") {
    val c1 = TextGen.candidates("abc", "def")
    val c2 = TextGen.candidates("abc", "def")
    assert(c1.toSeq == c2.toSeq && c1.length == 3)
  }

  test("boilerplate has only nTemplates distinct variants") {
    val all = (0 until 50).map(TextGen.boilerplate(_))
    assert(all.distinct.size == 10)
  }

  test("boilerplate takes the grammar's low-probability branch") {
    // Its continuations are candidate index 2 of the clean grammar.
    val text = TextGen.boilerplate(0)
    val toks = Tokenizers.words(text).drop(8) // skip the chrome line
    val checks = toks.sliding(3).take(40).count { w =>
      TextGen.candidates(w(0), w(1))(2) == w(2)
    }
    assert(checks > 20, s"only $checks low-prob steps matched")
  }

  test("gibberish has near-zero stopword ratio") {
    val ctx = new TextContext(TextGen.gibberish(3L, 200))
    val stop = Filters.StopwordRatioFilter().computeStatsRow(ctx)("stopword_ratio")
    assert(stop < 0.02)
  }

  test("flagged text trips the flagged-words filter") {
    val ctx = new TextContext(TextGen.flaggedText(3L, 300))
    val ratio = Filters.FlaggedWordsFilter().computeStatsRow(ctx)("flagged_ratio")
    assert(ratio > 0.02, s"flagged ratio $ratio")
  }

  test("html-wrapped text contains tags/links that mappers can strip") {
    val t = TextGen.htmlWrapped(5L, 150)
    assert(t.contains("<div") && t.contains("http://"))
    val cleaned = repro.core.Mappers.RemoveLinksMapper().mapText(
      repro.core.Mappers.RemoveHtmlTagsMapper().mapText(t))
    assert(!cleaned.contains("<div") && !cleaned.contains("http://"))
  }

  test("repeated-ngram docs trip the word repetition filter") {
    val ctx = new TextContext(TextGen.repeatedNgrams(9L, 200))
    assert(Filters.WordRepetitionFilter().computeStatsRow(ctx)("word_rep_ratio") > 0.5)
  }

  test("cjk text is CJK-dominated; cjk noise much less structured") {
    val zh = TextGen.cjkText(1L, 200)
    assert(zh.count(Tokenizers.isCjk) > zh.length * 0.8)
    val clean = TextGen.cjkText(1L, 500)
    val noise = TextGen.cjkNoise(1L, 500)
    // clean zh draws from a narrow char range; noise spans a wide one
    assert(clean.toSet.size < noise.toSet.size)
  }

  test("instruction pairs carry the instruction/response structure") {
    val good = TextGen.instructionPair(3L, quality = 1.0)
    assert(good.startsWith("instruction: ") && good.contains("\nresponse: "))
    val bad = TextGen.instructionPair(3L, quality = 0.0)
    assert(bad.contains("click here subscribe"))
  }

  test("docs generator is deterministic and respects the mixture") {
    val mix: TextGen.Mix = Seq("clean" -> 0.5, "gibberish" -> 0.5)
    val a = TextGen.docs(spark, mix, 200, seed = 5L)
    val b = TextGen.docs(spark, mix, 200, seed = 5L)
    assert(texts(a.orderBy(Schema.Id)) == texts(b.orderBy(Schema.Id)))
    val kinds = a.groupBy(col(Schema.Meta).getItem("kind")).count().collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(kinds.keySet == Set("clean", "gibberish"))
    assert(kinds("clean") > 60 && kinds("gibberish") > 60)
  }

  test("docs carry unified schema and extra meta") {
    val df = TextGen.docs(spark, Seq("clean" -> 1.0), 5, 1L, metaExtra = Map("component" -> "X"))
    assert(df.columns.toSeq == Schema.columns)
    assert(df.select(col(Schema.Meta).getItem("component")).distinct().collect()(0).getString(0) == "X")
  }

  test("vocab is stable and disjoint from stopwords") {
    assert(TextGen.vocab.length == TextGen.VocabSize)
    assert(TextGen.vocab.toSet.intersect(WordLists.stopwords).isEmpty)
  }
}
