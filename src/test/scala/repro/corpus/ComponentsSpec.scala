package repro.corpus

import repro.{SparkSpec, TestData}
import repro.core.Schema
import org.apache.spark.sql.functions._

class ComponentsSpec extends SparkSpec with TestData {

  test("pre-training registry matches Table 7's 15 components and token counts") {
    val c = Components.pretraining
    assert(c.size == 15)
    assert(c.head.name == "CommonCrawl" && c.head.paperTokens == 360925581674L)
    assert(c.find(_.name == "Books").get.epochs == 2.0)
    assert(c.find(_.name == "Wikipedia").get.epochs == 2.5)
    assert(c.map(_.name).distinct.size == 15)
  }

  test("component generation scales with paper token count") {
    val small = Components.generate(spark, Components.pretraining.find(_.name == "EuroParl").get, 1e-6)
    val large = Components.generate(spark, Components.pretraining.find(_.name == "Books").get, 1e-6)
    assert(large.count() > small.count())
    assert(small.columns.toSeq == Schema.columns)
  }

  test("post-tuning registry holds 39 datasets with the four named subsets") {
    val d = Components.postTuning
    assert(d.size == 39)
    val names = d.map(_.name)
    assert(Seq("alpaca", "gpteacher", "fastchat", "gpt4all").forall(names.contains))
    assert(names.distinct.size == 39)
  }

  test("the four named subsets carry (SFT, EN) tags") {
    Seq("alpaca", "gpteacher", "fastchat", "gpt4all").foreach { n =>
      val d = Components.postTuning.find(_.name == n).get
      assert(d.usages.contains("SFT") && d.languages.contains("EN"), n)
    }
  }

  test("tag marginals reproduce Table 8 exactly") {
    val counts = Components.tagCounts(spark).collect()
      .map(r => (r.getString(0), r.getString(1)) -> r.getLong(2)).toMap
    assert(counts(("Language", "EN")) == 28)
    assert(counts(("Language", "ZH")) == 14)
    assert(counts(("Language", "Multilingual")) == 3)
    assert(counts(("Usage", "MRD")) == 2)
    assert(counts(("Usage", "IFT")) == 17)
    assert(counts(("Usage", "SFT")) == 23)
    assert(counts(("Usage", "Preference")) == 5)
    assert(counts(("Task Type", "Multi-Task")) == 27)
    assert(counts(("Task Type", "Task-Specific")) == 13)
    assert(counts(("Generation Method", "Human-Generated")) == 3)
    assert(counts(("Generation Method", "Self-Instruct")) == 12)
    assert(counts(("Generation Method", "Mixed")) == 5)
    assert(counts(("Generation Method", "Collection of Datasets")) == 19)
  }

  test("post-tuning generation tags samples with dataset meta") {
    val d = Components.postTuning.find(_.name == "alpaca").get
    val df = Components.generatePostTuning(spark, d, scale = 0.05)
    assert(df.count() >= 8)
    val meta = df.select(col(Schema.Meta)).collect()(0).getAs[Map[String, String]](0)
    assert(meta("dataset") == "alpaca")
    assert(meta("usage").contains("SFT"))
  }
}
