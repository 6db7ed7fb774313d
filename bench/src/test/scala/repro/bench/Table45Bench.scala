package repro.bench

import repro.SparkSpec
import repro.exp.Table4Experiment

/** Tables 4 & 5 at bench scale. Shape claims:
  *  - GPT-3 and Chinese classifiers reach high P/R/F1 (paper: 97.5 / 98.6);
  *  - the Code classifier, trained on weak star-proxy labels, is far worse
  *    (paper F1 61.6);
  *  - CommonCrawl keeping ratios are a few percent, with pareto ≤ label for
  *    the GPT-3 classifier (paper 3.22% vs 1.41%).
  */
class Table45Bench extends SparkSpec {

  private lazy val result = Table4Experiment.run(spark, nDocs = 1500L)

  test("Table 4: GPT-3 and Chinese classifiers are strong; Code is weak") {
    println(result.table4)
    val byName = result.rows.map(r => r.name -> r).toMap
    assert(byName("GPT-3").f1 > 0.9, s"GPT-3 f1 ${byName("GPT-3").f1}")
    assert(byName("Chinese").f1 > 0.9, s"Chinese f1 ${byName("Chinese").f1}")
    assert(byName("Code").f1 < byName("GPT-3").f1 - 0.15,
      s"Code f1 ${byName("Code").f1} should be far below GPT-3 ${byName("GPT-3").f1}")
  }

  test("Table 5: keeping ratios are small, pareto stricter than label for GPT-3") {
    println(result.table5)
    val gpt3 = result.keepRows.find(_.name == "GPT-3").get
    val zh   = result.keepRows.find(_.name == "Chinese").get
    assert(gpt3.label.get < 0.12, s"label keep ${gpt3.label.get}")
    assert(gpt3.pareto.get <= gpt3.label.get, s"pareto ${gpt3.pareto.get} vs label ${gpt3.label.get}")
    assert(zh.label.get < 0.12, s"zh label keep ${zh.label.get}")
    assert(gpt3.label.get > 0.005 && zh.label.get > 0.002, "keep ratios should be nonzero")
  }
}
