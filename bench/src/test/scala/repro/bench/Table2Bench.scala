package repro.bench

import repro.SparkSpec
import repro.exp.Table2Experiment

/** Tables 2 & 9 at bench scale (1 unit ≙ 1B paper tokens ≙ 10k synthetic
  * tokens). Asserts the paper's ordering claims:
  *  - Data-Juicer-150 outperforms Pythia-300 and Falcon-350 despite ≤ half
  *    the tokens;
  *  - continued training on refined IFT (4.7 units) beats raw Alpaca-CoT IFT
  *    (15 units), which beats no IFT.
  */
class Table2Bench extends SparkSpec {

  private lazy val result = Table2Experiment.run(spark, tokensPerUnit = 10000L, evalDocs = 40)

  test("Table 2: Data-Juicer recipe beats both baselines with half the tokens") {
    println(result.table2)
    val byData = result.rows.map(r => r.trainingData -> r.score).toMap
    val dj     = byData("Data-Juicer (RedPajama+Pile)")
    val falcon = byData("RefinedWeb")
    val pythia = byData("Pile")
    assert(dj > falcon, s"DJ $dj vs Falcon $falcon")
    assert(dj > pythia, s"DJ $dj vs Pythia $pythia")
  }

  test("Table 2: refined IFT at ~31% volume beats raw Alpaca-CoT IFT") {
    val byData = result.rows.map(r => r.trainingData -> r.score).toMap
    val dj     = byData("Data-Juicer (RedPajama+Pile)")
    val rawIft = byData("+ Alpaca-CoT-IFT")
    val refIft = byData("+ Our Refined IFT")
    assert(refIft > rawIft, s"refined $refIft vs raw $rawIft")
    assert(refIft > dj, s"refined $refIft vs base $dj")
  }

  test("Table 9: per-task breakdown covers all 16 HELM tasks for 4 models") {
    println(result.table9)
    val t9models = result.rows.filterNot(_.trainingData.contains("Alpaca-CoT-IFT"))
    assert(t9models.size == 4)
    t9models.foreach(m => assert(m.perTask.size == 16, m.trainingData))
    // task difficulty gradient survives in every model: XSUM << IMDB
    t9models.foreach { m =>
      val s = m.perTask.toMap
      assert(s("XSUM") < s("IMDB"), s"${m.trainingData}: XSUM ${s("XSUM")} vs IMDB ${s("IMDB")}")
    }
  }
}
