package repro.lm

import repro.{SparkSpec, TestData}
import repro.corpus.TextGen

class JudgeSpec extends SparkSpec with TestData {

  private lazy val cleanModel =
    NGramLM.train(TextGen.docs(spark, Seq("clean" -> 1.0), 400, seed = 91L, docWords = 200))
  private lazy val junkModel =
    NGramLM.train(TextGen.docs(spark, Seq("gibberish" -> 0.5, "boilerplate" -> 0.5), 400, seed = 92L, docWords = 200))

  test("prompts carry paired good/bad responses, deterministically") {
    val p1 = Judge.prompts(spark, 20).collect()
    val p2 = Judge.prompts(spark, 20).collect()
    assert(p1.map(_.getString(1)).toSeq == p2.map(_.getString(1)).toSeq)
    assert(p1.forall(r => r.getString(1) != r.getString(2)))
  }

  test("margins are positive for a clean-trained model") {
    val prompts = Judge.prompts(spark, 30)
    val m = Judge.margins(cleanModel, prompts).collect().map(_.getDouble(1))
    assert(m.count(_ > 0) > 25, s"positive margins: ${m.count(_ > 0)}/30")
  }

  test("clean-trained model beats junk-trained model in pairwise judging") {
    val prompts = Judge.prompts(spark, 40)
    val res = Judge.compare(cleanModel, junkModel, prompts)
    assert(res.winsA + res.winsB + res.ties == 40)
    assert(res.winsA > res.winsB, s"$res")
  }

  test("self-comparison is all ties") {
    val prompts = Judge.prompts(spark, 15)
    val res = Judge.compare(cleanModel, cleanModel, prompts)
    assert(res.ties == 15 && res.winsA == 0)
  }

  test("leaderboard ranks by normalized average score") {
    val results = Seq(
      ("modelA", "t1", 10.0), ("modelA", "t2", 10.0),
      ("modelB", "t1", 5.0), ("modelB", "t2", 5.0),
    )
    val lb = Leaderboard.rank(spark, results).collect()
    assert(lb(0).getAs[String]("model") == "modelA")
    assert(lb(0).getAs[Double]("avg_norm") == 1.0)
    assert(lb(0).getAs[Double]("avg_rank") == 1.0)
  }
}
