package repro.lm

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.Schema
import repro.corpus.TextGen

/** HELM-lite: the 16-core-task evaluation harness (paper Sec. 5.3, Tables 2
  * and 9). Each task is a held-out synthetic evaluation set with its own
  * seed, token-noise rate and score gain; a model's task score is
  * `gain × top-1 next-token accuracy` on that set.
  *
  * The per-task `(noise, gain)` pairs calibrate score magnitudes into the
  * ballpark of the paper's Table 9 column for the Data-Juicer model. The
  * calibration is shared by every evaluated model, so cross-model ordering —
  * the thing the tables actually demonstrate — is unaffected by it.
  */
object HelmLite {

  /** One task: HELM name, eval-set seed, token corruption rate, score gain. */
  final case class Task(name: String, seed: Long, noise: Double, gain: Double)

  /** The 16 core tasks of Table 9. */
  val tasks: Seq[Task] = Seq(
    Task("MMLU",                           901L, 0.45, 85),
    Task("BoolQ",                          902L, 0.15, 105),
    Task("NarrativeQA",                    903L, 0.25, 95),
    Task("NaturalQuestions (closed-book)", 904L, 0.60, 55),
    Task("NaturalQuestions (open-book)",   905L, 0.15, 100),
    Task("QuAC",                           906L, 0.45, 90),
    Task("HellaSwag",                      907L, 0.10, 115),
    Task("OpenbookQA",                     908L, 0.25, 100),
    Task("TruthfulQA",                     909L, 0.35, 95),
    Task("MS MARCO (regular)",             910L, 0.60, 60),
    Task("MS MARCO (TREC)",                911L, 0.40, 85),
    Task("IMDB",                           912L, 0.05, 155),
    Task("XSUM",                           913L, 0.75, 40),
    Task("CNN/DailyMail",                  914L, 0.70, 50),
    Task("CivilComments",                  915L, 0.15, 110),
    Task("RAFT",                           916L, 0.25, 105),
  )

  /** Build one task's evaluation set: clean grammar text with `noise` of the
    * tokens replaced by uniform random vocabulary words.
    */
  def evalSet(spark: SparkSession, task: Task, nDocs: Int = 40, docWords: Int = 120): DataFrame = {
    val noise = task.noise
    val seed = task.seed
    val gen = udf { (id: Long) =>
      val r = TextGen.rng(seed * 100003L + id)
      val clean = TextGen.cleanText(seed * 7907L + id, docWords)
      clean.split(" ").map { w =>
        if (r.nextDouble() < noise) TextGen.vocab(r.nextInt(TextGen.VocabSize)) else w
      }.mkString(" ")
    }
    Schema.ensure(spark.range(nDocs).select(col("id"), gen(col("id")) as Schema.Text))
  }

  /** Evaluate a model on all 16 tasks in one pass → (task, score), task
    * order preserved.
    */
  def evaluate(spark: SparkSession, model: NGramLM.Model,
               nDocs: Int = 40, docWords: Int = 120): Seq[(String, Double)] = {
    val p = NGramLM.predictor(model)
    val all = tasks.map(t => evalSet(spark, t, nDocs, docWords).withColumn("__task", lit(t.name)))
      .reduce(_ unionByName _)
    val accs = NGramLM.accuracyBy(p, all, "__task")
    tasks.map { t =>
      val acc = accs.getOrElse(t.name, 0.0)
      t.name -> math.round(t.gain * acc * 10.0) / 10.0
    }
  }

  /** Mean of task scores — the Table 2 "Score" column. */
  def averageScore(perTask: Seq[(String, Double)]): Double =
    math.round(perTask.map(_._2).sum / perTask.size * 100.0) / 100.0
}
