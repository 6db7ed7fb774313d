package repro.exp

import org.apache.spark.sql.SparkSession
import repro.corpus.Components
import repro.lm.NGramLM

/** Table 7: the pre-training data recipe statistics — token count and
  * sampling proportion per component, with Books ×2 and Wikipedia ×2.5
  * epochs. Components are generated at `scale` synthetic tokens per paper
  * token, tokenized and counted in Spark; proportions are the epoch-weighted
  * normalization (the paper's stated rule, which reproduces its column).
  */
object Table7Experiment {

  final case class ComponentRow(name: String, paperTokens: Long, paperProp: Double,
                                tokens: Long, prop: Double)
  final case class Result(rows: Seq[ComponentRow], scale: Double) {
    def table7: String = TableFmt.render(
      f"Table 7 — pre-training data statistics (scale: 1 token ≙ ${1 / scale}%.0f paper tokens)",
      Seq("Component", "#Tokens paper", "Prop paper", "#Tokens ours", "Prop ours"),
      rows.map(r => Seq(r.name, r.paperTokens.toString, TableFmt.pct(r.paperProp),
        r.tokens.toString, TableFmt.pct(r.prop))))
  }

  /** The paper's reported sampling proportions, for the diff column. */
  val paperProps: Map[String, Double] = Map(
    "CommonCrawl" -> 0.4491, "C4" -> 0.2264, "GitHub" -> 0.0810, "Books" -> 0.0657,
    "Wikipedia" -> 0.0548, "arXiv" -> 0.0362, "PubMed Central" -> 0.0318,
    "StackExchange" -> 0.0246, "FreeLaw" -> 0.0162, "PubMed Abstracts" -> 0.0065,
    "USPTO" -> 0.0050, "EuroParl" -> 0.0010, "HackerNews" -> 0.0006,
    "PhilPapers" -> 0.0006, "NIH ExPorter" -> 0.0005,
  )

  def run(spark: SparkSession, scale: Double = 1e-6, seed: Long = 17L): Result = {
    val measured = Components.pretraining.map { c =>
      val df = Components.generate(spark, c, scale, seed)
      (c, NGramLM.countTokens(df))
    }
    val weightedTotal = measured.map { case (c, n) => n * c.epochs }.sum
    val rows = measured.map { case (c, n) =>
      ComponentRow(c.name, c.paperTokens, paperProps(c.name), n, n * c.epochs / weightedTotal)
    }
    Result(rows, scale)
  }
}
