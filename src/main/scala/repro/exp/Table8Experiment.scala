package repro.exp

import org.apache.spark.sql.SparkSession
import repro.corpus.Components

/** Table 8: category/sub-category dataset counts over the 39-dataset
  * Alpaca-CoT post-tuning registry with Data-Juicer's added multi-valued
  * tags, computed as a DataFrame aggregation over the exploded tag sets.
  */
object Table8Experiment {

  final case class TagRow(category: String, subCategory: String, paperCount: Int, count: Long)
  final case class Result(rows: Seq[TagRow]) {
    def table8: String = TableFmt.render(
      "Table 8 — post-tuning dataset counts per tag category",
      Seq("Category", "Sub-Category", "Paper", "Ours"),
      rows.map(r => Seq(r.category, r.subCategory, r.paperCount.toString, r.count.toString)))
  }

  /** The paper's reported counts. */
  val paperCounts: Map[(String, String), Int] = Map(
    ("Language", "EN") -> 28, ("Language", "ZH") -> 14, ("Language", "Multilingual") -> 3,
    ("Usage", "MRD") -> 2, ("Usage", "IFT") -> 17, ("Usage", "SFT") -> 23, ("Usage", "Preference") -> 5,
    ("Task Type", "Multi-Task") -> 27, ("Task Type", "Task-Specific") -> 13,
    ("Generation Method", "Human-Generated") -> 3, ("Generation Method", "Self-Instruct") -> 12,
    ("Generation Method", "Mixed") -> 5, ("Generation Method", "Collection of Datasets") -> 19,
  )

  def run(spark: SparkSession): Result = {
    val counts = Components.tagCounts(spark).collect()
      .map(r => (r.getString(0), r.getString(1)) -> r.getLong(2)).toMap
    val ordered = Seq(
      ("Language", "EN"), ("Language", "ZH"), ("Language", "Multilingual"),
      ("Usage", "MRD"), ("Usage", "IFT"), ("Usage", "SFT"), ("Usage", "Preference"),
      ("Task Type", "Multi-Task"), ("Task Type", "Task-Specific"),
      ("Generation Method", "Human-Generated"), ("Generation Method", "Self-Instruct"),
      ("Generation Method", "Mixed"), ("Generation Method", "Collection of Datasets"),
    )
    Result(ordered.map { case (c, s) => TagRow(c, s, paperCounts((c, s)), counts.getOrElse((c, s), 0L)) })
  }
}
