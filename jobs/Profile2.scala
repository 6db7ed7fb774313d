package jobs

import org.apache.spark.sql.SparkSession
import repro.corpus.TextGen

/** Ad-hoc Spark-path profiler for the fusion recipe (dev aid). */
object Profile2 {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.master("local[*]").appName("profile2")
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.ui.enabled", "false")
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    val mix: TextGen.Mix = Seq(
      "clean" -> 0.6, "html" -> 0.1, "gibberish" -> 0.1, "boilerplate" -> 0.1, "repeat" -> 0.1)
    def timeIt[T](label: String)(body: => T): T = {
      val t0 = System.nanoTime(); val r = body
      println(f"$label%-30s ${(System.nanoTime() - t0) / 1e6}%10.1f ms"); r
    }
    val df = timeIt("generate+checkpoint") {
      TextGen.docs(spark, mix, 10000, seed = 1L, docWords = 220).localCheckpoint(true)
    }
    val recipe = repro.exp.Recipes.fusion14
    timeIt("warmup(50)") { recipe.pipeline().run(df.limit(50)).count() }
    timeIt("fused run1") { recipe.pipeline(fuse = true, reorder = true).run(df).count() }
    timeIt("fused run2") { recipe.pipeline(fuse = true, reorder = true).run(df).count() }
    timeIt("plain run1") { recipe.pipeline().run(df).count() }
    timeIt("plain run2") { recipe.pipeline().run(df).count() }
    val noDedup = recipe.without("exact_doc_deduplicator")
    timeIt("fused nodedup") { noDedup.pipeline(fuse = true, reorder = true).run(df).count() }
    timeIt("mappers only") {
      repro.core.Pipeline.run(df, recipe.ops.collect { case m: repro.core.Mapper => m }).count()
    }
    timeIt("filters only fused") {
      repro.core.Pipeline(recipe.ops.collect { case f: repro.core.Filter => f }, fuse = true).run(df).count()
    }
    spark.stop()
  }
}
