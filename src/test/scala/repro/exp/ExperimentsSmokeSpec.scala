package repro.exp

import repro.{SparkSpec, TestData}

/** Tiny-scale smoke runs of every table harness: full-scale shape assertions
  * live in bench/; here we only verify the harnesses execute end-to-end and
  * produce well-formed tables.
  */
class ExperimentsSmokeSpec extends SparkSpec with TestData {

  test("Table 7 harness: 15 rows, proportions sum to 1") {
    val r = Table7Experiment.run(spark, scale = 2e-7)
    assert(r.rows.size == 15)
    assert(math.abs(r.rows.map(_.prop).sum - 1.0) < 1e-9)
    assert(r.table7.contains("CommonCrawl"))
  }

  test("Table 8 harness matches the paper counts exactly") {
    val r = Table8Experiment.run(spark)
    assert(r.rows.forall(row => row.paperCount.toLong == row.count), r.table8)
  }

  test("Table 4/5 harness produces three classifiers and keep ratios") {
    val r = Table4Experiment.run(spark, nDocs = 240L)
    assert(r.rows.size == 3)
    assert(r.rows.forall(c => c.f1 > 0 && c.f1 <= 1))
    assert(r.keepRows.size == 3)
    assert(r.table4.nonEmpty && r.table5.nonEmpty)
  }

  test("Fusion harness reports equal outputs and tokenizer savings") {
    val r = FusionExperiment.run(spark, sizes = Seq("tiny" -> 250L))
    val row = r.rows.head
    assert(row.fusedTokenizes < row.plainTokenizes)
    assert(r.table.contains("Time saved"))
  }

  test("Perf harness: DJ output equals baseline output") {
    val r = PerfExperiment.run(spark, sizes = Seq("Books-lite" -> 250L))
    assert(r.rows.head.djMemBytes < r.rows.head.baselineMemBytes)
  }

  test("Scalability harness produces all executor/node rows") {
    val r = ScalabilityExperiment.run(spark, nDocs = 250, nodeCounts = Seq(1, 2))
    assert(r.rows.size == 4)
    assert(r.rows.forall(_.totalMs >= 0))
  }

  test("Table 2 harness at micro scale preserves ordering fields") {
    val r = Table2Experiment.run(spark, tokensPerUnit = 60L, evalDocs = 4)
    assert(r.rows.size == 5)
    assert(r.rows.forall(_.perTask.size == 16))
    assert(r.table2.contains("Data-Juicer") && r.table9.contains("MMLU"))
  }

  test("Table 3 harness at micro scale tallies wins+ties to prompt count") {
    val r = Table3Experiment.run(spark, sftSamples = 40, nPrompts = 12, baseTokens = 6000L)
    assert(r.vsAlpaca.winsOpp + r.vsAlpaca.winsDj + r.vsAlpaca.ties == 12)
    assert(r.vsRandom.winsOpp + r.vsRandom.winsDj + r.vsRandom.ties == 12)
  }
}
