package repro.bench

import repro.SparkSpec
import repro.exp.{Table7Experiment, Table8Experiment}

/** Tables 7 & 8: recipe statistics. Table 7's sampling proportions must
  * track the paper's column (same token ratios, same epoch weighting);
  * Table 8's tag counts must match exactly.
  */
class Table78Bench extends SparkSpec {

  test("Table 7: epoch-weighted proportions match the paper within 1.5 points") {
    val r = Table7Experiment.run(spark, scale = 1e-6)
    println(r.table7)
    assert(r.rows.size == 15)
    r.rows.foreach { row =>
      assert(math.abs(row.prop - row.paperProp) < 0.015,
        s"${row.name}: ours ${row.prop} vs paper ${row.paperProp}")
    }
    assert(math.abs(r.rows.map(_.prop).sum - 1.0) < 1e-9)
    // the headline ordering: CommonCrawl ≫ C4 ≫ GitHub …
    val ordered = r.rows.sortBy(-_.prop).map(_.name)
    assert(ordered.take(3) == Seq("CommonCrawl", "C4", "GitHub"))
  }

  test("Table 8: tag category counts match the paper exactly") {
    val r = Table8Experiment.run(spark)
    println(r.table8)
    r.rows.foreach(row => assert(row.count == row.paperCount.toLong,
      s"${row.category}/${row.subCategory}: ours ${row.count} vs paper ${row.paperCount}"))
  }
}
