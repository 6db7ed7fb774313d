package repro.bench

import repro.SparkSpec
import repro.exp.{FusionExperiment, PerfExperiment, ScalabilityExperiment}

/** Fig. 8 analog: the Data-Juicer pipeline vs the single-script baseline on
  * both datasets — less wall time and a much smaller resident working set.
  */
class PerfBench extends SparkSpec {

  test("end-to-end: DJ pipeline saves time and memory vs script baseline") {
    val r = PerfExperiment.run(spark)
    println(r.table)
    // The paper's headline is the aggregate ("an average of 55.6% less
    // processing time"); per-dataset wall times on a long-lived shared
    // session can fluctuate, the aggregate must not.
    val djTotal   = r.rows.map(_.djMs).sum
    val baseTotal = r.rows.map(_.baselineMs).sum
    assert(djTotal < baseTotal, s"dj total ${djTotal}ms vs baseline total ${baseTotal}ms")
    r.rows.foreach { row =>
      assert(row.memSaved > 0.5, s"${row.dataset}: mem saved ${row.memSaved}")
    }
  }
}

/** Fig. 9 analog: OP fusion & reordering on the 14-OP recipe. */
class FusionBench extends SparkSpec {

  test("fusion removes shared-context recomputation and saves wall time") {
    val r = FusionExperiment.run(spark)
    println(r.table)
    r.rows.foreach { row =>
      assert(row.fusedTokenizes < row.plainTokenizes,
        s"${row.dataset}: fused ${row.fusedTokenizes} vs plain ${row.plainTokenizes} tokenizer calls")
    }
    // Wall-clock: the aggregate over all sizes must improve (individual small
    // sizes can be noisy on a busy machine).
    val plain = r.rows.map(_.plainMs).sum
    val fused = r.rows.map(_.fusedMs).sum
    assert(fused < plain, s"fused ${fused}ms vs plain ${plain}ms")
  }
}

/** Fig. 10 analog: Ray-like scales with nodes; Beam-like stays load-bound. */
class ScalabilityBench extends SparkSpec {

  test("ray-like executor scales near-linearly; beam-like is load-dominated") {
    val r = ScalabilityExperiment.run(spark, nDocs = 6000)
    println(r.table)
    val ray = r.speedup("Data-Juicer on Ray (sim)", 1, 8)
    assert(ray > 2.5, s"ray speedup 1→8 nodes: $ray")
    // The paper's mechanism, asserted directly: Beam's serialized source
    // read does NOT shrink as nodes are added, while Ray's sharded load
    // does. (At the paper's 65–140GB the non-shrinking load stage dominated
    // Beam's total; at bench scale it is a small share, so we assert the
    // stage behaviour rather than a total-time crossover.)
    def loads(ex: String) = r.rows.filter(_.executor.contains(ex)).sortBy(_.nodes).map(_.loadMs)
    val beamLoads = loads("Beam")
    val rayLoads  = loads("Ray")
    assert(beamLoads.last * 2 + 20 > beamLoads.head, s"beam load must stay ~flat: $beamLoads")
    assert(rayLoads.last < rayLoads.head, s"ray load must shrink with nodes: $rayLoads")
  }
}
