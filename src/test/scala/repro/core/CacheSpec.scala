package repro.core

import java.nio.file.Files
import repro.{SparkSpec, TestData}

class CacheSpec extends SparkSpec with TestData {

  private def newManager(mode: String = CacheManager.ModeCache, codec: String = "zstd"): CacheManager =
    new CacheManager(spark, Files.createTempDirectory("djcache").toString, mode, codec)

  private def ops: Seq[Op] = Seq(
    Mappers.LowercaseMapper(),
    Filters.TextLengthFilter(minLen = 4),
    Deduplicators.ExactDocDeduplicator(),
  )

  test("cache mode persists input + one entry per op") {
    val cm = newManager()
    val df = docsDf("Sample ONE text", "two", "Sample ONE text", "another Document")
    Pipeline(ops, cache = Some(cm)).run(df).count()
    // 1 input + 3 op outputs
    assert(cm.entries.size == 4)
  }

  test("rerun with identical recipe resumes from the last cache") {
    val cm = newManager()
    val df = docsDf("Alpha Beta", "tiny", "Gamma Delta Epsilon")
    val first = Pipeline(ops, cache = Some(cm)).run(df)
    val firstTexts = texts(first)
    val entriesAfterFirst = cm.entries.toSet
    val second = Pipeline(ops, cache = Some(cm)).run(df)
    assert(texts(second) == firstTexts)
    assert(cm.entries.toSet == entriesAfterFirst) // nothing new written
  }

  test("changing an op parameter invalidates exactly the suffix") {
    val cm = newManager()
    val df = docsDf("Alpha Beta Gamma", "tiny", "Delta Epsilon")
    Pipeline(ops, cache = Some(cm)).run(df).count()
    val before = cm.entries.size
    val changed = Seq(Mappers.LowercaseMapper(), Filters.TextLengthFilter(minLen = 6),
      Deduplicators.ExactDocDeduplicator())
    Pipeline(changed, cache = Some(cm)).run(df).count()
    // input + mapper outputs shared; filter + dedup outputs re-written anew
    assert(cm.entries.size == before + 2)
  }

  test("checkpoint mode keeps only the latest op output plus input") {
    val cm = newManager(CacheManager.ModeCheckpoint)
    val df = docsDf("Alpha Beta", "tiny", "Gamma Delta")
    Pipeline(ops, cache = Some(cm)).run(df).count()
    // input cache + the final op's checkpoint
    assert(cm.entries.size == 2)
  }

  test("cached pipeline output equals uncached output") {
    val cm = newManager()
    val df = docsDf("KEEP this Doc", "no", "Another Valid doc", "KEEP this Doc")
    val cached = Pipeline(ops, cache = Some(cm)).run(df)
    val plain  = Pipeline(ops).run(df)
    assert(texts(cached.orderBy(Schema.Id)) == texts(plain.orderBy(Schema.Id)))
  }

  test("zstd-compressed caches are smaller than uncompressed") {
    val redundant = (0 until 200).map(i => "very repetitive content " * 30 + i)
    val df = docsDf(redundant: _*)
    val cz = newManager(codec = "zstd")
    val cu = newManager(codec = "uncompressed")
    Pipeline(Seq(Mappers.LowercaseMapper()), cache = Some(cz)).run(df).count()
    Pipeline(Seq(Mappers.LowercaseMapper()), cache = Some(cu)).run(df).count()
    assert(cz.bytes < cu.bytes, s"zstd=${cz.bytes} uncompressed=${cu.bytes}")
  }

  test("space model: cache mode formula (Appendix A.2)") {
    // (1 + M + F + I(F>0) + D) × S
    assert(SpaceModel.cacheMode(mappers = 2, filters = 3, dedups = 1, datasetBytes = 10L) == 80L)
    assert(SpaceModel.cacheMode(mappers = 2, filters = 0, dedups = 0, datasetBytes = 10L) == 30L)
    assert(SpaceModel.cacheMode(ops, datasetBytes = 100L) == (1 + 1 + 1 + 1 + 1) * 100L)
  }

  test("space model: checkpoint mode peak is 3×S") {
    assert(SpaceModel.checkpointMode(7L) == 21L)
  }

  test("space model picks a policy that fits the disk") {
    assert(SpaceModel.choosePolicy(ops, datasetBytes = 10L, availableBytes = 1000L) == CacheManager.ModeCache)
    assert(SpaceModel.choosePolicy(ops, datasetBytes = 10L, availableBytes = 40L) == CacheManager.ModeCheckpoint)
    assert(SpaceModel.choosePolicy(ops, datasetBytes = 10L, availableBytes = 20L) == "none")
  }

  test("op signatures are stable and parameter-sensitive") {
    assert(Filters.TextLengthFilter(5, 10).signature == Filters.TextLengthFilter(5, 10).signature)
    assert(Filters.TextLengthFilter(5, 10).signature != Filters.TextLengthFilter(6, 10).signature)
    assert(Filters.PerplexityFilter(100).signature.contains("refSize")) // model table elided from key
  }
}
