package repro.core

import repro.{SparkSpec, TestData}

class TracerSpec extends SparkSpec with TestData {

  test("tracer records discarded samples for filters") {
    val tracer = new Tracer(maxSamples = 5)
    val df = docsDf("long enough to survive the filter", "nope")
    Pipeline(Seq(Filters.TextLengthFilter(minLen = 10)), tracer = Some(tracer)).run(df)
    val t = tracer.traces.head
    assert(t.kind == "filter" && t.removedOrChanged == 1)
    assert(t.samples.map(_._2) == Seq("nope"))
  }

  test("tracer records pre/post pairs for mappers, only changed samples") {
    val tracer = new Tracer()
    val df = docsDf("UPPER case", "already lower")
    Pipeline(Seq(Mappers.LowercaseMapper()), tracer = Some(tracer)).run(df)
    val t = tracer.traces.head
    assert(t.kind == "mapper" && t.removedOrChanged == 1)
    assert(t.samples.head._2 == "UPPER case" && t.samples.head._3.contains("upper case"))
  }

  test("tracer records removed duplicates for deduplicators") {
    val tracer = new Tracer()
    val df = docsDf("dup text", "dup text", "unique")
    Pipeline(Seq(Deduplicators.ExactDocDeduplicator()), tracer = Some(tracer)).run(df)
    val t = tracer.traces.head
    assert(t.kind == "deduplicator" && t.removedOrChanged == 1)
    assert(t.samples.map(_._2) == Seq("dup text"))
  }

  test("tracer caps stored samples at maxSamples") {
    val tracer = new Tracer(maxSamples = 2)
    val df = docsDf((0 until 10).map(_ => "x"): _*)
    Pipeline(Seq(Filters.TextLengthFilter(minLen = 5)), tracer = Some(tracer)).run(df)
    assert(tracer.traces.head.removedOrChanged == 10)
    assert(tracer.traces.head.samples.size == 2)
  }

  test("tracer report renders one block per op") {
    val tracer = new Tracer()
    val df = docsDf("UPPER", "some much longer surviving text sample")
    Pipeline(Seq(Mappers.LowercaseMapper(), Filters.TextLengthFilter(minLen = 10)),
      tracer = Some(tracer)).run(df)
    val rep = tracer.report
    assert(rep.contains("lowercase_mapper") && rep.contains("text_length_filter"))
    assert(tracer.traces.size == 2)
  }
}
