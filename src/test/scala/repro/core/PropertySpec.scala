package repro.core

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite

/** Property tests over row-level OP semantics (raw ScalaCheck; the
  * scalatest/scalacheck bridge artifact is not available offline).
  */
class PropertySpec extends AnyFunSuite {

  private val textGen: Gen[String] = Gen.listOf(Gen.oneOf(
    Gen.alphaNumStr.map(_.take(8)), Gen.const(" "), Gen.const("\n"),
    Gen.oneOf("the", "and", "of", "中", "!", ".", "damn"),
  )).map(_.mkString(" ")).map(_.take(2000))

  private def check(name: String, p: Prop): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(60), p)
    assert(res.passed, s"$name: ${res.status}")
  }

  test("whitespace normalization is idempotent") {
    val m = Mappers.WhitespaceNormalizationMapper()
    check("ws-idem", Prop.forAll(textGen)(t => m.mapText(m.mapText(t)) == m.mapText(t)))
  }

  test("lowercase is idempotent") {
    val m = Mappers.LowercaseMapper()
    check("lc-idem", Prop.forAll(textGen)(t => m.mapText(m.mapText(t)) == m.mapText(t)))
  }

  test("remove-links never leaves an http token behind") {
    val m = Mappers.RemoveLinksMapper()
    check("links", Prop.forAll(textGen)(t => !m.mapText(t + " http://x.y/z end").contains("http://")))
  }

  test("tokenizer tokens are nonempty, lowercase, alnum-or-CJK") {
    check("tok", Prop.forAll(textGen) { t =>
      Tokenizers.words(t).forall(w =>
        w.nonEmpty && w == w.toLowerCase &&
          w.forall(c => Character.isLetterOrDigit(c) || Tokenizers.isCjk(c)))
    })
  }

  test("filter stats are total and NaN-free on arbitrary text") {
    check("stats-total", Prop.forAll(textGen) { t =>
      Filters.allStats.forall { f =>
        val stats = f.computeStatsRow(new TextContext(t))
        f.statsKeys.toSet.subsetOf(stats.keySet) && stats.values.forall(v => !v.isNaN)
      }
    })
  }

  test("tightening a threshold only removes samples (monotonicity)") {
    val loose = Filters.TextLengthFilter(minLen = 1)
    val tight = Filters.TextLengthFilter(minLen = 100)
    check("monotone", Prop.forAll(textGen) { t =>
      val s = loose.computeStatsRow(new TextContext(t))
      !tight.keepRow(s) || loose.keepRow(s)
    })
  }

  test("fused filter decision equals conjunction of members") {
    val members = Seq(Filters.WordCountFilter(3), Filters.StopwordRatioFilter(0.1),
      Filters.FlaggedWordsFilter(0.05))
    val fused = FusedFilter(members)
    check("fused-conj", Prop.forAll(textGen) { t =>
      fused.keepRow(fused.computeStatsRow(new TextContext(t))) ==
        members.forall(m => m.keepRow(m.computeStatsRow(new TextContext(t))))
    })
  }

  test("content hash is whitespace/case invariant") {
    check("chash", Prop.forAll(textGen) { t =>
      Hashing.contentHash(t) == Hashing.contentHash(t.toUpperCase.replaceAll("\\s+", "  "))
    })
  }

  test("simhash is permutation-invariant over token multisets") {
    val toks = Gen.listOfN(20, Gen.alphaLowerStr.map(_.take(6)))
    check("simhash-perm", Prop.forAll(toks, Gen.long) { (tokens, seed) =>
      val shuffled = new scala.util.Random(seed).shuffle(tokens)
      Hashing.simhash(tokens.toArray) == Hashing.simhash(shuffled.toArray)
    })
  }

  test("minhash signature length and determinism") {
    val toks = Gen.listOfN(15, Gen.alphaLowerStr.map(_.take(6)))
    check("minhash-det", Prop.forAll(toks) { tokens =>
      val s1 = Hashing.minhash(tokens.toArray, 64, 3, 7)
      val s2 = Hashing.minhash(tokens.toArray, 64, 3, 7)
      s1.length == 64 && s1.toSeq == s2.toSeq
    })
  }

  test("dist row pipeline composes like manual application") {
    val ops: Seq[Op] = Seq(Mappers.LowercaseMapper(), Filters.TextLengthFilter(minLen = 5))
    check("dist-row", Prop.forAll(textGen) { t =>
      val viaExec = repro.dist.DistExecutor.applyRow(ops, repro.dist.DistExecutor.Doc(0L, t, Map.empty)).map(_.text)
      val lowered = t.toLowerCase
      viaExec == (if (lowered.length >= 5) Some(lowered) else None)
    })
  }
}
