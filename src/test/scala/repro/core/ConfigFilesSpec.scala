package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.{SparkSpec, TestData}

/** The shipped recipe files in configs/ must stay parseable and consistent
  * with the in-code experiment recipes.
  */
class ConfigFilesSpec extends SparkSpec with TestData {

  private val dir = sys.props.getOrElse("repro.configs.dir", "configs")

  test("dj-pretrain-en.yaml parses and matches the Table 2 recipe") {
    val r = Recipe.fromFile(s"$dir/dj-pretrain-en.yaml")
    assert(r.opSpecs == repro.exp.Recipes.djPretrain.opSpecs)
  }

  test("dj-posttune-sft-en.yaml parses and matches the Table 3 recipe") {
    val r = Recipe.fromFile(s"$dir/dj-posttune-sft-en.yaml")
    assert(r.opSpecs == repro.exp.Recipes.djPosttune.opSpecs)
  }

  test("dj-code.yaml parses and runs against tagged code samples") {
    val r = Recipe.fromFile(s"$dir/dj-code.yaml")
    val df = docsWithMeta(
      ("// Copyright X\ndef keep(me): good = me + 1\nval ok = keep(2) + more(tokens) * enough\n" +
        "def f(a): yes = a + 2\nval g = f(1) + f(2) + f(3)\nval h = g + g + g\n", Map("suffix" -> ".py", "stars" -> "50")),
      ("def lowstar(x): x + 1", Map("suffix" -> ".py", "stars" -> "1")),
      ("plain text file", Map("suffix" -> ".txt", "stars" -> "999")),
    )
    val out = r.pipeline().run(df)
    assert(ids(out) == Seq(0L))
    assert(!texts(out).head.contains("Copyright"))
  }
}
