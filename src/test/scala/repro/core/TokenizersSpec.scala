package repro.core

import org.scalatest.funsuite.AnyFunSuite

class TokenizersSpec extends AnyFunSuite {

  test("words lowercases and splits on non-alnum") {
    assert(Tokenizers.words("Hello, World! 42x").toSeq == Seq("hello", "world", "42x"))
  }

  test("words on empty and null") {
    assert(Tokenizers.words("").isEmpty)
    assert(Tokenizers.words(null).isEmpty)
  }

  test("words keeps digits inside tokens") {
    assert(Tokenizers.words("abc123 x1").toSeq == Seq("abc123", "x1"))
  }

  test("words emits CJK chars as single tokens") {
    assert(Tokenizers.words("ab中文cd").toSeq == Seq("ab", "中", "文", "cd"))
  }

  test("words handles punctuation-only input") {
    assert(Tokenizers.words("!!! --- ...").isEmpty)
  }

  test("cjkChars drops whitespace, keeps everything else as chars") {
    assert(Tokenizers.cjkChars("中 文a").toSeq == Seq("中", "文", "a"))
    assert(Tokenizers.cjkChars(null).isEmpty)
  }

  test("codeTokens keeps identifiers and symbols separately") {
    assert(Tokenizers.codeTokens("def f(x_1): return x_1+2").toSeq ==
      Seq("def", "f", "(", "x_1", ")", ":", "return", "x_1", "+", "2"))
  }

  test("codeTokens preserves case") {
    assert(Tokenizers.codeTokens("FooBar baz").toSeq == Seq("FooBar", "baz"))
  }

  test("ngrams basic") {
    assert(Tokenizers.ngrams(Array("a", "b", "c", "d"), 2).toSeq == Seq("a b", "b c", "c d"))
  }

  test("ngrams shorter than n is empty") {
    assert(Tokenizers.ngrams(Array("a", "b"), 3).isEmpty)
  }

  test("wordCalls counter increments per invocation") {
    val before = Tokenizers.wordCalls.get()
    Tokenizers.words("a b c")
    Tokenizers.words("d")
    assert(Tokenizers.wordCalls.get() == before + 2)
  }

  test("TextContext lazily derives shared views") {
    val ctx = new TextContext("One two.\n\nThree four!\nfive")
    assert(ctx.words.length == 5)
    assert(ctx.lines.length == 4)
    assert(ctx.paragraphs.length == 2)
    assert(ctx.nonSpaceChars == "One two.Three four!five".replace(" ", "").length)
    assert(ctx.alnumChars == 19)
  }

  test("TextContext on null text is safe") {
    val ctx = new TextContext(null)
    assert(ctx.words.isEmpty && ctx.lines.isEmpty && ctx.length == 0 && ctx.nonSpaceChars == 0)
  }
}
