package repro.data

import repro.SparkSpec

class TokenizerSpec extends SparkSpec {

  test("splits on whitespace and punctuation") {
    assert(Tokenizer.tokens("River Park, Fresno!") == Vector("river", "park", "fresno"))
  }

  test("lowercases") {
    assert(Tokenizer.tokens("USA") == Vector("usa"))
  }

  test("keeps digit runs as tokens") {
    assert(Tokenizer.tokens("call 773 731") == Vector("call", "773", "731"))
  }

  test("empty string yields no tokens") {
    assert(Tokenizer.tokens("") == Vector.empty)
    assert(Tokenizer.tokens("  ,;- ") == Vector.empty)
  }

  test("columnTokens concatenates all values") {
    assert(Tokenizer.columnTokens(Seq("a b", "c")) == Vector("a", "b", "c"))
  }

  test("contextKey strips trailing digits") {
    assert(Tokenizer.contextKey("t3c2v17") == "t3c2v")
    assert(Tokenizer.contextKey("com9") == "com")
  }

  test("contextKey of pure number is empty") {
    assert(Tokenizer.contextKey("483") == "")
  }

  test("contextKey leaves non-digit-suffixed tokens alone") {
    assert(Tokenizer.contextKey("park") == "park")
  }

  test("same column vocabulary shares a context key") {
    val keys = (0 until 20).map(i => Tokenizer.contextKey(s"t5c1v$i")).toSet
    assert(keys == Set("t5c1v"))
  }

  test("different columns get different context keys") {
    assert(Tokenizer.contextKey("t5c1v3") != Tokenizer.contextKey("t5c2v3"))
  }
}
