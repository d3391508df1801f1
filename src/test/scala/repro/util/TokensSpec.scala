package repro.util

import org.scalatest.funsuite.AnyFunSuite

class TokensSpec extends AnyFunSuite {

  test("empty and null are zero tokens") {
    assert(Tokens.count("") == 0L)
    assert(Tokens.count(null) == 0L)
  }

  test("non-empty text is at least one token") {
    assert(Tokens.count("a") == 1L)
  }

  test("count follows the 4-chars-per-token heuristic") {
    assert(Tokens.count("abcdefgh") == 2L)
    assert(Tokens.count("abcdefghi") == 3L)
  }

  test("count is monotone in length") {
    val texts = Seq("x", "hello", "hello world", "hello world, longer sentence here")
    val counts = texts.map(Tokens.count)
    assert(counts == counts.sorted)
  }

  test("meter accumulates totals and per-call breakdown") {
    val m = new TokenMeter
    m.add("schema", 100)
    m.add("schema", 50)
    m.add("synthesis", 25)
    assert(m.totalTokens == 175)
    assert(m.tokensFor("schema") == 150)
    assert(m.tokensFor("synthesis") == 25)
    assert(m.breakdown == Map("schema" -> 150L, "synthesis" -> 25L))
  }

  test("meter is safe under concurrent adds") {
    val m = new TokenMeter
    val threads = (0 until 8).map(_ => new Thread(() => (0 until 1000).foreach(_ => m.add("c", 1))))
    threads.foreach(_.start()); threads.foreach(_.join())
    assert(m.totalTokens == 8000)
    assert(m.tokensFor("c") == 8000)
  }

  test("unknown call site reports zero") {
    assert(new TokenMeter().tokensFor("nope") == 0L)
  }
}
