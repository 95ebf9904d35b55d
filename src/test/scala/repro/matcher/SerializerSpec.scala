package repro.matcher

import org.scalatest.funsuite.AnyFunSuite
import Serializer._

class SerializerSpec extends AnyFunSuite {

  private val company = Seq(
    Field("name", "CrowdStrike Plt.", isId = false),
    Field("city", "Sunnyvale", isId = false),
    Field("description", null, isId = false))

  private val security = Seq(
    Field("name", "Equity Shares", isId = false),
    Field("isin", "US318077556E", isId = true),
    Field("cusip", null, isId = true))

  test("plain scheme emits lowercased word tokens, skips nulls") {
    assert(serialize(company, Plain) == Seq("crowdstrike", "plt", "sunnyvale"))
  }

  test("plain scheme keeps identifier values as a single token") {
    assert(serialize(security, Plain) == Seq("equity", "shares", "us318077556e"))
  }

  test("ditto scheme wraps every column in [col]/[val] tags") {
    val out = serialize(company, Ditto)
    assert(out.startsWith(Seq("[col]", "na", "me", "[val]")))
    assert(out.count(_ == "[col]") == 3)
  }

  test("ditto scheme shreds long words into 2-char wordpieces") {
    val out = serialize(company, Ditto)
    assert(out.containsSlice("crowdstrike".grouped(2).toSeq))
    assert(!out.contains("crowdstrike"))
    // short words stay whole
    assert(out.contains("plt"))
  }

  test("ditto scheme serializes missing columns as none") {
    val out = serialize(company, Ditto)
    assert(out.takeRight(2) == Seq("[val]", "none"))
  }

  test("ditto scheme shreds identifier values into character tokens") {
    val out = serialize(security, Ditto)
    assert(out.containsSlice("us318077556e".map(_.toString)))
    assert(!out.contains("us318077556e"))
  }

  test("ditto serialization is strictly longer than plain") {
    assert(serialize(security, Ditto).size > serialize(security, Plain).size)
  }

  test("wordTokens splits punctuation and lowercases") {
    assert(wordTokens("Crowd-Strike, Inc.") == Seq("crowd", "strike", "inc"))
  }

  test("truncatePair leaves short pairs untouched") {
    val (a, b) = truncatePair(Seq("a", "b"), Seq("c"), 10)
    assert(a == Seq("a", "b") && b == Seq("c"))
  }

  test("truncatePair trims the longer sequence first") {
    val (a, b) = truncatePair((1 to 10).map(_.toString), Seq("x", "y"), 8)
    assert(b == Seq("x", "y"))
    assert(a == (1 to 6).map(_.toString))
  }

  test("truncatePair balances two long sequences") {
    val (a, b) = truncatePair((1 to 20).map(_.toString), (1 to 20).map(_.toString), 10)
    assert(a.size + b.size == 10)
    assert(math.abs(a.size - b.size) <= 1)
  }

  test("truncatePair respects a zero budget") {
    val (a, b) = truncatePair(Seq("a"), Seq("b"), 0)
    assert(a.isEmpty && b.isEmpty)
  }

  test("serialization is deterministic") {
    assert(serialize(security, Ditto) == serialize(security, Ditto))
  }
}
