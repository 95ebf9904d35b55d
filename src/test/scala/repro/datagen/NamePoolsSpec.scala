package repro.datagen

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class NamePoolsSpec extends AnyFunSuite {

  test("distinctWord is deterministic in the rng seed") {
    assert(NamePools.distinctWord(new Random(1)) == NamePools.distinctWord(new Random(1)))
  }

  test("distinctWord is capitalized and alphabetic") {
    val w = NamePools.distinctWord(new Random(5))
    assert(w.head.isUpper)
    assert(w.forall(_.isLetter))
  }

  test("acronym takes first letters uppercased") {
    assert(NamePools.acronym(Seq("Advanced", "lotus", "Petroleum")) == "ALP")
  }

  test("acronym skips empty tokens") {
    assert(NamePools.acronym(Seq("Acme", "", "Corp")) == "AC")
  }

  test("paraphrase substitutes synonyms") {
    val out = NamePools.paraphrase("Acme provides cloud services")
    assert(out.contains("offers"))
    assert(!out.contains("provides"))
  }

  test("paraphrase preserves capitalization of substituted words") {
    val out = NamePools.paraphrase("Leading cloud company")
    assert(out.startsWith("Premier"))
  }

  test("paraphrase reorders sentences") {
    val out = NamePools.paraphrase("First part. Second part")
    assert(out.startsWith("Second part"))
  }

  test("paraphrase changes the text but keeps informative words") {
    val in  = "Acme is a leading company that provides cloud services worldwide."
    val out = NamePools.paraphrase(in)
    assert(out != in)
    assert(out.contains("Acme"))
    assert(out.contains("cloud"))
  }

  test("isin has country prefix, length 12") {
    val i = NamePools.isin(new Random(3), "CH")
    assert(i.startsWith("CH"))
    assert(i.length == 12)
  }

  test("cusip has length 9, valor 9 digits, sedol length 6") {
    val rng = new Random(4)
    assert(NamePools.cusip(rng).length == 9)
    val v = NamePools.valor(rng)
    assert(v.length == 9 && v.forall(_.isDigit))
    assert(NamePools.sedol(rng).length == 6)
  }

  test("identifier generators are deterministic in seed") {
    assert(NamePools.cusip(new Random(9)) == NamePools.cusip(new Random(9)))
  }

  test("different seeds give different identifiers") {
    assert(NamePools.isin(new Random(1), "US") != NamePools.isin(new Random(2), "US"))
  }
}
