package repro.text

import org.scalacheck.Gen
import repro.{PropSupport, SparkSpec}

class TokenizerSpec extends SparkSpec with PropSupport {

  // ---- parts ---------------------------------------------------------------

  test("parts splits at punctuation") {
    assert(Tokenizer.parts("18 Portland Street, M1 3BE") == Seq("18 Portland Street", "M1 3BE"))
  }

  test("parts handles multiple punctuation runs") {
    assert(Tokenizer.parts("a,b;c") == Seq("a", "b", "c"))
  }

  test("parts drops empty segments") {
    assert(Tokenizer.parts(",,a,,") == Seq("a"))
  }

  test("parts of null is empty") {
    assert(Tokenizer.parts(null) == Seq.empty)
  }

  test("parts of empty string is empty") {
    assert(Tokenizer.parts("") == Seq.empty)
  }

  test("parts keeps internal whitespace") {
    assert(Tokenizer.parts("hello world") == Seq("hello world"))
  }

  test("parts treats hyphen as punctuation") {
    assert(Tokenizer.parts("08:00-18:00") == Seq("08", "00", "18", "00"))
  }

  // ---- words / tokens ------------------------------------------------------

  test("words lower-cases and splits on whitespace") {
    assert(Tokenizer.words("Portland  Street") == Seq("portland", "street"))
  }

  test("words of null is empty") {
    assert(Tokenizer.words(null) == Seq.empty)
  }

  test("tokens flattens parts to words") {
    assert(Tokenizer.tokens("18 Portland Street, M1 3BE") ==
      Seq("18", "portland", "street", "m1", "3be"))
  }

  test("partWords groups words by part") {
    assert(Tokenizer.partWords("18 Portland Street, M1 3BE") ==
      Seq(Seq("18", "portland", "street"), Seq("m1", "3be")))
  }

  test("partWords drops empty parts") {
    assert(Tokenizer.partWords(" , ") == Seq.empty)
  }

  // ---- q-grams -------------------------------------------------------------

  test("qgrams of 'Address' match the paper's Example 2") {
    assert(Tokenizer.qgrams("Address") == Set("addr", "ddre", "dres", "ress"))
  }

  test("qgrams normalise case and spacing") {
    assert(Tokenizer.qgrams("Practice Name") == Tokenizer.qgrams("practicename"))
  }

  test("qgrams of short names yield the whole name") {
    assert(Tokenizer.qgrams("GP") == Set("gp"))
  }

  test("qgrams of exactly q characters yield one gram") {
    assert(Tokenizer.qgrams("City") == Set("city"))
  }

  test("qgrams of null/symbol-only names are empty") {
    assert(Tokenizer.qgrams(null).isEmpty)
    assert(Tokenizer.qgrams("--").isEmpty)
  }

  test("qgrams overlap for similar names") {
    val a = Tokenizer.qgrams("Practice Name")
    val b = Tokenizer.qgrams("Practice")
    assert((a intersect b).nonEmpty)
  }

  test("qgrams with custom q") {
    assert(Tokenizer.qgrams("abcd", q = 2) == Set("ab", "bc", "cd"))
  }

  // ---- numeric detection ---------------------------------------------------

  test("isNumericValue accepts plain integers and decimals") {
    assert(Tokenizer.isNumericValue("1202"))
    assert(Tokenizer.isNumericValue("3.14"))
    assert(Tokenizer.isNumericValue("-7"))
    assert(Tokenizer.isNumericValue(".5"))
  }

  test("isNumericValue accepts currency and thousands separators") {
    assert(Tokenizer.isNumericValue("£73,648"))
    assert(Tokenizer.isNumericValue("1,234.50"))
    assert(Tokenizer.isNumericValue("$99"))
  }

  test("isNumericValue rejects text, mixed and empty") {
    assert(!Tokenizer.isNumericValue("Belfast"))
    assert(!Tokenizer.isNumericValue("M1 3BE"))
    assert(!Tokenizer.isNumericValue(""))
    assert(!Tokenizer.isNumericValue(null))
    assert(!Tokenizer.isNumericValue("12a"))
  }

  test("isNumericValue accepts scientific notation") {
    assert(Tokenizer.isNumericValue("1e5"))
    assert(Tokenizer.isNumericValue("2.5E-3"))
  }

  test("parseNumeric round-trips values") {
    assert(Tokenizer.parseNumeric("£1,234.50").contains(1234.50))
    assert(Tokenizer.parseNumeric("42").contains(42.0))
    assert(Tokenizer.parseNumeric("x").isEmpty)
    assert(Tokenizer.parseNumeric(null).isEmpty)
  }

  // ---- properties ----------------------------------------------------------

  test("property: tokens are always lower-case and non-empty") {
    forAllGen(Gen.asciiPrintableStr) { s =>
      Tokenizer.tokens(s).foreach { t =>
        assert(t.nonEmpty && t == t.toLowerCase)
      }
    }
  }

  test("property: parts contain no punctuation characters") {
    forAllGen(Gen.asciiPrintableStr) { s =>
      Tokenizer.parts(s).foreach { p =>
        assert(!p.exists(Tokenizer.isPunct))
      }
    }
  }

  test("property: qgrams have length at most q") {
    forAllGen(Gen.alphaNumStr) { s =>
      Tokenizer.qgrams(s).foreach(g => assert(g.length <= 4))
    }
  }

  test("property: parseNumeric defined iff isNumericValue") {
    forAllGen(Gen.oneOf(Gen.alphaNumStr, Gen.choose(-1e6, 1e6).map(_.toString))) { s =>
      assert(Tokenizer.parseNumeric(s).isDefined == Tokenizer.isNumericValue(s))
    }
  }
}
