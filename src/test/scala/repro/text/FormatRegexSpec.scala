package repro.text

import org.scalacheck.Gen
import repro.{PropSupport, SparkSpec}

class FormatRegexSpec extends SparkSpec with PropSupport {

  // ---- classify ------------------------------------------------------------

  test("classify capitalised word as C") { assert(FormatRegex.classify("Portland") == 'C') }
  test("classify upper-case run as U") { assert(FormatRegex.classify("NHS") == 'U') }
  test("classify lower-case run as L") { assert(FormatRegex.classify("street") == 'L') }
  test("classify digits as N") { assert(FormatRegex.classify("2024") == 'N') }
  test("classify mixed alphanumerics as A") {
    assert(FormatRegex.classify("M13") == 'A')
    assert(FormatRegex.classify("3BE") == 'A')
  }
  test("classify punctuation as P") {
    assert(FormatRegex.classify(",") == 'P')
    assert(FormatRegex.classify("--") == 'P')
  }
  test("classify single capital as U (C requires a lower-case tail)") {
    assert(FormatRegex.classify("M") == 'U')
  }
  test("classification follows the paper's priority order") {
    // "Ab" matches C before A.
    assert(FormatRegex.classify("Ab") == 'C')
    // "ab" matches L before A.
    assert(FormatRegex.classify("ab") == 'L')
  }

  // ---- lex -----------------------------------------------------------------

  test("lex separates alphanumeric and punctuation runs") {
    assert(FormatRegex.lex("18 Portland Street, M1 3BE") ==
      Seq("18", "Portland", "Street", ",", "M1", "3BE"))
  }

  test("lex groups consecutive punctuation into one run") {
    assert(FormatRegex.lex("a--b") == Seq("a", "--", "b"))
  }

  test("lex of whitespace-only input is empty") {
    assert(FormatRegex.lex("   ") == Seq.empty)
    assert(FormatRegex.lex(null) == Seq.empty)
  }

  // ---- formatString --------------------------------------------------------

  test("format of the paper's address example") {
    // 18 / Portland / Street / , / M1 / 3BE → N C C P A A → NC+PA+
    assert(FormatRegex.formatString("18 Portland Street, M1 3BE") == "NC+PA+")
  }

  test("format of a date") {
    assert(FormatRegex.formatString("2019-03-07") == "NPNPN")
  }

  test("format of a time range") {
    assert(FormatRegex.formatString("08:00-18:00") == "NPNPNPN")
  }

  test("format collapses repeats to a single plus") {
    assert(FormatRegex.formatString("a b c d") == "L+")
  }

  test("format of a postcode") {
    assert(FormatRegex.formatString("M13 9PL") == "A+")
  }

  test("format of an email") {
    assert(FormatRegex.formatString("jane.smith@nhs.uk") == "LPLPLPL")
  }

  test("format of money") {
    assert(FormatRegex.formatString("£73,648") == "PNPN")
  }

  test("format of empty/null is empty") {
    assert(FormatRegex.formatString("") == "")
    assert(FormatRegex.formatString(null) == "")
  }

  test("same-format values share format strings; different formats differ") {
    val a = FormatRegex.formatString("M1 3BE")
    val b = FormatRegex.formatString("BT7 1JL")
    val c = FormatRegex.formatString("2019-03-07")
    assert(a == b)
    assert(a != c)
  }

  // ---- properties ----------------------------------------------------------

  test("property: format strings only contain class symbols and plus") {
    val allowed = (FormatRegex.classSymbols :+ '+').toSet
    forAllGen(Gen.asciiPrintableStr) { s =>
      FormatRegex.formatString(s).foreach(c => assert(allowed.contains(c)))
    }
  }

  test("property: no two consecutive identical symbols survive collapsing") {
    forAllGen(Gen.asciiPrintableStr) { s =>
      val f = FormatRegex.formatString(s)
      f.sliding(2).foreach { w => if (w.length == 2) assert(w(0) != w(1)) }
    }
  }

  test("property: format string is deterministic") {
    forAllGen(Gen.asciiPrintableStr) { s =>
      assert(FormatRegex.formatString(s) == FormatRegex.formatString(s))
    }
  }
}
