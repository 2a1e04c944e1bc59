package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.PropChecks

/** §II-C quantity normalization: every textual quantity maps to one number. */
class QuantityParserSpec extends AnyFunSuite with PropChecks {

  private val cases = Seq(
    "1"      -> 1.0,
    "2"      -> 2.0,
    "500"    -> 500.0,
    "1/2"    -> 0.5,
    "1/4"    -> 0.25,
    "3/4"    -> 0.75,
    "1/8"    -> 0.125,
    "1/3"    -> 1.0 / 3,
    "2 1/2"  -> 2.5,      // paper example
    "1 1/2"  -> 1.5,
    "1 1/4"  -> 1.25,
    "2-4"    -> 3.0,      // paper example: averaged
    "1-2"    -> 1.5,
    "2 - 4"  -> 3.0,
    "0.5"    -> 0.5,
    "1.25"   -> 1.25,
    "10-20"  -> 15.0,
  )
  cases.foreach { case (text, value) =>
    test(s"'$text' parses to $value") {
      val got = QuantityParser.parse(text)
      assert(got.isDefined && math.abs(got.get - value) < 1e-9, s"got $got")
    }
  }

  test("whitespace is tolerated") {
    assert(QuantityParser.parse("  2 1/2  ").contains(2.5))
    assert(QuantityParser.parse("1 / 2").contains(0.5))
  }

  test("garbage yields None, never throws") {
    assert(QuantityParser.parse("").isEmpty)
    assert(QuantityParser.parse("some").isEmpty)
    assert(QuantityParser.parse(null).isEmpty)
    assert(QuantityParser.parse("-").isEmpty)
  }

  test("zero denominator yields None") {
    assert(QuantityParser.parse("1/0").isEmpty)
  }

  test("multi-token quantity falls back to the leading number") {
    // "500 g or 1 cup" style NER spans can hand over "500 1" — keep 500.
    assert(QuantityParser.parse("500 1").contains(500.0))
  }

  test("render produces recipe-style text") {
    assert(QuantityParser.render(0.5) == "1/2")
    assert(QuantityParser.render(2.5) == "2 1/2")
    assert(QuantityParser.render(3.0) == "3")
    assert(QuantityParser.render(0.25) == "1/4")
    assert(QuantityParser.render(1.25) == "1 1/4")
  }

  test("property: render/parse round-trips on representable values") {
    val gen = for {
      whole <- Gen.choose(0, 9)
      frac  <- Gen.oneOf(0.0, 0.5, 0.25, 0.75, 0.125)
      if whole + frac > 0
    } yield whole + frac
    checkProp(Prop.forAll(gen) { v =>
      QuantityParser.parse(QuantityParser.render(v)).exists(p => math.abs(p - v) < 1e-9)
    })
  }

  test("property: plain integers always parse to themselves") {
    checkProp(Prop.forAll(Gen.choose(1, 100000)) { n =>
      QuantityParser.parse(n.toString).contains(n.toDouble)
    })
  }

  test("property: ranges parse to the midpoint") {
    checkProp(Prop.forAll(Gen.choose(1, 500), Gen.choose(1, 500)) { (a, b) =>
      QuantityParser.parse(s"$a-$b").contains((a + b) / 2.0)
    })
  }
}
