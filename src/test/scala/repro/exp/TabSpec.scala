package repro.exp

import org.scalatest.funsuite.AnyFunSuite

/** The ASCII table renderer used for every experiment's output. */
class TabSpec extends AnyFunSuite {

  test("render aligns columns and includes every row") {
    val out = Tab.render("T", Seq("a", "bbbb"), Seq(Seq("x", 1.5), Seq("longer", 2.0)))
    val lines = out.split("\n")
    assert(lines.length == 5)
    assert(lines.head == "== T ==")
    assert(lines.drop(1).map(_.length).distinct.size == 1, "all table lines same width")
    assert(out.contains("longer") && out.contains("1.500"))
  }

  test("fmt renders integral doubles without decimals and fractions with 3") {
    assert(Tab.fmt(42.0) == "42")
    assert(Tab.fmt(0.12345) == "0.123")
    assert(Tab.fmt("s") == "s")
  }
}
