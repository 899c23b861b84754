package repro.harness

import org.scalatest.funsuite.AnyFunSuite

class TablesRenderSpec extends AnyFunSuite {

  test("render aligns columns and includes a separator") {
    val out = Tables.render(Seq("a", "long"), Seq(Seq("xx", "1"), Seq("y", "22")))
    val lines = out.split('\n')
    assert(lines.length == 4)
    assert(lines.forall(_.length == lines.head.length))
    assert(lines(1).forall(ch => ch == '-' || ch == '|' || ch == ' '))
  }

  test("fmt picks sensible notations") {
    assert(Tables.fmt(0.0) == "0")
    assert(Tables.fmt(0.1234567) == "0.1235")
    assert(Tables.fmt(123456.0).contains("e"))
    assert(Tables.fmt(1e-6).contains("e"))
  }
}
