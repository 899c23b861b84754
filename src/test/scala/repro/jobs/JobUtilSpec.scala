package repro.jobs

import org.scalatest.funsuite.AnyFunSuite

class JobUtilSpec extends AnyFunSuite {

  test("arg falls back to the default beyond the array") {
    assert(JobUtil.arg(Array("a", "b"), 0, "x") == "a")
    assert(JobUtil.arg(Array("a", "b"), 1, "x") == "b")
    assert(JobUtil.arg(Array("a", "b"), 2, "x") == "x")
    assert(JobUtil.arg(Array.empty, 0, "x") == "x")
  }
}
