package repro.core

import org.scalatest.funsuite.AnyFunSuite

class ValuesSpec extends AnyFunSuite {

  test("norm maps null to empty string") {
    assert(Values.norm(null) == "")
    assert(Values.norm("x") == "x")
    assert(Values.norm("") == "")
  }

  test("isNull holds for null and empty only") {
    assert(Values.isNull(null))
    assert(Values.isNull(""))
    assert(!Values.isNull(" "))
    assert(!Values.isNull("a"))
  }
}
