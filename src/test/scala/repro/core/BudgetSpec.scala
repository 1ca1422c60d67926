package repro.core

import org.scalatest.funsuite.AnyFunSuite

class BudgetSpec extends AnyFunSuite {

  test("unlimited budget never trips") {
    Budget.unlimited.checkTime("x")
    Budget.unlimited.checkCells(Long.MaxValue - 1, "x")
  }

  test("expired deadline throws BudgetExceeded") {
    val b = Budget(deadlineMs = System.currentTimeMillis() - 1)
    assertThrows[BudgetExceeded](b.checkTime("late"))
  }

  test("future deadline passes") {
    Budget.timeLimit(60000).checkTime("early")
  }

  test("cell budget trips above the limit") {
    val b = Budget(maxCells = 100)
    b.checkCells(100, "ok")
    assertThrows[SimulatedOOM](b.checkCells(101, "too big"))
  }

  test("exception messages carry context") {
    val b = Budget(maxCells = 10)
    val e = intercept[SimulatedOOM](b.checkCells(11, "domain gen"))
    assert(e.getMessage.contains("domain gen"))
  }
}
