package repro.core

import org.scalatest.funsuite.AnyFunSuite

class RulesSpec extends AnyFunSuite {

  test("FD id and attrs") {
    val fd = FD(Seq("city"), "state")
    assert(fd.id === "FD(city->state)")
    assert(fd.attrs === Seq("city", "state"))
  }

  test("FD rejects empty LHS") {
    assertThrows[IllegalArgumentException](FD(Nil, "x"))
  }

  test("FD rejects RHS inside LHS") {
    assertThrows[IllegalArgumentException](FD(Seq("a", "b"), "a"))
  }

  test("composite FD keeps LHS order") {
    val fd = FD(Seq("state", "measure"), "avg")
    assert(fd.attrs === Seq("state", "measure", "avg"))
  }

  test("Pred rejects unknown operators") {
    assertThrows[IllegalArgumentException](Pred("a", "~", PredOperand.Const("1")))
  }

  test("DC attrs collects both sides without duplicates") {
    val dc = DC("d", Seq(
      Pred("city", "=", PredOperand.Attr("city")),
      Pred("state", "!=", PredOperand.Attr("state"))))
    assert(dc.attrs === Seq("city", "state"))
  }

  test("DC equality/filter predicate split") {
    val dc = DC("tax", Seq(
      Pred("state", "=", PredOperand.Attr("state")),
      Pred("salary", ">", PredOperand.Attr("salary"), numeric = true),
      Pred("rate", "<", PredOperand.Attr("rate"), numeric = true)))
    assert(dc.equalityPreds.map(_.left) === Seq("state"))
    assert(dc.filterPreds.map(_.left) === Seq("salary", "rate"))
  }

  test("fdAsDc round-trips through dcAsFd") {
    val fd = FD(Seq("city"), "state")
    val dc = Rule.fdAsDc(fd)
    assert(Rule.dcAsFd(dc) === Some(fd))
  }

  test("fdAsDc on composite LHS round-trips") {
    val fd = FD(Seq("a", "b"), "c")
    assert(Rule.dcAsFd(Rule.fdAsDc(fd)) === Some(fd))
  }

  test("dcAsFd rejects order DCs") {
    val dc = DC("tax", Seq(
      Pred("state", "=", PredOperand.Attr("state")),
      Pred("salary", ">", PredOperand.Attr("salary"), numeric = true),
      Pred("rate", "<", PredOperand.Attr("rate"), numeric = true)))
    assert(Rule.dcAsFd(dc).isEmpty)
  }

  test("dcAsFd rejects cross-attribute equality DCs") {
    val dc = DC("cross", Seq(
      Pred("a", "=", PredOperand.Attr("b")),
      Pred("c", "!=", PredOperand.Attr("c"))))
    assert(Rule.dcAsFd(dc).isEmpty)
  }

  test("asFds keeps FDs and converts FD-shaped DCs") {
    val fd = FD(Seq("x"), "y")
    val dcFd = Rule.fdAsDc(FD(Seq("city"), "state"))
    val order = DC("tax", Seq(
      Pred("state", "=", PredOperand.Attr("state")),
      Pred("salary", ">", PredOperand.Attr("salary"), numeric = true),
      Pred("rate", "<", PredOperand.Attr("rate"), numeric = true)))
    val fds = Rule.asFds(Seq(fd, dcFd, order))
    assert(fds === Seq(fd, FD(Seq("city"), "state")))
  }

  test("DC ids are stable and distinct") {
    val a = DC("one", Seq(Pred("x", "=", PredOperand.Attr("x")), Pred("y", "!=", PredOperand.Attr("y"))))
    val b = DC("two", Seq(Pred("x", "=", PredOperand.Attr("x")), Pred("y", "!=", PredOperand.Attr("y"))))
    assert(a.id !== b.id)
  }
}
