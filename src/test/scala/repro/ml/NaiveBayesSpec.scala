package repro.ml

import org.scalatest.funsuite.AnyFunSuite

class NaiveBayesSpec extends AnyFunSuite {

  private def xor(n: Int): (Array[Array[String]], Array[String]) = {
    val feats = Array.tabulate(n)(i => Array((i % 2).toString, ((i / 2) % 2).toString))
    val ys = feats.map(f => f(0)) // label copies feature 0
    (feats, ys)
  }

  test("fit rejects empty input") {
    assertThrows[IllegalArgumentException](new NaiveBayes().fit(Array.empty, Array.empty))
  }

  test("learns a deterministic single-feature mapping") {
    val (f, y) = xor(100)
    val nb = new NaiveBayes().fit(f, y)
    assert(nb.predict(Array("0", "0")) === "0")
    assert(nb.predict(Array("1", "1")) === "1")
    assert(nb.accuracy(f, y) === 1.0)
  }

  test("majority prior wins on unseen feature values") {
    val feats = Array.fill(9)(Array("a")) ++ Array.fill(1)(Array("b"))
    val ys = Array.fill(9)("yes") ++ Array("no")
    val nb = new NaiveBayes().fit(feats, ys)
    assert(nb.predict(Array("zzz")) === "yes")
  }

  test("classes are sorted and complete") {
    val nb = new NaiveBayes().fit(
      Array(Array("x"), Array("y"), Array("z")), Array("c", "a", "b"))
    assert(nb.classes === Seq("a", "b", "c"))
  }

  test("scoreOf unknown label is -inf") {
    val nb = new NaiveBayes().fit(Array(Array("x")), Array("a"))
    assert(nb.scoreOf(Array("x"), "nope") === Double.NegativeInfinity)
  }

  test("predictWithScore agrees with scoreOf") {
    val (f, y) = xor(40)
    val nb = new NaiveBayes().fit(f, y)
    val row = Array("1", "0")
    val (label, s) = nb.predictWithScore(row)
    assert(math.abs(s - nb.scoreOf(row, label)) < 1e-9)
    assert(nb.classes.forall(c => nb.scoreOf(row, c) <= s + 1e-9))
  }

  test("Laplace smoothing keeps unseen combinations finite") {
    val nb = new NaiveBayes().fit(
      Array(Array("p", "q"), Array("r", "s")), Array("1", "2"))
    val s = nb.scoreOf(Array("p", "s"), "1")
    assert(!s.isNegInfinity && !s.isNaN)
  }

  test("accuracy on empty evaluation set is 0") {
    val nb = new NaiveBayes().fit(Array(Array("x")), Array("a"))
    assert(nb.accuracy(Array.empty, Array.empty) === 0.0)
  }

  test("noisy labels still recover dominant signal") {
    val rnd = new scala.util.Random(4)
    val feats = Array.tabulate(500)(i => Array((i % 3).toString))
    val ys = feats.map(f => if (rnd.nextDouble() < 0.9) s"c${f(0)}" else "junk")
    val nb = new NaiveBayes().fit(feats, ys)
    assert(nb.predict(Array("0")) === "c0")
    assert(nb.predict(Array("2")) === "c2")
  }
}
