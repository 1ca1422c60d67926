package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class ErrorGenSpec extends AnyFunSuite {
  import ErrorGen._

  private val attrs = Seq("a", "b", "c")
  private def clean(n: Int): Array[Array[String]] =
    Array.tabulate(n)(i => Array(s"v${i % 7}", s"w${i % 5}", (i % 100).toString))

  private def diffRate(a: Array[Array[String]], b: Array[Array[String]]): Double = {
    val cells = a.length * attrs.size
    val diff = a.indices.map(i => attrs.indices.count(j => a(i)(j) != b(i)(j))).sum
    diff.toDouble / cells
  }

  test("injection is deterministic in the seed") {
    val c = clean(500)
    val d1 = inject(c, attrs, Set("c"), mixedSpec(0.2, 42))
    val d2 = inject(c, attrs, Set("c"), mixedSpec(0.2, 42))
    assert(d1.map(_.toSeq).toSeq === d2.map(_.toSeq).toSeq)
  }

  test("different seeds give different corruption") {
    val c = clean(500)
    val d1 = inject(c, attrs, Set("c"), mixedSpec(0.2, 1))
    val d2 = inject(c, attrs, Set("c"), mixedSpec(0.2, 2))
    assert(d1.map(_.toSeq).toSeq !== d2.map(_.toSeq).toSeq)
  }

  test("realized error rate tracks the nominal rate") {
    val c = clean(2000)
    val d = inject(c, attrs, Set("c"), mixedSpec(0.2, 3))
    val r = diffRate(c, d)
    assert(r > 0.15 && r < 0.25, s"rate $r")
  }

  test("zero rate leaves data untouched") {
    val c = clean(200)
    val d = inject(c, attrs, Set("c"), mixedSpec(0.0, 4))
    assert(diffRate(c, d) === 0.0)
  }

  test("corrupted cells always differ from the original") {
    val c = clean(1000)
    val d = inject(c, attrs, Set("c"), mixedSpec(0.5, 5))
    // rate is measurable exactly because every injected error changes the cell
    assert(diffRate(c, d) > 0.4)
  }

  test("inner errors stay within the clean domain") {
    val c = clean(1000)
    val d = inject(c, attrs, Set("c"), innerSpec(0.3, 6))
    val domains = attrs.indices.map(j => c.map(_(j)).toSet)
    val offDomain = for {
      i <- c.indices; j <- attrs.indices
      if c(i)(j) != d(i)(j) && !domains(j).contains(d(i)(j))
    } yield (i, j)
    // only the typo fallback (domain of size <= 1) may leave the domain
    assert(offDomain.isEmpty)
  }

  test("outer spec produces missing values and formatting artifacts") {
    val c = clean(2000)
    val d = inject(c, attrs, Set("c"), outerSpec(0.4, 7))
    val flat = d.flatten
    assert(flat.contains(""))
    assert(flat.exists(v => v == "N/A" || v == "UNKNOWN" || v == "999" || v == "null"))
    assert(flat.exists(v => v.endsWith(" ") || v.contains("_") || v != v.toLowerCase && c.flatten.contains(v.toLowerCase)))
  }

  test("immune attributes are never corrupted") {
    val c = clean(500)
    val spec = ErrorSpec(0.5, Seq(Typo -> 1.0), 8, immuneAttrs = Set("a"))
    val d = inject(c, attrs, Set("c"), spec)
    assert(c.indices.forall(i => c(i)(0) == d(i)(0)))
  }

  test("gaussian noise keeps numeric cells numeric") {
    val c = clean(500)
    val spec = ErrorSpec(0.5, Seq(Gaussian -> 1.0), 9)
    val d = inject(c, attrs, Set("c"), spec)
    val changed = for (i <- c.indices if c(i)(2) != d(i)(2)) yield d(i)(2)
    assert(changed.nonEmpty)
    // corrupt() falls back to a typo when the rounded noise lands back on
    // the original value, so a small non-numeric share is expected
    val numeric = changed.count(v => v.matches("-?\\d+") || v.matches("-?\\d+\\.\\d+"))
    assert(numeric.toDouble / changed.size > 0.8, s"$numeric/${changed.size} numeric")
  }

  test("typo edits are single-character operations") {
    val rnd = new Random(1)
    for (_ <- 1 to 200) {
      val v = "hello world"
      val t = ErrorGen.typo(v, rnd)
      // raw typo may no-op (same-letter substitution); corrupt() retries,
      // so here only the single-edit length bound is guaranteed
      assert(math.abs(t.length - v.length) <= 1)
    }
  }

  test("format keeps content comparable modulo case/whitespace") {
    val rnd = new Random(2)
    for (_ <- 1 to 200) {
      val v = "New York"
      val f = ErrorGen.format(v, rnd)
      assert(f !== v)
      assert(f.trim.replace("_", " ").toLowerCase === v.toLowerCase)
    }
  }

  test("mixed spec weights inner 1 : outer 4") {
    val s = mixedSpec(0.1, 1)
    val inner = s.typeWeights.filter(t => !OuterTypes.contains(t._1)).map(_._2).sum
    val outer = s.typeWeights.filter(t => OuterTypes.contains(t._1)).map(_._2).sum
    assert(inner === 1.0 && outer === 4.0)
  }
}
