package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import org.scalacheck.rng.Seed

class UnionFindSpec extends AnyFunSuite {

  /** Sample a scalacheck generator deterministically. */
  private def samples[A](g: Gen[A], n: Int): Seq[A] =
    (0 until n).flatMap(i => g.apply(Gen.Parameters.default, Seed(i.toLong)))

  test("singleton is its own representative") {
    val uf = new UnionFind
    assert(uf.find(5L) === 5L)
  }

  test("union merges two elements") {
    val uf = new UnionFind
    uf.union(1L, 2L)
    assert(uf.find(1L) === uf.find(2L))
  }

  test("transitive merges collapse to one class") {
    val uf = new UnionFind
    uf.union(1L, 2L); uf.union(2L, 3L); uf.union(10L, 11L)
    assert(uf.find(1L) === uf.find(3L))
    assert(uf.find(10L) !== uf.find(1L))
  }

  test("classes() groups members by representative") {
    val uf = new UnionFind
    uf.union(1L, 2L); uf.union(2L, 3L); uf.union(7L, 8L)
    val cs = uf.classes().values.map(_.toSet).toSet
    assert(cs === Set(Set(1L, 2L, 3L), Set(7L, 8L)))
  }

  test("idempotent unions") {
    val uf = new UnionFind
    uf.union(1L, 2L); uf.union(1L, 2L); uf.union(2L, 1L)
    assert(uf.classes().values.map(_.size).toSeq === Seq(2))
  }

  test("property: chained unions produce a single class") {
    for (xs <- samples(Gen.nonEmptyListOf(Gen.choose(-100L, 100L)), 50)) {
      val ds = xs.distinct
      if (ds.size > 1) {
        val uf = new UnionFind
        ds.sliding(2).foreach { case List(a, b) => uf.union(a, b); case _ => }
        assert(ds.map(uf.find).distinct.size === 1)
      }
    }
  }

  test("property: find is stable under repetition") {
    for ((a, b) <- samples(Gen.zip(Gen.long, Gen.long), 100)) {
      val uf = new UnionFind
      uf.union(a, b)
      assert(uf.find(a) === uf.find(a))
      assert(uf.find(a) === uf.find(b))
    }
  }
}
