package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.PropSupport

class UnionFindSpec extends AnyFunSuite with PropSupport {

  test("singletons are their own components") {
    val uf = new UnionFind(5)
    assert((0 until 5).map(uf.find) == (0 until 5))
    assert(uf.components().size == 5)
  }

  test("union merges two components") {
    val uf = new UnionFind(4)
    assert(uf.union(0, 1))
    assert(uf.find(0) == uf.find(1))
    assert(uf.find(2) != uf.find(0))
  }

  test("union returns false when already joined") {
    val uf = new UnionFind(3)
    assert(uf.union(0, 1))
    assert(!uf.union(1, 0))
  }

  test("transitive chains collapse to one component") {
    val uf = new UnionFind(6)
    uf.union(0, 1); uf.union(1, 2); uf.union(3, 4); uf.union(2, 3)
    assert(Set(0, 1, 2, 3, 4).map(uf.find).size == 1)
    assert(uf.find(5) != uf.find(0))
  }

  test("components groups all members") {
    val uf = new UnionFind(5)
    uf.union(0, 2); uf.union(1, 3)
    val comps = uf.components()
    assert(comps.values.map(_.toSet).toSet == Set(Set(0, 2), Set(1, 3), Set(4)))
  }

  test("components sizes sum to n") {
    val uf = new UnionFind(10)
    uf.union(0, 1); uf.union(2, 3); uf.union(3, 4)
    assert(uf.components().values.map(_.size).sum == 10)
  }

  test("property: component count = n - successful unions") {
    val gen = Gen.zip(Gen.choose(2, 40), Gen.listOf(Gen.zip(Gen.choose(0, 200), Gen.choose(0, 200))))
    checkProp(Prop.forAll(gen) { case (n, pairs) =>
      val uf = new UnionFind(n)
      val merges = pairs.map { case (a, b) => uf.union(a % n, b % n) }.count(identity)
      uf.components().size == n - merges
    })
  }

  test("property: find idempotent, unioned pairs share a root") {
    val gen = Gen.listOfN(20, Gen.zip(Gen.choose(0, 9), Gen.choose(0, 9)))
    checkProp(Prop.forAll(gen) { pairs =>
      val uf = new UnionFind(10)
      pairs.foreach { case (a, b) => uf.union(a, b) }
      (0 until 10).forall(i => uf.find(i) == uf.find(uf.find(i))) &&
        pairs.forall { case (a, b) => uf.find(a) == uf.find(b) }
    })
  }
}
