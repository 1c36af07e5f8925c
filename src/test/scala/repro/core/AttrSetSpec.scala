package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}

class AttrSetSpec extends AnyFunSuite with PropSupport {

  private val genSet: Gen[AttrSet] = Gen.choose(Long.MinValue, Long.MaxValue).map(b => AttrSet(b & 0xffffL))

  test("empty has size 0 and contains nothing") {
    assert(AttrSet.empty.size == 0)
    assert(AttrSet.empty.isEmpty)
    assert((0 until 64).forall(!AttrSet.empty.contains(_)))
  }

  test("of and contains") {
    val s = AttrSet.of(0, 3, 17)
    assert(s.size == 3)
    assert(s.contains(0) && s.contains(3) && s.contains(17))
    assert(!s.contains(1) && !s.contains(16))
  }

  test("add and remove are inverse") {
    val s = AttrSet.of(1, 5)
    assert((s + 9) - 9 == s)
    assert((s + 1) == s) // idempotent add
    assert((s - 9) == s) // removing absent is a no-op
  }

  test("range(n) is {0..n-1}") {
    assert(AttrSet.range(0) == AttrSet.empty)
    assert(AttrSet.range(5).toSeq == Seq(0, 1, 2, 3, 4))
    assert(AttrSet.range(64).size == 64)
  }

  test("union, intersection, difference") {
    val a = AttrSet.of(1, 2, 3)
    val b = AttrSet.of(3, 4)
    assert((a | b).toSeq == Seq(1, 2, 3, 4))
    assert((a & b).toSeq == Seq(3))
    assert(a.diff(b).toSeq == Seq(1, 2))
  }

  test("subsetOf and strictSubsetOf") {
    val a = AttrSet.of(1, 2)
    assert(a.subsetOf(AttrSet.of(1, 2, 3)))
    assert(a.subsetOf(a))
    assert(!a.strictSubsetOf(a))
    assert(a.strictSubsetOf(AttrSet.of(1, 2, 3)))
    assert(!AttrSet.of(1, 4).subsetOf(AttrSet.of(1, 2, 3)))
  }

  test("head is the minimum element") {
    assert(AttrSet.of(7, 3, 12).head == 3)
  }

  test("toSeq is sorted ascending") {
    checkProp(Prop.forAll(genSet) { s => s.toSeq == s.toSeq.sorted })
  }

  test("size matches toSeq length") {
    checkProp(Prop.forAll(genSet) { s => s.size == s.toSeq.length })
  }

  test("fromSeq round-trips toSeq") {
    checkProp(Prop.forAll(genSet) { s => AttrSet.fromSeq(s.toSeq) == s })
  }

  test("union is commutative and associative") {
    checkProp(Prop.forAll(genSet, genSet, genSet) { (a, b, c) =>
      (a | b) == (b | a) && ((a | b) | c) == (a | (b | c))
    })
  }

  test("intersection distributes over union") {
    checkProp(Prop.forAll(genSet, genSet, genSet) { (a, b, c) =>
      (a & (b | c)) == ((a & b) | (a & c))
    })
  }

  test("diff removes exactly the intersection") {
    checkProp(Prop.forAll(genSet, genSet) { (a, b) =>
      a.diff(b) == a.diff(a & b) && (a.diff(b) & b).isEmpty
    })
  }

  test("intersects agrees with non-empty intersection") {
    checkProp(Prop.forAll(genSet, genSet) { (a, b) => a.intersects(b) == (a & b).nonEmpty })
  }

  test("subsetsOf enumerates exactly 2^size submasks") {
    val s = AttrSet.of(0, 2, 5, 9)
    val subs = AttrSet.subsetsOf(s).toVector
    assert(subs.size == 16)
    assert(subs.distinct.size == 16)
    assert(subs.forall(_.subsetOf(s)))
    assert(subs.contains(AttrSet.empty) && subs.contains(s))
  }

  test("subsetsOf of empty is just empty") {
    assert(AttrSet.subsetsOf(AttrSet.empty).toVector == Vector(AttrSet.empty))
  }

  test("render uses attribute names") {
    assert(AttrSet.of(0, 2).render(Seq("A", "B", "C")) == "{A,C}")
  }
}
