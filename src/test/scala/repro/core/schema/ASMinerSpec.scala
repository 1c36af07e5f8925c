package repro.core.schema

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{AttrSet, JoinTree, Mvd, TestData}
import repro.core.mine.MvdMiner
import repro.data.RunningExample

class ASMinerSpec extends AnyFunSuite {

  test("no MVDs yields only the universal schema") {
    val calc = TestData.calcOf(TestData.randomRelation(3, 20, 2, 1))
    val res = ASMiner.mine(calc, Vector.empty, AttrSet.range(3))
    assert(res.schemes.size == 1)
    assert(res.schemes.head.schema.bags == Vector(AttrSet.range(3)))
    assert(res.schemes.head.j == 0.0)
  }

  test("running example eps=0: all schemes exact, includes a 4-relation one") {
    val calc = TestData.calcOf(RunningExample.cleanEncoded)
    val mined = MvdMiner.mine(calc, 6, eps = 0.0)
    val res = ASMiner.mine(calc, mined.mvds, AttrSet.range(6))
    assert(res.schemes.nonEmpty)
    res.schemes.foreach(s => assert(s.j < 1e-9, s.schema.toString))
    assert(res.schemes.exists(_.schema.nRelations >= 4))
  }

  test("schemes are deduplicated") {
    val calc = TestData.calcOf(RunningExample.cleanEncoded)
    val mined = MvdMiner.mine(calc, 6, eps = 0.0)
    val res = ASMiner.mine(calc, mined.mvds, AttrSet.range(6))
    val keys = res.schemes.map(_.schema.bags.map(_.bits))
    assert(keys.distinct.size == keys.size)
  }

  test("every scheme is acyclic and covers Ω") {
    val calc = TestData.calcOf(TestData.structuredRelation(60, 5))
    val mined = MvdMiner.mine(calc, 4, eps = 0.2)
    val res = ASMiner.mine(calc, mined.mvds, AttrSet.range(4))
    res.schemes.foreach { s =>
      assert(JoinTree.fromSchema(s.schema).isDefined)
      assert(s.schema.attrs == AttrSet.range(4))
    }
  }

  test("Cor 5.2: J(S) <= (m-1)·eps for schemes built from ε-MVD support") {
    val eps = 0.3
    val calc = TestData.calcOf(TestData.randomRelation(5, 40, 2, 23))
    val mined = MvdMiner.mine(calc, 5, eps)
    val res = ASMiner.mine(calc, mined.mvds, AttrSet.range(5))
    res.schemes.foreach { s =>
      val bound = (s.schema.nRelations - 1) * eps
      assert(s.j <= bound + 1e-6, s"J=${s.j} > (m-1)ε=$bound for ${s.schema}")
    }
  }

  test("maxSchemes caps the enumeration") {
    val calc = TestData.calcOf(TestData.randomRelation(5, 30, 2, 29))
    val mined = MvdMiner.mine(calc, 5, eps = 0.5)
    if (mined.mvds.size >= 2) {
      val capped = ASMiner.mine(calc, mined.mvds, AttrSet.range(5), maxSchemes = 1)
      assert(capped.schemes.size <= 1)
    }
  }

  test("support of each scheme is pairwise compatible") {
    val calc = TestData.calcOf(TestData.structuredRelation(60, 7))
    val mined = MvdMiner.mine(calc, 4, eps = 0.3)
    val res = ASMiner.mine(calc, mined.mvds, AttrSet.range(4))
    res.schemes.foreach { s =>
      for { p <- s.support; q <- s.support if p != q } {
        assert(Compatibility.compatible(p, q))
      }
    }
  }
}
