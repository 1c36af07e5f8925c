package repro.core.schema

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{AttrSet, JoinTree, Mvd, Schema, TestData}
import repro.core.mine.MvdMiner
import repro.data.RunningExample

class SchemaSynthesisSpec extends AnyFunSuite {

  private val omega6 = AttrSet.range(6)

  test("empty Q yields the universal schema {Ω}") {
    val s = SchemaSynthesis.build(Nil, omega6)
    assert(s.bags == Vector(omega6))
  }

  test("a single standard MVD yields its two-relation schema") {
    import RunningExample._
    val phi = Mvd.of(AttrSet.of(A), Vector(AttrSet.of(F), AttrSet.of(B, C, D, E)))
    val s = SchemaSynthesis.build(Seq(phi), omega6)
    assert(s.bags.toSet == Set(AttrSet.of(A, F), AttrSet.of(A, B, C, D, E)))
  }

  test("the paper support rebuilds the paper schema {ABD, ACD, BDE, AF}") {
    import RunningExample._
    val t = JoinTree.fromSchema(paperSchema).get
    val s = SchemaSynthesis.build(t.support, omega6)
    assert(s.bags.toSet == paperSchema.bags.toSet, s.render(RunningExample.names))
  }

  test("synthesized schema is acyclic and its support is within Q (Thm 7.4)") {
    import RunningExample._
    val t = JoinTree.fromSchema(paperSchema).get
    val q = t.support
    val s = SchemaSynthesis.build(q, omega6)
    val t2 = JoinTree.fromSchema(s)
    assert(t2.isDefined)
    // MVD(T') ⊆ Q up to coarsening: each support MVD of the rebuilt tree
    // must be implied by (have the same key as) some MVD in Q.
    t2.get.support.foreach { m =>
      assert(q.exists(_.key == m.key), s"support ${m} has foreign key")
    }
  }

  test("redundant MVD (splitting nothing new) leaves the schema unchanged") {
    val omega = AttrSet.range(4)
    val phi = Mvd.of(AttrSet.of(0), Vector(AttrSet.of(3), AttrSet.of(1, 2)))
    val s1 = SchemaSynthesis.build(Seq(phi), omega)
    assert(s1.bags.toSet == Set(AttrSet.of(0, 3), AttrSet.of(0, 1, 2)))
    // an MVD whose dependents collapse to a single part inside its bag is
    // redundant: 013 ↠ 2 | (nothing of this bag) cannot split {0,1,2}.
    val redundant = Mvd.of(AttrSet.of(0, 1), Vector(AttrSet.of(2), AttrSet.of(3)))
    val s2 = SchemaSynthesis.build(Seq(phi, redundant), omega)
    // phi splits first (smaller key); redundant then applies to bag {0,1,2}
    // where only dependent {2} is present → single part → skipped.
    assert(s2.bags.toSet == s1.bags.toSet)
  }

  test("input order does not matter (keys are sorted internally)") {
    val omega = AttrSet.range(5)
    val coarse = Mvd.of(AttrSet.of(0), Vector(AttrSet.of(1, 2), AttrSet.of(3, 4)))
    val finer = Mvd.of(AttrSet.of(0, 1), Vector(AttrSet.of(2), AttrSet.of(3, 4)))
    val s = SchemaSynthesis.build(Seq(finer, coarse), omega)
    val s2 = SchemaSynthesis.build(Seq(coarse, finer), omega)
    assert(s.bags.toSet == s2.bags.toSet)
  }

  test("synthesis from mined MVDs of the running example recovers J=0 schemas") {
    val calc = TestData.calcOf(RunningExample.cleanEncoded)
    val res = MvdMiner.mine(calc, 6, eps = 0.0)
    val schemes = ASMiner.mine(calc, res.mvds, omega6)
    assert(schemes.schemes.nonEmpty)
    // at eps=0 every enumerated schema must be exact (Cor. 5.2 with ε=0)
    schemes.schemes.foreach { sc => assert(sc.j < 1e-9, sc.schema.toString) }
    // the paper's 4-relation schema (or a refinement of equal coverage) shows up
    val best = schemes.schemes.map(_.schema.nRelations).max
    assert(best >= 4, s"expected a 4-relation exact schema, best=$best")
  }
}
