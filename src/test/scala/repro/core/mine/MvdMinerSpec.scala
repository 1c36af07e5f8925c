package repro.core.mine

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{AttrSet, JoinTree, TestData}
import repro.data.RunningExample

class MvdMinerSpec extends AnyFunSuite {

  test("running example at eps=0 recovers the support MVDs' separators") {
    val calc = TestData.calcOf(RunningExample.cleanEncoded)
    val res = MvdMiner.mine(calc, 6, eps = 0.0)
    assert(!res.timedOut)
    val seps = res.distinctMinSeps.toSet
    import RunningExample._
    // the join-tree separators A, AD, BD must all be (or contain) minimal seps
    val tree = JoinTree.fromSchema(paperSchema).get
    tree.separators.foreach { s =>
      assert(seps.exists(_.subsetOf(s)), s"no minimal separator inside $s; got $seps")
    }
  }

  test("running example: every mined MVD holds at eps=0") {
    val calc = TestData.calcOf(RunningExample.cleanEncoded)
    val res = MvdMiner.mine(calc, 6, eps = 0.0)
    res.mvds.foreach { m => assert(calc.holds(m, 0.0), m.toString) }
    assert(res.mvds.nonEmpty)
  }

  test("mined MVDs are deduplicated and full") {
    val calc = TestData.calcOf(TestData.structuredRelation(60, 1))
    val res = MvdMiner.mine(calc, 4, eps = 0.1)
    assert(res.mvds.distinct.size == res.mvds.size)
    // no mined MVD strictly refines another mined MVD with the same key...
    // (full within its own discovery; cross-pair duplicates are removed)
    res.mvds.foreach { m => assert(calc.holds(m, 0.1)) }
  }

  test("larger epsilon never yields fewer minimal separators per pair") {
    val calc = TestData.calcOf(TestData.randomRelation(4, 40, 2, 11))
    val r0 = MvdMiner.mine(calc, 4, eps = 0.0)
    val r5 = MvdMiner.mine(calc, 4, eps = 0.5)
    // every eps=0 separator set remains separating at eps=0.5, so every pair
    // with a separator at 0 has one at 0.5
    r0.minSeps.keys.foreach { pair => assert(r5.minSeps.contains(pair)) }
  }

  test("timeLimit=0 returns quickly with timedOut=true") {
    val calc = TestData.calcOf(TestData.randomRelation(6, 40, 3, 12))
    val res = MvdMiner.mine(calc, 6, eps = 0.0, timeLimitMs = 0)
    assert(res.timedOut)
  }

  test("minSepsOnly skips the full-MVD expansion") {
    val calc = TestData.calcOf(TestData.structuredRelation(50, 2))
    val res = MvdMiner.mine(calc, 4, eps = 0.2, minSepsOnly = true)
    assert(res.mvds.isEmpty)
    assert(res.minSeps.nonEmpty)
  }

  test("entropy call accounting is populated") {
    val calc = TestData.calcOf(TestData.randomRelation(4, 30, 2, 13))
    val res = MvdMiner.mine(calc, 4, eps = 0.0)
    assert(res.entropyCalls > 0)
    assert(res.entropyComputations <= res.entropyCalls)
  }

  test("every mined MVD separates some pair with a minimal-separator key") {
    val calc = TestData.calcOf(TestData.structuredRelation(60, 3))
    val res = MvdMiner.mine(calc, 4, eps = 0.3)
    val allSeps = res.minSeps.values.flatten.toSet
    res.mvds.foreach { m => assert(allSeps.contains(m.key)) }
  }
}
