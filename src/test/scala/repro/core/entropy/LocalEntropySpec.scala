package repro.core.entropy

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.core.{AttrSet, PropSupport, TestData}

/** Reference (naive) entropy for cross-checking the PLI oracle. */
object NaiveEntropy {
  def entropy(rel: EncodedRelation, x: AttrSet): Double = {
    if (x.isEmpty || rel.size == 0) return 0.0
    val idx = x.toSeq
    val counts = rel.rows.groupBy(r => idx.map(r(_)).toVector).values.map(_.length)
    val n = rel.size.toDouble
    counts.map { c => val p = c / n; -p * (math.log(p) / math.log(2.0)) }.sum
  }
}

class LocalEntropySpec extends AnyFunSuite with PropSupport {

  test("entropy of empty attribute set is 0") {
    val rel = TestData.randomRelation(3, 50, 4, seed = 1)
    assert(TestData.calcOf(rel).H(AttrSet.empty) == 0.0)
  }

  test("entropy of a constant column is 0") {
    val rel = EncodedRelation(Vector("A"), Array.fill(16)(Array(0)))
    val o = new LocalEntropyOracle(rel)
    assert(o.entropy(AttrSet.of(0)) == 0.0)
  }

  test("entropy of an all-distinct column is log2 N") {
    val rel = EncodedRelation(Vector("A"), Array.tabulate(16)(i => Array(i)))
    val o = new LocalEntropyOracle(rel)
    assert(math.abs(o.entropy(AttrSet.of(0)) - 4.0) < 1e-12)
  }

  test("uniform two-value column has entropy 1") {
    val rel = EncodedRelation(Vector("A"), Array.tabulate(10)(i => Array(i % 2)))
    val o = new LocalEntropyOracle(rel)
    assert(math.abs(o.entropy(AttrSet.of(0)) - 1.0) < 1e-12)
  }

  test("paper Example 3.4: H(BDE)=3/2 and H(ABCDEF)=2 on the running example") {
    val rel = repro.data.RunningExample.cleanEncoded
    val o = new LocalEntropyOracle(rel)
    import repro.data.RunningExample._
    assert(math.abs(o.entropy(AttrSet.of(B, D, E)) - 1.5) < 1e-12)
    assert(math.abs(o.entropy(AttrSet.range(6)) - 2.0) < 1e-12)
  }

  test("matches the naive entropy on random relations") {
    val rnd = new Random(42)
    for (trial <- 0 until 30) {
      val rel = TestData.randomRelation(4, 20 + rnd.nextInt(60), 3, seed = trial)
      val o = new LocalEntropyOracle(rel)
      AttrSet.subsetsOf(AttrSet.range(4)).foreach { x =>
        val got = o.entropy(x)
        val exp = NaiveEntropy.entropy(rel, x)
        assert(math.abs(got - exp) < 1e-9, s"trial=$trial x=$x got=$got exp=$exp")
      }
    }
  }

  test("monotonicity: H(XY) >= H(X)") {
    val rel = TestData.randomRelation(5, 80, 3, seed = 7)
    val o = new LocalEntropyOracle(rel)
    val omega = AttrSet.range(5)
    AttrSet.subsetsOf(omega).foreach { x =>
      AttrSet.subsetsOf(omega.diff(x)).foreach { y =>
        assert(o.entropy(x | y) >= o.entropy(x) - 1e-9)
      }
    }
  }

  test("submodularity: H(X)+H(Y) >= H(X∪Y)+H(X∩Y)") {
    val rel = TestData.randomRelation(4, 60, 3, seed = 8)
    val o = new LocalEntropyOracle(rel)
    val omega = AttrSet.range(4)
    for {
      x <- AttrSet.subsetsOf(omega).toVector
      y <- AttrSet.subsetsOf(omega).toVector
    } assert(o.entropy(x) + o.entropy(y) >= o.entropy(x | y) + o.entropy(x & y) - 1e-9)
  }

  test("H(Omega) = log2 N when all rows are distinct") {
    val rel = EncodedRelation(Vector("A", "B"), Array.tabulate(8)(i => Array(i / 2, i % 4)))
    // rows: (0,0),(0,1),(1,2),(1,3),(2,0),(2,1),(3,2),(3,3) — all distinct
    val o = new LocalEntropyOracle(rel)
    assert(math.abs(o.entropy(AttrSet.range(2)) - 3.0) < 1e-12)
  }

  test("memoization: repeated queries do not recompute") {
    val rel = TestData.randomRelation(3, 40, 3, seed = 9)
    val o = new LocalEntropyOracle(rel)
    o.entropy(AttrSet.of(0, 1))
    val comps = o.computations
    o.entropy(AttrSet.of(0, 1))
    o.entropy(AttrSet.of(0, 1))
    assert(o.computations == comps)
    assert(o.calls >= 3)
  }

  test("tiny partition cache still yields correct entropies") {
    val rel = TestData.randomRelation(5, 60, 3, seed = 10)
    val small = new LocalEntropyOracle(rel, partitionCacheCap = 1)
    val big = new LocalEntropyOracle(rel)
    AttrSet.subsetsOf(AttrSet.range(5)).foreach { x =>
      assert(math.abs(small.entropy(x) - big.entropy(x)) < 1e-12)
    }
  }

  test("fromTuples encodes value equality per column") {
    val rel = EncodedRelation.fromTuples(Vector("A", "B"),
      Seq(Seq("x", 1), Seq("x", 2), Seq("y", 1)))
    assert(rel.size == 3)
    assert(rel.rows(0)(0) == rel.rows(1)(0)) // same "x"
    assert(rel.rows(0)(0) != rel.rows(2)(0))
    assert(rel.rows(0)(1) == rel.rows(2)(1)) // same 1
  }
}
