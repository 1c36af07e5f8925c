package repro.core.mine

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.core.AttrSet

/** Incremental Berge maintenance (addEdge) vs batch recomputation — the
  * invariant MineMinSeps relies on when separators are discovered one at a
  * time.
  */
class TransversalsIncrementalSpec extends AnyFunSuite {

  test("addEdge on the empty family yields the edge's singletons") {
    val trs = Transversals.addEdge(Vector(AttrSet.empty), AttrSet.of(2, 4), AttrSet.range(6))
    assert(trs.toSet == Set(AttrSet.of(2), AttrSet.of(4)))
  }

  test("folding addEdge equals batch minimal() on random families") {
    val rnd = new Random(61)
    for (trial <- 0 until 150) {
      val n = 3 + rnd.nextInt(5)
      val ground = AttrSet.range(n)
      val edges = Vector.fill(1 + rnd.nextInt(5)) {
        AttrSet.fromSeq((0 until n).filter(_ => rnd.nextDouble() < 0.4))
      }
      val batch = Transversals.minimal(edges, ground).toSet
      val inc = edges.foldLeft(Vector(AttrSet.empty)) { (t, e) =>
        Transversals.addEdge(t, e, ground)
      }.toSet
      assert(batch == inc, s"trial=$trial edges=$edges")
    }
  }

  test("addEdge with an out-of-ground edge kills the family") {
    val trs = Transversals.addEdge(Vector(AttrSet.of(0)), AttrSet.of(9), AttrSet.range(3))
    assert(trs.isEmpty)
  }

  test("addEdge keeps previously minimal transversals that hit the new edge") {
    val t0 = Transversals.minimal(Seq(AttrSet.of(0, 1)), AttrSet.range(4))
    val t1 = Transversals.addEdge(t0, AttrSet.of(1, 2), AttrSet.range(4))
    assert(t1.contains(AttrSet.of(1))) // {1} hits both edges
    assert(t1.toSet == Set(AttrSet.of(1), AttrSet.of(0, 2)))
  }
}
