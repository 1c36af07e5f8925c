package repro.core.schema

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.util.Deadline

class MaxIndependentSetsSpec extends AnyFunSuite {

  private def collect(n: Int, adj: Array[Array[Boolean]],
                      limit: Int = Int.MaxValue): Set[Set[Int]] = {
    val out = scala.collection.mutable.Set.empty[Set[Int]]
    MaxIndependentSets.enumerate(n, adj, limit, Deadline.unlimited)(out += _)
    out.toSet
  }

  private def emptyGraph(n: Int) = Array.fill(n, n)(false)

  test("empty graph: the single MIS is the full vertex set") {
    assert(collect(4, emptyGraph(4)) == Set(Set(0, 1, 2, 3)))
  }

  test("complete graph: each vertex is its own MIS") {
    val adj = Array.tabulate(4, 4)((i, j) => i != j)
    assert(collect(4, adj) == Set(Set(0), Set(1), Set(2), Set(3)))
  }

  test("path graph 0-1-2: MIS are {0,2} and {1}") {
    val adj = emptyGraph(3)
    adj(0)(1) = true; adj(1)(0) = true
    adj(1)(2) = true; adj(2)(1) = true
    assert(collect(3, adj) == Set(Set(0, 2), Set(1)))
  }

  test("matches brute force on random graphs") {
    val rnd = new Random(17)
    for (trial <- 0 until 150) {
      val n = 2 + rnd.nextInt(7)
      val adj = emptyGraph(n)
      for { i <- 0 until n; j <- (i + 1) until n if rnd.nextDouble() < 0.4 } {
        adj(i)(j) = true; adj(j)(i) = true
      }
      val got = collect(n, adj)
      val exp = MaxIndependentSets.bruteForce(n, adj)
      assert(got == exp, s"trial=$trial got=$got exp=$exp")
    }
  }

  test("limit caps the number of emitted sets") {
    val adj = emptyGraph(6) // single MIS — use a graph with many instead
    for { i <- 0 until 6; j <- (i + 1) until 6 if (i + j) % 2 == 1 } {
      adj(i)(j) = true; adj(j)(i) = true
    }
    val all = collect(6, adj)
    if (all.size > 1) {
      val capped = collect(6, adj, limit = 1)
      assert(capped.size == 1)
      assert(capped.subsetOf(all))
    }
  }

  test("zero vertices emits nothing") {
    assert(collect(0, emptyGraph(0)).isEmpty)
  }

  test("every emitted set is independent and maximal") {
    val rnd = new Random(19)
    for (_ <- 0 until 50) {
      val n = 3 + rnd.nextInt(6)
      val adj = emptyGraph(n)
      for { i <- 0 until n; j <- (i + 1) until n if rnd.nextDouble() < 0.5 } {
        adj(i)(j) = true; adj(j)(i) = true
      }
      collect(n, adj).foreach { s =>
        for { i <- s; j <- s if i != j } assert(!adj(i)(j))
        for (v <- 0 until n if !s.contains(v)) {
          assert(s.exists(u => adj(u)(v)), s"$s not maximal: $v addable")
        }
      }
    }
  }
}
