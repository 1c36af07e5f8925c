package repro.util

import org.scalatest.funsuite.AnyFunSuite

class DeadlineSpec extends AnyFunSuite {

  test("unlimited never fires") {
    val d = Deadline.unlimited
    Thread.sleep(2)
    assert(!d.exceeded)
  }

  test("zero budget fires immediately") {
    assert(Deadline.ofMs(0).exceeded)
  }

  test("a short budget fires after it elapses") {
    val d = Deadline.ofMs(10)
    assert(!d.exceeded || d.elapsedMs >= 10)
    Thread.sleep(25)
    assert(d.exceeded)
  }

  test("elapsedMs is monotone") {
    val d = Deadline.ofMs(1000)
    val a = d.elapsedMs
    Thread.sleep(5)
    assert(d.elapsedMs >= a)
  }
}
