package repro.jobs

import org.scalatest.funsuite.AnyFunSuite

/** The spark-submit entrypoints share the experiment harness with the bench
  * suites (exercised there); here we pin the argument plumbing.
  */
class JobsSpec extends AnyFunSuite {

  test("argInt falls back to the default") {
    assert(JobSession.argInt(Array.empty, 0, 42) == 42)
    assert(JobSession.argInt(Array("7"), 1, 42) == 42)
  }

  test("argInt parses a provided value") {
    assert(JobSession.argInt(Array("7"), 0, 42) == 7)
    assert(JobSession.argInt(Array("7", "9"), 1, 42) == 9)
  }

  test("argLong parses and falls back") {
    assert(JobSession.argLong(Array("120000"), 0, 1L) == 120000L)
    assert(JobSession.argLong(Array.empty, 0, 5L) == 5L)
  }

  test("all seven job entrypoints exist with main methods") {
    // compile-time presence check — one object per paper exhibit
    val mains: Seq[Array[String] => Unit] = Seq(
      Table2Job.main _, NurseryJob.main _, AccuracyJob.main _,
      RowScaleJob.main _, ColScaleJob.main _, QualityJob.main _,
      FullMvdJob.main _)
    assert(mains.size == 7)
  }
}
