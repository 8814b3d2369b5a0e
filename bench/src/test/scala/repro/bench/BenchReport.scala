package repro.bench

import repro.exp.Experiments

/** Formatting helpers for the bench suites: every suite prints one
  * clearly delimited markdown block that EXPERIMENTS.md mirrors.
  */
object BenchReport {

  def section(title: String)(body: => String): Unit = {
    println()
    println(s"==================== $title ====================")
    println(body)
    println(s"==================== end: $title ====================")
  }

  def table(header: Seq[String], rows: Seq[Seq[String]]): String =
    Experiments.mdTable(header, rows)

  /** One warm-up per bench JVM (suites share the JVM; the flag makes the
    * first suite pay it once).
    */
  lazy val warmedUp: Boolean = { Experiments.warmup(); true }
}
