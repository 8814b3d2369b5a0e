package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments
import repro.exp.Experiments.f2
import repro.graph.GraphGen

/** Exp 4 (Figs. 8–9) — scalability of PSPC⁺ with the number of threads on
  * FB, GO, GW and WI: indexing-time speedup and query-time speedup
  * relative to one thread.
  */
class Exp4SpeedupBench extends AnyFunSuite {

  private val threadCounts = Seq(1, 2, 4, 8, 16).filter(_ <= Experiments.MaxThreads)
  private val keys = Seq("FB", "GO", "GW", "WI")
  private val paperAt20 = Map("FB" -> 16.7, "GO" -> 11.8, "GW" -> 11.9, "WI" -> 15.4)

  test("Exp 4: indexing and query speedup vs #threads") {
    assert(BenchReport.warmedUp)
    val specs = keys.map(k => GraphGen.datasetSpecs.find(_.key == k).get)
    // 3x analogue scale: the paper's scalability claim is about large
    // graphs, and the smallest analogues otherwise leave the threads
    // starved (sub-second total work)
    val sweeps = specs.map(s => s.key -> Experiments.speedupSweep(s, threadCounts, scale = 3.0)).toMap

    BenchReport.section("Exp 4a: indexing-time speedup vs #threads") {
      BenchReport.table(
        Seq("dataset") ++ threadCounts.map(t => s"${t}T") ++ Seq("paper@20T"),
        keys.map { k =>
          val rows = sweeps(k)
          val base = rows.head.indexMs
          Seq(k) ++ rows.map(r => f2(base / r.indexMs)) ++ Seq(paperAt20(k).toString)
        },
      ) + "\nPaper (20 threads): FB 16.7x, GO 11.8x, GW 11.9x, WI 15.4x — near-linear."
    }
    BenchReport.section("Exp 4b: query-time speedup vs #threads") {
      BenchReport.table(
        Seq("dataset") ++ threadCounts.map(t => s"${t}T"),
        keys.map { k =>
          val rows = sweeps(k)
          val base = rows.head.queryUs
          Seq(k) ++ rows.map(r => f2(base / r.queryUs))
        },
      ) + "\nPaper: query speedup is also near-linear in the thread count."
    }

    for (k <- keys) {
      val rows = sweeps(k)
      val maxSpeedup = rows.head.indexMs / rows.last.indexMs
      assert(maxSpeedup > 3.0, s"$k: index speedup at ${threadCounts.last}T was $maxSpeedup")
      // more threads should never make indexing dramatically slower
      // (allow timer jitter around parity at 2T)
      val s2 = rows.head.indexMs / rows(1).indexMs
      assert(s2 > 0.8, s"$k: 2 threads much slower than 1 ($s2)")
      val qSpeedup = rows.head.queryUs / rows.last.queryUs
      assert(qSpeedup > 1.5, s"$k: query speedup at ${threadCounts.last}T was $qSpeedup")
    }
  }
}
