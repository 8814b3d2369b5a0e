package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments
import repro.exp.Experiments.f2
import repro.graph.GraphGen

/** Exp 3 (Fig. 7) — mean SPC query time over random queries for
  * HP-SPC_s, PSPC (sequential) and PSPC⁺ (parallel batch).
  */
class Exp3QueryTimeBench extends AnyFunSuite {

  test("Exp 3: mean query time (microseconds)") {
    assert(BenchReport.warmedUp)
    val results = GraphGen.datasetSpecs.map(Experiments.datasetResult(_))
    BenchReport.section("Exp 3: mean query time (us)") {
      BenchReport.table(
        Seq("dataset", "HP-SPC_s", "PSPC", s"PSPC+(${Experiments.MaxThreads}T)"),
        results.map { r =>
          Seq(r.spec.key, f2(r.hp.queryUs), f2(r.pspc1.queryUs), f2(r.pspcP.queryUs))
        },
      ) +
        s"\n${Experiments.QueryCount} random queries per dataset (paper: 100k).\n" +
        "Paper: HP-SPC_s and PSPC answer in ~100us and are similar; PSPC+ gets a\n" +
        "near-linear speedup from dividing the batch across threads."
    }
    results.foreach { r =>
      // HP-SPC and PSPC share the identical index: sequential query times
      // must be in the same ballpark
      val ratio = r.hp.queryUs / r.pspc1.queryUs
      assert(ratio > 0.3 && ratio < 3.0, s"${r.spec.key}: sequential query ratio $ratio")
      // the parallel batch must win
      assert(r.pspcP.queryUs < r.pspc1.queryUs,
        s"${r.spec.key}: parallel batch should beat sequential")
    }
  }
}
