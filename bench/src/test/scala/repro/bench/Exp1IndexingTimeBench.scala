package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments
import repro.exp.Experiments.f1
import repro.graph.GraphGen

/** Exp 1 (Fig. 5) — indexing time for HP-SPC_s, PSPC (1 thread) and
  * PSPC⁺ (all cores) on the 10 dataset analogues. Ordering time included,
  * as in the paper.
  */
class Exp1IndexingTimeBench extends AnyFunSuite {

  test("Exp 1: indexing time (ms)") {
    assert(BenchReport.warmedUp)
    val results = GraphGen.datasetSpecs.map(Experiments.datasetResult(_))
    BenchReport.section("Exp 1: indexing time (ms)") {
      BenchReport.table(
        Seq("dataset", "HP-SPC_s", "PSPC(1T)", s"PSPC+(${Experiments.MaxThreads}T)",
            "PSPC/HP", "PSPC+/PSPC"),
        results.map { r =>
          Seq(r.spec.key, f1(r.hp.indexMs), f1(r.pspc1.indexMs), f1(r.pspcP.indexMs),
              f1(r.pspc1.indexMs / r.hp.indexMs),
              f1(r.pspcP.indexMs / r.pspc1.indexMs))
        },
      ) +
        "\nPaper: PSPC beats HP-SPC_s on 7/10 datasets single-core (~18% faster on\n" +
        "average, ~27% on YT); PSPC+ achieves >=12x speedup over PSPC at 20 threads."
    }
    // shape assertions, kept loose against timer noise
    val pspcWins = results.count(r => r.pspc1.indexMs < r.hp.indexMs)
    assert(pspcWins >= 7, s"PSPC(1T) should beat HP-SPC_s on >=7/10 datasets, won $pspcWins")
    results.foreach { r =>
      assert(r.pspcP.indexMs < r.pspc1.indexMs,
        s"${r.spec.key}: PSPC+ (${r.pspcP.indexMs}ms) must beat PSPC(1T) (${r.pspc1.indexMs}ms)")
    }
    // parallelism must buy a substantial factor on the heavier datasets
    val heavy = results.filter(_.pspc1.indexMs > 2000)
    heavy.foreach { r =>
      assert(r.pspc1.indexMs / r.pspcP.indexMs > 4,
        s"${r.spec.key}: expected >4x from ${Experiments.MaxThreads} threads")
    }
  }
}
