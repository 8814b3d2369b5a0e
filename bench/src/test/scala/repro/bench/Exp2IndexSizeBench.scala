package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments
import repro.exp.Experiments.f2
import repro.graph.GraphGen

/** Exp 2 (Fig. 6) — index size for HP-SPC_s, PSPC and PSPC⁺. The paper's
  * headline observation: PSPC and PSPC⁺ return byte-identical indexes (no
  * dependency between threads), and HP-SPC_s is similar.
  */
class Exp2IndexSizeBench extends AnyFunSuite {

  test("Exp 2: index size (MB)") {
    assert(BenchReport.warmedUp)
    val results = GraphGen.datasetSpecs.map(Experiments.datasetResult(_))
    BenchReport.section("Exp 2: index size (MB)") {
      BenchReport.table(
        Seq("dataset", "HP-SPC_s", "PSPC(1T)", "PSPC+", "entries"),
        results.map { r =>
          Seq(r.spec.key, f2(r.hp.sizeMB), f2(r.pspc1.sizeMB), f2(r.pspcP.sizeMB),
              r.pspc1.entries.toString)
        },
      ) +
        "\nPaper: PSPC and PSPC+ sizes are identical (dependency-free rounds);\n" +
        "HP-SPC_s is similar. Here all three coincide exactly because both\n" +
        "builders compute the same canonical trough-path labels."
    }
    results.foreach { r =>
      assert(r.pspc1.entries == r.pspcP.entries,
        s"${r.spec.key}: PSPC and PSPC+ must be identical")
      assert(r.hp.entries == r.pspc1.entries,
        s"${r.spec.key}: HP-SPC_s and PSPC build the same ESPC here")
    }
  }
}
