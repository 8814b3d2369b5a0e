package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments
import repro.exp.Experiments.f1
import repro.graph.GraphGen

/** Exp 7 (Fig. 12) — the effect of the number of landmarks on indexing
  * time (landmarks do not change the index, only the construction).
  */
class Exp7LandmarksBench extends AnyFunSuite {

  test("Exp 7: landmark-count sweep") {
    assert(BenchReport.warmedUp)
    val ks = Seq(0, 10, 50, 100, 200, 400)
    val keys = Seq("FB", "WI")
    val specs = keys.map(k => GraphGen.datasetSpecs.find(_.key == k).get)
    val sweeps = specs.map(s => s.key -> Experiments.landmarkSweep(s, ks)).toMap
    BenchReport.section("Exp 7: effect of #landmarks on index time (ms)") {
      BenchReport.table(
        Seq("dataset") ++ ks.map(k => s"k=$k"),
        keys.map(k => Seq(k) ++ sweeps(k).map(r => f1(r.indexMs))),
      ) +
        "\nPaper: index time decreases with the first landmarks, then increases as\n" +
        "the per-candidate filter scan starts to dominate (k=100 default)."
    }
    for (k <- keys) {
      val rows = sweeps(k)
      assert(rows.map(_.k) == ks)
      // the largest k should cost more than the best k (the U-shape's right edge)
      val best = rows.map(_.indexMs).min
      assert(rows.last.indexMs >= best, s"$k: k=400 should not be the minimum")
    }
  }
}
