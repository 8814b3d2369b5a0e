package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments
import repro.exp.Experiments.{f1, f2}

/** Exp 6 (Fig. 11) — the effect of the core/fringe threshold δ of the
  * hybrid order on index time, index size and query time (road graph).
  */
class Exp6DeltaBench extends AnyFunSuite {

  test("Exp 6: delta sweep on the road graph") {
    assert(BenchReport.warmedUp)
    val road = Experiments.roadGraph()
    val deltas = Seq(0, 1, 2, 3, 4, 6)
    val rows = Experiments.deltaSweep(road, deltas)
    BenchReport.section("Exp 6: effect of threshold delta (hybrid order)") {
      BenchReport.table(
        Seq("delta", "index ms", "index MB", "query us"),
        rows.map(r => Seq(r.delta.toString, f1(r.indexMs), f2(r.sizeMB), f2(r.queryUs))),
      ) +
        "\ndelta=0: everything core (degree order); large delta: everything fringe\n" +
        "(tree-decomposition order). Paper: time/size/query dip then rise; δ=5 chosen."
    }
    assert(rows.map(_.delta) == deltas)
    // index size must vary with delta (the knob is live) but stay bounded
    val sizes = rows.map(_.sizeMB)
    assert(sizes.max < sizes.min * 20, s"sizes exploded: $sizes")
  }
}
