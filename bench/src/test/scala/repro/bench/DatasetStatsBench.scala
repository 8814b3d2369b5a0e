package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments.{f1}
import repro.graph.GraphGen

/** Table III — dataset statistics: the paper's 10 real graphs next to our
  * deterministic synthetic analogues (DESIGN.md §5).
  */
class DatasetStatsBench extends AnyFunSuite {

  test("Table III: paper datasets vs synthetic analogues") {
    assert(BenchReport.warmedUp)
    val rows = GraphGen.datasetSpecs.map { spec =>
      val g = GraphGen.analogue(spec)
      Seq(
        spec.key, spec.paperName,
        spec.paperV.toString, spec.paperE.toString, f1(spec.paperAvgDeg),
        g.n.toString, g.m.toString, f1(g.avgDeg),
      )
    }
    BenchReport.section("Table III: dataset statistics") {
      BenchReport.table(
        Seq("key", "dataset", "paper |V|", "paper |E|", "paper d_avg",
            "ours |V|", "ours |E|", "ours d_avg"),
        rows,
      )
    }
    // the analogue must land near the paper's average degree
    for ((spec, row) <- GraphGen.datasetSpecs.zip(rows)) {
      val ours = row(7).toDouble
      assert(ours > spec.paperAvgDeg * 0.5 && ours < spec.paperAvgDeg * 2.0,
        s"${spec.key}: analogue d_avg $ours vs paper ${spec.paperAvgDeg}")
    }
  }
}
