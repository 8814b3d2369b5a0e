package repro.spark

import repro.{SparkSpec, TestUtil}
import repro.core.Pspc
import repro.graph.{Graph, GraphGen}
import repro.order.VertexOrder

class SparkPspcSuite extends SparkSpec {

  test("DataFrame PSPC reproduces the paper's Table II on the Fig. 2 graph") {
    val g = Graph.paperExample
    val idx = SparkPspc.build(spark, g, Graph.paperExampleOrder)
    for (v <- 0 until 10)
      assert(idx.labelOf(v).toSet == TestUtil.tableII(v), s"L(v${v + 1})")
  }

  test("DataFrame PSPC equals the threaded PSPC index on random graphs") {
    for (seed <- Seq(0, 1)) {
      val g = TestUtil.randomGraph(seed)
      val order = VertexOrder.degreeOrder(g)
      val local = Pspc.build(g, order)._1
      val dist = SparkPspc.build(spark, g, order)
      TestUtil.assertSameLabels(local, dist)
    }
  }

  test("DataFrame PSPC is exact on a power-law graph") {
    val g = GraphGen.chungLu(60, 6.0, 2.4, seed = 4)
    val order = VertexOrder.degreeOrder(g)
    TestUtil.assertIndexExact(g, SparkPspc.build(spark, g, order))
  }

  test("DataFrame PSPC honours vertex weights") {
    val g = Graph.fromEdges(5, Seq((0, 1), (1, 2), (2, 3), (3, 4), (0, 4)),
                            Array(1L, 3L, 1L, 2L, 1L))
    val order = VertexOrder.degreeOrder(g)
    val local = Pspc.build(g, order)._1
    TestUtil.assertSameLabels(local, SparkPspc.build(spark, g, order))
  }

  test("DataFrame PSPC handles a disconnected graph") {
    val g = Graph.fromEdges(6, Seq((0, 1), (1, 2), (3, 4)))
    val order = VertexOrder.degreeOrder(g)
    TestUtil.assertIndexExact(g, SparkPspc.build(spark, g, order))
  }

  test("label DataFrame has the expected schema and row count") {
    val g = GraphGen.cycle(8)
    val order = VertexOrder.degreeOrder(g)
    val df = SparkPspc.buildLabels(spark, g, order)
    assert(df.columns.toSeq == Seq("v", "h", "d", "c"))
    val local = Pspc.build(g, order)._1
    assert(df.count() == local.entryCount)
  }
}
