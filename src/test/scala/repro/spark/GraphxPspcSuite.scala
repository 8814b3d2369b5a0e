package repro.spark

import repro.{SparkSpec, TestUtil}
import repro.core.Pspc
import repro.graph.{Graph, GraphGen}
import repro.order.VertexOrder

class GraphxPspcSuite extends SparkSpec {

  test("GraphX PSPC reproduces the paper's Table II on the Fig. 2 graph") {
    val g = Graph.paperExample
    val idx = GraphxPspc.build(spark, g, Graph.paperExampleOrder)
    for (v <- 0 until 10)
      assert(idx.labelOf(v).toSet == TestUtil.tableII(v), s"L(v${v + 1})")
  }

  test("GraphX PSPC equals the threaded PSPC index on a random graph") {
    val g = TestUtil.randomGraph(2)
    val order = VertexOrder.degreeOrder(g)
    TestUtil.assertSameLabels(Pspc.build(g, order)._1, GraphxPspc.build(spark, g, order))
  }

  test("GraphX PSPC is exact on a power-law graph") {
    val g = GraphGen.chungLu(50, 5.0, 2.4, seed = 6)
    val order = VertexOrder.degreeOrder(g)
    TestUtil.assertIndexExact(g, GraphxPspc.build(spark, g, order))
  }

  test("GraphX PSPC honours vertex weights") {
    val g = Graph.fromEdges(4, Seq((0, 1), (1, 2), (2, 3), (3, 0)), Array(1L, 5L, 1L, 2L))
    val order = VertexOrder.degreeOrder(g)
    TestUtil.assertSameLabels(Pspc.build(g, order)._1, GraphxPspc.build(spark, g, order))
  }

  test("GraphX and DataFrame variants agree") {
    val g = GraphGen.wattsStrogatz(30, 2, 0.2, seed = 8)
    val order = VertexOrder.degreeOrder(g)
    TestUtil.assertSameLabels(
      SparkPspc.build(spark, g, order),
      GraphxPspc.build(spark, g, order),
    )
  }
}
