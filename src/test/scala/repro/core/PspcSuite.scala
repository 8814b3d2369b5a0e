package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.graph.{Graph, GraphGen}
import repro.order.VertexOrder

class PspcSuite extends AnyFunSuite {
  import Pspc._

  test("reproduces the paper's Table II exactly on the Fig. 2 graph") {
    val g = Graph.paperExample
    val (idx, _) = Pspc.build(g, Graph.paperExampleOrder)
    for (v <- 0 until 10)
      assert(idx.labelOf(v).toSet == TestUtil.tableII(v), s"L(v${v + 1})")
  }

  test("PSPC index equals the HP-SPC index label-for-label") {
    for (seed <- 0 until 8) {
      val g = TestUtil.randomGraph(seed)
      val order = VertexOrder.degreeOrder(g)
      TestUtil.assertSameLabels(HpSpc.build(g, order), Pspc.build(g, order)._1)
    }
  }

  for ((name, g) <- TestUtil.smallGraphs) {
    test(s"all-pairs exactness on $name (single thread)") {
      TestUtil.assertIndexExact(g, Pspc.build(g, VertexOrder.degreeOrder(g))._1)
    }
  }

  for (seed <- 0 until 10) {
    test(s"all-pairs exactness on random graph seed=$seed") {
      val g = TestUtil.randomGraph(seed)
      TestUtil.assertIndexExact(g, Pspc.build(g, VertexOrder.degreeOrder(g))._1)
    }
  }

  for (seed <- 0 until 6) {
    test(s"all-pairs exactness on power-law graph seed=$seed") {
      val g = TestUtil.randomPowerLaw(seed)
      TestUtil.assertIndexExact(g, Pspc.build(g, VertexOrder.degreeOrder(g))._1)
    }
  }

  for (threads <- Seq(2, 4, 8)) {
    test(s"index is identical with $threads threads (paper Exp 2 claim)") {
      val g = TestUtil.randomPowerLaw(3)
      val order = VertexOrder.degreeOrder(g)
      val base = Pspc.build(g, order, threads = 1)._1
      TestUtil.assertSameLabels(base, Pspc.build(g, order, threads = threads)._1)
    }
  }

  test("index is identical under the static schedule") {
    val g = TestUtil.randomPowerLaw(4)
    val order = VertexOrder.degreeOrder(g)
    val dyn = Pspc.build(g, order, threads = 4, schedule = DynamicSchedule)._1
    val sta = Pspc.build(g, order, threads = 4, schedule = StaticSchedule)._1
    TestUtil.assertSameLabels(dyn, sta)
  }

  test("push paradigm produces the same index as pull") {
    for (seed <- 0 until 6) {
      val g = TestUtil.randomGraph(seed + 50)
      val order = VertexOrder.degreeOrder(g)
      val pull = Pspc.build(g, order, threads = 3, paradigm = Pull)._1
      val push = Pspc.build(g, order, threads = 3, paradigm = Push)._1
      TestUtil.assertSameLabels(pull, push)
    }
  }

  test("push paradigm is exact on the paper example") {
    val g = Graph.paperExample
    val (idx, _) = Pspc.build(g, Graph.paperExampleOrder, paradigm = Push)
    for (v <- 0 until 10)
      assert(idx.labelOf(v).toSet == TestUtil.tableII(v), s"L(v${v + 1})")
  }

  for (k <- Seq(1, 5, 50)) {
    test(s"landmark filtering with k=$k leaves the index unchanged") {
      val g = TestUtil.randomPowerLaw(5)
      val order = VertexOrder.degreeOrder(g)
      val base = Pspc.build(g, order, threads = 2, numLandmarks = 0)._1
      val lm = Pspc.build(g, order, threads = 2, numLandmarks = k)._1
      TestUtil.assertSameLabels(base, lm)
    }
  }

  test("landmarks combined with push and static schedule stay exact") {
    val g = TestUtil.randomGraph(60)
    val order = VertexOrder.degreeOrder(g)
    val idx = Pspc.build(g, order, threads = 4, paradigm = Push,
                         schedule = StaticSchedule, numLandmarks = 10)._1
    TestUtil.assertIndexExact(g, idx)
  }

  test("exact under tree-decomposition and hybrid orders") {
    val g = GraphGen.roadGrid(7, 7, drop = 0.1, seed = 3)
    TestUtil.assertIndexExact(g, Pspc.build(g, VertexOrder.treeDecompOrder(g))._1)
    TestUtil.assertIndexExact(g, Pspc.build(g, VertexOrder.hybridOrder(g, 3))._1)
  }

  test("rounds never exceed the diameter") {
    val g = GraphGen.path(12)
    val (_, stats) = Pspc.build(g, VertexOrder.degreeOrder(g))
    assert(stats.rounds <= g.diameter)
  }

  test("stats count the label entries") {
    val g = TestUtil.randomGraph(61)
    val (idx, stats) = Pspc.build(g, VertexOrder.degreeOrder(g))
    assert(stats.entries == idx.entryCount)
  }

  test("orderMs is passed through into the stats total") {
    val g = GraphGen.path(5)
    val (_, stats) = Pspc.build(g, VertexOrder.degreeOrder(g), orderMs = 12.5)
    assert(stats.orderMs == 12.5)
    assert(stats.totalMs >= 12.5)
  }

  test("weighted graph: labels honour interior multiplicities") {
    val g = Graph.fromEdges(5, Seq((0, 1), (1, 2), (2, 3), (3, 4), (0, 4)),
                            Array(1L, 3L, 1L, 2L, 1L))
    val (idx, _) = Pspc.build(g, VertexOrder.degreeOrder(g))
    TestUtil.assertIndexExact(g, idx, g.weight)
  }

  test("weighted equivalence: PSPC equals HP-SPC on a weighted graph") {
    val g = Graph.fromEdges(6, Seq((0, 1), (1, 2), (2, 3), (3, 4), (4, 5), (5, 0), (1, 4)),
                            Array(1L, 2L, 1L, 4L, 1L, 3L))
    val order = VertexOrder.degreeOrder(g)
    TestUtil.assertSameLabels(HpSpc.build(g, order), Pspc.build(g, order)._1)
  }

  test("push paradigm matches pull on weighted graphs") {
    val g = Graph.fromEdges(6, Seq((0, 1), (1, 2), (2, 3), (3, 4), (4, 5), (5, 0), (1, 4)),
                            Array(1L, 2L, 1L, 4L, 1L, 3L))
    val order = VertexOrder.degreeOrder(g)
    val pull = Pspc.build(g, order, threads = 2, paradigm = Pull)._1
    val push = Pspc.build(g, order, threads = 2, paradigm = Push)._1
    TestUtil.assertSameLabels(pull, push)
    TestUtil.assertIndexExact(g, push, g.weight)
  }

  test("push paradigm with the static schedule matches pull") {
    val g = TestUtil.randomPowerLaw(9)
    val order = VertexOrder.degreeOrder(g)
    val pull = Pspc.build(g, order, threads = 4, schedule = StaticSchedule, paradigm = Pull)._1
    val push = Pspc.build(g, order, threads = 4, schedule = StaticSchedule, paradigm = Push)._1
    TestUtil.assertSameLabels(pull, push)
  }

  test("landmarks with an adversarial order (ascending degree) stay exact") {
    val g = TestUtil.randomGraph(70)
    val order = VertexOrder.degreeOrder(g).reverse
    TestUtil.assertIndexExact(g, Pspc.build(g, order, threads = 4, numLandmarks = 20)._1)
  }

  test("disconnected graphs: labels never bridge components") {
    val g = Graph.fromEdges(7, Seq((0, 1), (1, 2), (3, 4), (5, 6)))
    val (idx, _) = Pspc.build(g, VertexOrder.degreeOrder(g))
    TestUtil.assertIndexExact(g, idx)
    assert(idx.query(0, 3) == ((-1, 0L)))
  }

  test("single-vertex graph builds a one-entry index") {
    val g = Graph.fromEdges(1, Nil)
    val (idx, stats) = Pspc.build(g, Array(0))
    assert(idx.entryCount == 1L && stats.rounds == 0)
  }
}
