package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.graph.Graph

class LabelIndexSuite extends AnyFunSuite {

  private def tableIIIndex: LabelIndex = {
    val entries: Array[scala.collection.Seq[(Int, Int, Long)]] =
      Array.tabulate(10)(v => TestUtil.tableII(v).toSeq)
    LabelIndex.fromEntries(Graph.paperExampleOrder, entries)
  }

  test("fromEntries sorts each label list by hub rank") {
    val idx = tableIIIndex
    for (v <- 0 until 10) {
      val ranks = idx.hubs(v).map(idx.rank)
      assert(ranks.toSeq == ranks.sorted.toSeq, s"vertex $v")
    }
  }

  test("query reproduces the paper's Example 1: SPC(v10, v7) = 4 at distance 3") {
    val (d, c) = tableIIIndex.query(9, 6)
    assert(d == 3 && c == 4L)
  }

  test("query of a vertex with itself returns (0, 1)") {
    for (v <- 0 until 10) assert(tableIIIndex.query(v, v) == ((0, 1L)))
  }

  test("query is symmetric on the undirected example") {
    val idx = tableIIIndex
    for (s <- 0 until 10; t <- 0 until 10)
      assert(idx.query(s, t) == idx.query(t, s), s"pair ($s,$t)")
  }

  test("query with no common hub returns (-1, 0)") {
    val order = Array(0, 1)
    val entries: Array[scala.collection.Seq[(Int, Int, Long)]] =
      Array(Seq((0, 0, 1L)), Seq((1, 0, 1L)))
    val idx = LabelIndex.fromEntries(order, entries)
    assert(idx.query(0, 1) == ((-1, 0L)))
  }

  test("query sums counts over all hubs at the minimal distance") {
    // two common hubs at the same total distance: counts add up
    val order = Array(0, 1, 2, 3)
    val entries: Array[scala.collection.Seq[(Int, Int, Long)]] = Array(
      Seq((0, 1, 2L), (1, 1, 3L), (2, 0, 1L)),
      Seq((0, 1, 5L), (1, 1, 7L), (3, 0, 1L)),
      Seq((2, 0, 1L)),
      Seq((3, 0, 1L)),
    )
    val idx = LabelIndex.fromEntries(order, entries)
    assert(idx.query(0, 1) == ((2, 2L * 5 + 3L * 7)))
  }

  test("query ignores hubs at non-minimal distance") {
    val order = Array(0, 1, 2, 3)
    val entries: Array[scala.collection.Seq[(Int, Int, Long)]] = Array(
      Seq((0, 1, 2L), (1, 3, 100L), (2, 0, 1L)),
      Seq((0, 2, 5L), (1, 1, 100L), (3, 0, 1L)),
      Seq((2, 0, 1L)),
      Seq((3, 0, 1L)),
    )
    val idx = LabelIndex.fromEntries(order, entries)
    assert(idx.query(0, 1) == ((3, 10L)))
  }

  test("hub weight multiplies only when the hub is interior") {
    val order = Array(0, 1, 2)
    val w = Array(1L, 4L, 1L)
    val entries: Array[scala.collection.Seq[(Int, Int, Long)]] = Array(
      Seq((0, 0, 1L), (1, 1, 1L)).map(e => (e._1, e._2, e._3)),
      Seq((1, 0, 1L)),
      Seq((1, 1, 1L), (2, 0, 1L)),
    )
    val idx = LabelIndex.fromEntries(order, entries)
    // hub 1 interior between 0 and 2: weight applies
    assert(idx.query(0, 2, w) == ((2, 4L)))
    // hub 1 is an endpoint of (0,1): weight must not apply
    assert(idx.query(0, 1, w) == ((1, 1L)))
  }

  test("entryCount and size accounting") {
    val idx = tableIIIndex
    val expected = TestUtil.tableII.values.map(_.size).sum
    assert(idx.entryCount == expected)
    assert(idx.sizeBytes == expected * 16L)
    assert(math.abs(idx.sizeMB - expected * 16.0 / 1024 / 1024) < 1e-12)
  }

  test("canonical form is order-insensitive for entry insertion") {
    val order = Array(0, 1)
    val a = LabelIndex.fromEntries(order,
      Array[scala.collection.Seq[(Int, Int, Long)]](Seq((0, 0, 1L), (1, 1, 1L)), Seq((1, 0, 1L))))
    val b = LabelIndex.fromEntries(order,
      Array[scala.collection.Seq[(Int, Int, Long)]](Seq((1, 1, 1L), (0, 0, 1L)), Seq((1, 0, 1L))))
    TestUtil.assertSameLabels(a, b)
  }
}
