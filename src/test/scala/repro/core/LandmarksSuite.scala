package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.graph.{GraphGen, Reference}

class LandmarksSuite extends AnyFunSuite {

  test("selects the k highest-degree vertices") {
    val g = TestUtil.randomPowerLaw(2)
    val lm = new Landmarks(g, 5)
    val byDeg = (0 until g.n).sortBy(v => (-g.deg(v), v)).take(5)
    assert(lm.vertices.toSeq == byDeg)
  }

  test("landmark distances equal BFS distances") {
    val g = TestUtil.randomGraph(30)
    val lm = new Landmarks(g, 4)
    for ((l, i) <- lm.vertices.zipWithIndex) {
      val (d, _) = Reference.bfsSpc(g, l)
      assert(lm.dist(i).toSeq == d.toSeq, s"landmark $l")
    }
  }

  test("decide never prunes a candidate at its true distance") {
    val g = TestUtil.randomGraph(31)
    val lm = new Landmarks(g, 6)
    val (dist, _) = Reference.allPairs(g)
    for (w <- 0 until g.n; u <- 0 until g.n if dist(w)(u) > 0) {
      val d = dist(w)(u)
      assert(lm.decide(w, u, d) != 1, s"($w,$u) at true distance $d")
    }
  }

  test("decide prunes every candidate strictly above the true distance when w is a landmark") {
    val g = TestUtil.randomGraph(32)
    val lm = new Landmarks(g, 3)
    val (dist, _) = Reference.allPairs(g)
    for (w <- lm.vertices; u <- 0 until g.n if dist(w)(u) >= 0 && w != u) {
      assert(lm.decide(w, u, dist(w)(u) + 1) == 1)
      assert(lm.decide(w, u, dist(w)(u)) == 0)
    }
  }

  test("undecided candidates are reported as -1, never a wrong keep") {
    val g = GraphGen.cycle(12)
    val lm = new Landmarks(g, 1)
    val (dist, _) = Reference.allPairs(g)
    for (w <- 0 until g.n; u <- 0 until g.n if dist(w)(u) > 0 && !lm.vertices.contains(w)) {
      val v = lm.decide(w, u, dist(w)(u))
      assert(v == -1 || v != 1)
    }
  }

  test("k larger than n is tolerated") {
    val g = GraphGen.path(4)
    val lm = new Landmarks(g, 4)
    assert(lm.vertices.length == 4)
  }
}
