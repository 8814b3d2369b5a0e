package repro

import repro.core.LabelIndex
import repro.graph.{Graph, GraphGen, Reference}

/** Shared fixtures and assertions for the test suites. */
object TestUtil {

  /** Named small graphs covering the structural corner cases. */
  def smallGraphs: Seq[(String, Graph)] = Seq(
    "single vertex" -> Graph.fromEdges(1, Nil),
    "single edge" -> Graph.fromEdges(2, Seq((0, 1))),
    "path(8)" -> GraphGen.path(8),
    "cycle(9)" -> GraphGen.cycle(9),
    "star(10)" -> GraphGen.star(10),
    "complete(6)" -> GraphGen.complete(6),
    "tree(30)" -> GraphGen.randomTree(30, seed = 3),
    "barbell(4,3)" -> GraphGen.barbell(4, 3),
    "paper fig2" -> Graph.paperExample,
    "grid road" -> GraphGen.roadGrid(6, 6, drop = 0.1, seed = 5),
    "two components" -> Graph.fromEdges(6, Seq((0, 1), (1, 2), (3, 4))),
    "watts-strogatz" -> GraphGen.wattsStrogatz(40, 2, 0.2, seed = 9),
  )

  /** Deterministic random graphs for property-style loops. */
  def randomGraph(seed: Int): Graph = {
    val rnd = new scala.util.Random(seed)
    val n = 20 + rnd.nextInt(80)
    val m = n + rnd.nextInt(3 * n)
    GraphGen.erdosRenyi(n, m, seed)
  }

  def randomPowerLaw(seed: Int): Graph =
    GraphGen.chungLu(60 + seed * 7 % 80, 6.0 + seed % 5, 2.3 + 0.05 * (seed % 6), seed)

  /** Assert the index answers every pair exactly like the BFS reference.
    * `weight` is passed through for equivalence-reduced graphs.
    */
  def assertIndexExact(g: Graph, idx: LabelIndex, weight: Array[Long] = null): Unit = {
    val (dist, cnt) = Reference.allPairs(g)
    var bad = List.empty[String]
    for (s <- 0 until g.n; t <- 0 until g.n if bad.size < 5) {
      val (qd, qc) = idx.query(s, t, weight)
      val ed = dist(s)(t)
      val ec = if (ed < 0) 0L else cnt(s)(t)
      if (qd != ed || qc != ec)
        bad ::= s"pair ($s,$t): index=($qd,$qc) reference=($ed,$ec)"
    }
    assert(bad.isEmpty, s"index disagrees with BFS reference:\n${bad.mkString("\n")}")
  }

  /** Assert two indexes carry identical label multisets (paper Exp 2:
    * the PSPC index is invariant to threads/paradigm/schedule).
    */
  def assertSameLabels(a: LabelIndex, b: LabelIndex): Unit = {
    assert(a.n == b.n)
    val ca = a.canonical; val cb = b.canonical
    for (v <- 0 until a.n)
      assert(ca(v) == cb(v), s"labels differ at vertex $v:\n  a=${ca(v)}\n  b=${cb(v)}")
  }

  /** The paper's Table II, translated to 0-based vertex ids.
    * `expected(v)` = set of (hub, dist, count).
    */
  val tableII: Map[Int, Set[(Int, Int, Long)]] = Map(
    0 -> Set((0, 0, 1L)),
    1 -> Set((0, 2, 2L), (6, 2, 1L), (3, 1, 1L), (9, 1, 1L), (1, 0, 1L)),
    2 -> Set((0, 1, 1L), (6, 2, 1L), (2, 0, 1L)),
    3 -> Set((0, 1, 1L), (6, 1, 1L), (3, 0, 1L)),
    4 -> Set((0, 1, 1L), (6, 1, 1L), (4, 0, 1L)),
    5 -> Set((0, 2, 1L), (6, 1, 1L), (2, 1, 1L), (5, 0, 1L)),
    6 -> Set((0, 2, 2L), (6, 0, 1L)),
    7 -> Set((0, 3, 3L), (6, 1, 1L), (9, 2, 1L), (7, 0, 1L)),
    8 -> Set((0, 2, 1L), (6, 2, 1L), (3, 3, 1L), (9, 1, 1L), (7, 1, 1L), (8, 0, 1L)),
    9 -> Set((0, 1, 1L), (6, 3, 2L), (3, 2, 1L), (9, 0, 1L)),
  )
}
