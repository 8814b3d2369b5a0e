package repro.core

import repro.graph.Graph
import repro.order.VertexOrder

/** The sequential baseline HP-SPC_s (Zhang & Yu, SIGMOD'20 [17]):
  * one pruned BFS per vertex, processed in vertex-rank order.
  *
  * The BFS from hub `h` explores only vertices not yet processed (i.e.
  * ranked strictly lower than `h`), so the `(dist, cnt)` it computes for a
  * reached vertex `u` are exactly the trough shortest paths `h ⇝ u`.
  * A reached vertex is pruned — no label, no expansion — iff the 2-hop
  * query over the partial index beats the BFS depth (`Lemma 1`):
  * depth > query ⇒ prune; depth = query ⇒ non-canonical label (some
  * shortest paths run through higher hubs); depth < query ⇒ canonical
  * label. This is the order-dependent loop PSPC removes.
  */
object HpSpc {

  /** Build the ESPC index under a fixed total order. */
  def build(g: Graph, order: Array[Int]): LabelIndex = {
    val store = new LabelStore(g.n)
    val processed = new Array[Boolean](g.n)
    val scratch = new Scratch(g.n)
    var r = 0
    while (r < order.length) {
      prunedBfs(g, order(r), store, processed, scratch, wantTree = false)
      processed(order(r)) = true
      r += 1
    }
    store.toIndex(order)
  }

  /** Build with the significant-path-based dynamic order of [17]: the next
    * hub is selected from the shortest-path tree of the current hub's
    * pruned BFS (paper §III-G). Returns the index and the order produced.
    */
  def buildWithSignificantPathOrder(g: Graph): (LabelIndex, Array[Int]) = {
    val store = new LabelStore(g.n)
    val processed = new Array[Boolean](g.n)
    val scratch = new Scratch(g.n)
    val order = new Array[Int](g.n)
    // w1 = highest-degree vertex
    var h = (0 until g.n).maxBy(v => (g.deg(v), -v))
    var r = 0
    while (r < g.n) {
      order(r) = h
      prunedBfs(g, h, store, processed, scratch, wantTree = true)
      processed(h) = true
      r += 1
      if (r < g.n)
        h = VertexOrder.nextSignificantHub(g, h, scratch.parent, scratch.des, processed)
    }
    (store.toIndex(order), order)
  }

  /** Reusable per-BFS working arrays (avoids O(n) allocation per hub). */
  final class Scratch(n: Int) {
    val dist: Array[Int] = Array.fill(n)(-1)
    val cnt: Array[Long] = new Array[Long](n)
    val parent: Array[Int] = Array.fill(n)(-1)
    val des: Array[Int] = new Array[Int](n)
    val pruned: Array[Boolean] = new Array[Boolean](n)
    val queue: Array[Int] = new Array[Int](n)
    val tmpDist: Array[Int] = Array.fill(n)(-1) // hub -> dist(h, hub), for O(|L(u)|) queries
  }

  /** One pruned BFS sourced at `h`; appends this iteration's labels to
    * `store`. When `wantTree`, also records the BFS tree parents and
    * subtree descendant counts in `scratch` (for the significant-path
    * order).
    */
  private def prunedBfs(
      g: Graph,
      h: Int,
      store: LabelStore,
      processed: Array[Boolean],
      s: Scratch,
      wantTree: Boolean,
  ): Unit = {
    import s._
    if (wantTree) {
      // the significant-path order reads parent/des for exactly this BFS:
      // clear stale values from the previous iteration
      java.util.Arrays.fill(parent, -1)
      java.util.Arrays.fill(des, 0)
    }
    // load L(h) into the hub->dist table for constant-time query terms
    val lh = store.hubs(h); val ld = store.dists(h)
    var i = 0
    while (i < lh.len) { tmpDist(lh(i)) = ld(i); i += 1 }
    tmpDist(h) = 0

    var head = 0; var tail = 0
    var touched = 0
    dist(h) = 0; cnt(h) = 1L; parent(h) = -1; pruned(h) = false
    queue(tail) = h; tail += 1
    store.add(h, h, 0, 1L)
    var levelEnd = tail
    var d = 1
    while (head < tail) {
      // expand one full level so counts are complete before labeling
      while (head < levelEnd) {
        val u = queue(head); head += 1
        if (!pruned(u)) {
          val cu = if (u == h) cnt(u) else cnt(u) * g.weight(u)
          g.foreachNbr(u) { v =>
            if (!processed(v) && v != h) {
              if (dist(v) < 0) {
                dist(v) = d
                cnt(v) = cu
                parent(v) = u
                pruned(v) = false
                queue(tail) = v; tail += 1
              } else if (dist(v) == d) {
                cnt(v) += cu
              }
            }
          }
        }
      }
      // label / prune the finished level
      var k = levelEnd
      while (k < tail) {
        val u = queue(k)
        // Query(h, u, L_<i): min over common hubs via the tmpDist table
        val hu = store.hubs(u); val du = store.dists(u)
        var q = Int.MaxValue
        var j = 0
        while (j < hu.len) {
          val td = tmpDist(hu(j))
          if (td >= 0 && td + du(j) < q) q = td + du(j)
          j += 1
        }
        if (q < d) pruned(u) = true
        else store.add(u, h, d, cnt(u))
        k += 1
      }
      levelEnd = tail
      d += 1
    }
    // descendant counts for the significant-path order (labeled vertices)
    if (wantTree) {
      var k = tail - 1
      while (k >= 0) { des(queue(k)) = 1; k -= 1 }
      k = tail - 1
      while (k > 0) {
        val u = queue(k)
        if (!pruned(u) && parent(u) >= 0) des(parent(u)) += des(u)
        k -= 1
      }
    }
    // reset scratch for the vertices we touched
    touched = tail
    var k = 0
    while (k < touched) {
      val u = queue(k)
      dist(u) = -1; cnt(u) = 0L
      if (!wantTree) parent(u) = -1
      k += 1
    }
    i = 0
    while (i < lh.len) { tmpDist(lh(i)) = -1; i += 1 }
    tmpDist(h) = -1
  }
}
