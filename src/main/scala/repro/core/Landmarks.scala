package repro.core

import repro.graph.Graph

/** Landmark-based filtering (paper §III-H).
  *
  * The `k` highest-degree vertices become landmarks; a plain BFS from each
  * precomputes exact distances to every vertex (the "LL" phase of Exp 8).
  * During label construction the filter answers two questions in O(1)/O(k)
  * without scanning label lists:
  *
  *  - if the candidate hub `w` *is* a landmark, `dis(w,u)` is known exactly,
  *    so the prune test `dis(w,u) < d` is exact and O(1) — and because the
  *    order ranks high-degree vertices first, landmark hubs dominate the
  *    candidate stream, which is the paper's motivation;
  *  - other hubs fall through to the label-scan query (a triangle-inequality
  *    sweep over all landmarks costs more than the scan it would replace).
  */
final class Landmarks(g: Graph, val k: Int) extends Serializable {

  /** Landmark vertices, highest degree first. */
  val vertices: Array[Int] =
    (0 until g.n).sortBy(v => (-g.deg(v), v)).take(k).toArray

  private val landmarkIdx: Array[Int] = {
    val a = Array.fill(g.n)(-1)
    vertices.zipWithIndex.foreach { case (v, i) => a(v) = i }
    a
  }

  /** `dist(i)(v)` = exact distance from landmark `i` to `v` (-1 unreachable). */
  val dist: Array[Array[Int]] = vertices.map(bfsDist)

  private def bfsDist(s: Int): Array[Int] = {
    val d = Array.fill(g.n)(-1)
    val queue = new Array[Int](g.n)
    var head = 0; var tail = 0
    d(s) = 0; queue(tail) = s; tail += 1
    while (head < tail) {
      val u = queue(head); head += 1
      g.foreachNbr(u)(v => if (d(v) < 0) { d(v) = d(u) + 1; queue(tail) = v; tail += 1 })
    }
    d
  }

  /** Decide the candidate `(w, u, d)` using landmark information only.
    *
    * Only the O(1) landmark-hub fast path is used: because the vertex
    * order ranks high-degree vertices first, hubs that are landmarks
    * dominate the candidate stream (the paper's §III-H observation), and
    * their prune test is exact. Scanning all landmarks by triangle
    * inequality for the remaining hubs costs more than the label scan it
    * replaces, so undecided candidates fall through.
    *
    * @return `1` = provably prune, `0` = provably keep (exact distance = d),
    *         `-1` = undecided (fall through to the label-scan query)
    */
  @inline def decide(w: Int, u: Int, d: Int): Int = {
    val wi = landmarkIdx(w)
    if (wi >= 0) {
      val dw = dist(wi)(u)
      if (dw >= 0 && dw < d) 1 else 0
    } else -1
  }
}
