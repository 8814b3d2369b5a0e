package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.order.VertexOrder

/** A 2-hop Exact-Shortest-Path-Covering label index.
  *
  * For each vertex `v`, `hubs(v)(i) / dists(v)(i) / cnts(v)(i)` hold the
  * entry `(w, dis(v,w), c)` where `c` is the number of trough shortest
  * paths from `v` to `w` (DESIGN.md §2). Entries are sorted by hub rank
  * (highest rank first) so two label lists intersect by merge.
  *
  * @param order the total order the index was built under (`order(rank) = v`)
  */
final class LabelIndex(
    val order: Array[Int],
    val hubs: Array[Array[Int]],
    val dists: Array[Array[Int]],
    val cnts: Array[Array[Long]],
) extends Serializable {

  val n: Int = hubs.length
  val rank: Array[Int] = VertexOrder.rankOf(order)

  /** Total number of label entries. */
  def entryCount: Long = {
    var s = 0L
    var v = 0
    while (v < n) { s += hubs(v).length; v += 1 }
    s
  }

  /** Index size in bytes at the paper's entry width (4B hub + 4B dist +
    * 8B count = 16B per entry).
    */
  def sizeBytes: Long = entryCount * 16L

  def sizeMB: Double = sizeBytes / (1024.0 * 1024.0)

  /** 2-hop SPC query: returns `(distance, count)`, or `(-1, 0)` when no
    * common hub exists (disconnected pair). Merge-intersects the two
    * rank-sorted label lists (Equations 1–2 of the paper). Hub vertices
    * with weight > 1 (equivalence reduction) contribute their weight when
    * they are interior, i.e. when the hub is neither endpoint.
    */
  def query(s: Int, t: Int, weight: Array[Long] = null): (Int, Long) = {
    val hs = hubs(s); val ds = dists(s); val cs = cnts(s)
    val ht = hubs(t); val dt = dists(t); val ct = cnts(t)
    var i = 0; var j = 0
    var bestD = Int.MaxValue
    var bestC = 0L
    while (i < hs.length && j < ht.length) {
      val ri = rank(hs(i)); val rj = rank(ht(j))
      if (ri == rj) {
        val d = ds(i) + dt(j)
        if (d < bestD) {
          bestD = d
          bestC = 0L
        }
        if (d == bestD) {
          val h = hs(i)
          val w = if (weight != null && h != s && h != t) weight(h) else 1L
          bestC += cs(i) * ct(j) * w
        }
        i += 1; j += 1
      } else if (ri < rj) i += 1
      else j += 1
    }
    if (bestD == Int.MaxValue) (-1, 0L) else (bestD, bestC)
  }

  /** The label list of `v` as `(hub, dist, cnt)` triples sorted by hub rank. */
  def labelOf(v: Int): Seq[(Int, Int, Long)] =
    hubs(v).indices.map(i => (hubs(v)(i), dists(v)(i), cnts(v)(i)))

  /** Canonical form for equality tests: per-vertex sets of entries. */
  def canonical: IndexedSeq[Set[(Int, Int, Long)]] =
    (0 until n).map(v => labelOf(v).toSet)

  /** Export as a DataFrame `(v, h, d, c)` — the shape `SparkQueries` and
    * the DuckDB oracle consume.
    */
  def toDF(spark: SparkSession): DataFrame = {
    import spark.implicits._
    val rows = for {
      v <- 0 until n
      i <- hubs(v).indices
    } yield (v, hubs(v)(i), dists(v)(i), cnts(v)(i))
    spark.createDataset(rows).toDF("v", "h", "d", "c")
  }
}

object LabelIndex {

  /** Assemble an index from per-vertex unsorted entry lists, sorting each
    * by hub rank.
    */
  def fromEntries(
      order: Array[Int],
      entries: Array[scala.collection.Seq[(Int, Int, Long)]],
  ): LabelIndex = {
    val rank = VertexOrder.rankOf(order)
    val n = entries.length
    val hubs = new Array[Array[Int]](n)
    val dists = new Array[Array[Int]](n)
    val cnts = new Array[Array[Long]](n)
    var v = 0
    while (v < n) {
      val sorted = entries(v).sortBy(e => rank(e._1))
      hubs(v) = sorted.map(_._1).toArray
      dists(v) = sorted.map(_._2).toArray
      cnts(v) = sorted.map(_._3).toArray
      v += 1
    }
    new LabelIndex(order, hubs, dists, cnts)
  }
}
