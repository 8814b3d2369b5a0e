package repro.core

import java.util.concurrent.{Callable, Executors}
import repro.graph.Graph

/** SPC query evaluation over a label index (paper §IV "Query Evaluation in
  * Parallel"): queries are independent, so a batch is split dynamically
  * across threads; each query is the 2-hop merge-intersection of
  * `LabelIndex.query`.
  */
object QueryEngine {

  /** Evaluate one query. `weight` only matters on equivalence-reduced
    * graphs (hub multiplicity).
    */
  def query(idx: LabelIndex, s: Int, t: Int, weight: Array[Long] = null): (Int, Long) =
    idx.query(s, t, weight)

  /** Evaluate a batch with `threads` workers; returns `(dist, cnt)` per
    * query, aligned with the input.
    */
  def batch(
      idx: LabelIndex,
      queries: Array[(Int, Int)],
      threads: Int = 1,
      weight: Array[Long] = null,
  ): Array[(Int, Long)] = {
    val out = new Array[(Int, Long)](queries.length)
    if (threads <= 1) {
      var i = 0
      while (i < queries.length) {
        out(i) = idx.query(queries(i)._1, queries(i)._2, weight)
        i += 1
      }
      out
    } else {
      val pool = Executors.newFixedThreadPool(
        threads,
        (r: Runnable) => { val t = new Thread(r); t.setDaemon(true); t },
      )
      try {
        val next = new java.util.concurrent.atomic.AtomicInteger(0)
        val chunk = math.max(64, queries.length / (threads * 8))
        val futures = (0 until threads).map { _ =>
          pool.submit(new Callable[Unit] {
            def call(): Unit = {
              var from = next.getAndAdd(chunk)
              while (from < queries.length) {
                val until = math.min(from + chunk, queries.length)
                var i = from
                while (i < until) {
                  out(i) = idx.query(queries(i)._1, queries(i)._2, weight)
                  i += 1
                }
                from = next.getAndAdd(chunk)
              }
            }
          })
        }
        futures.foreach(_.get())
      } finally pool.shutdown()
      out
    }
  }

  /** Deterministic random query workload over the vertices of `g`. */
  def randomQueries(g: Graph, count: Int, seed: Long): Array[(Int, Int)] = {
    val rnd = new scala.util.Random(seed)
    Array.fill(count)((rnd.nextInt(g.n), rnd.nextInt(g.n)))
  }
}
