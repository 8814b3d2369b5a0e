package repro.core

import java.util.concurrent.atomic.AtomicInteger
import java.util.concurrent.{Callable, Executors}
import repro.graph.Graph
import repro.order.VertexOrder
import scala.collection.mutable

/** PSPC — the paper's parallel shortest-path-counting index construction.
  *
  * Labels are built in distance rounds instead of vertex-rank order: round
  * `d` derives every distance-`d` entry from the frozen snapshot
  * `L_{<=d-1}` via neighbor label propagation (Definition 8), so all
  * vertices inside a round are independent — no cross-thread dependency,
  * unlike the HP-SPC baseline.
  *
  * Per-candidate pruning for `(w, u, d)` pulled from `Σ_{v∈N(u)} L_{d-1}(v)`:
  *  1. rank rule (Lemma 3): drop unless `rank(w)` is strictly higher than
  *     `rank(u)`;
  *  2. Label Elimination: drop if `w` is already a hub of `u` (then
  *     `dis(w,u) < d`);
  *  3. landmark filter (§III-H), an O(1) short-circuit of rule 4 when the
  *     candidate hub is a landmark (the dominant case under degree orders);
  *  4. query rule (Lemma 4): drop if some common hub `x` of `u` and `w` has
  *     `dis(u,x) + dis(x,w) < d`.
  * Duplicate candidates merge by summing counts (Label Merging); the
  * surviving merged count is exactly the trough-path count.
  */
object Pspc {

  sealed trait Paradigm
  case object Pull extends Paradigm
  case object Push extends Paradigm

  sealed trait Schedule
  case object StaticSchedule extends Schedule
  case object DynamicSchedule extends Schedule

  /** Per-phase timing (milliseconds) — the Exp 8 breakdown. */
  final case class BuildStats(
      orderMs: Double,
      llMs: Double,
      lcMs: Double,
      rounds: Int,
      entries: Long,
  ) {
    def totalMs: Double = orderMs + llMs + lcMs
  }

  /** Build the PSPC index.
    *
    * @param g            input graph (weights honoured for reduced graphs)
    * @param order        total order, `order(rank) = vertex`
    * @param threads      worker threads (1 = the paper's "PSPC", >1 = "PSPC⁺")
    * @param paradigm     pull- or push-based propagation (Definition 9/10)
    * @param schedule     static node-order chunks or cost-based dynamic
    * @param numLandmarks 0 disables landmark filtering
    * @param orderMs      externally measured ordering time, folded into stats
    */
  def build(
      g: Graph,
      order: Array[Int],
      threads: Int = 1,
      paradigm: Paradigm = Pull,
      schedule: Schedule = DynamicSchedule,
      numLandmarks: Int = 0,
      orderMs: Double = 0.0,
  ): (LabelIndex, BuildStats) = {
    val n = g.n
    val rank = VertexOrder.rankOf(order)

    val llStart = System.nanoTime()
    val landmarks = if (numLandmarks > 0) new Landmarks(g, math.min(numLandmarks, n)) else null
    val llMs = (System.nanoTime() - llStart) / 1e6

    val lcStart = System.nanoTime()

    // Frozen label arrays; only the append phase (a barrier) replaces them.
    val hubs = Array.fill(n)(Array.empty[Int])
    val dists = Array.fill(n)(Array.empty[Int])
    val cnts = Array.fill(n)(Array.empty[Long])
    // Round-(d-1) entries of v live at indices [prevStart(v), hubs(v).length).
    val prevStart = new Array[Int](n)

    // L_0: every vertex is its own hub.
    var v = 0
    while (v < n) {
      hubs(v) = Array(v); dists(v) = Array(0); cnts(v) = Array(1L)
      v += 1
    }

    // daemon threads: an exception escaping a round must not pin the JVM
    val pool =
      if (threads > 1)
        Executors.newFixedThreadPool(
          threads,
          (r: Runnable) => { val t = new Thread(r); t.setDaemon(true); t },
        )
      else null

    /** Run `task(threadId, from, until)` over `[0, total)` according to the
      * schedule: static = contiguous equal chunks, dynamic = atomic grab of
      * small chunks (tasks pre-sorted by cost by the caller).
      */
    def parallelFor(total: Int)(task: (Int, Int, Int) => Unit): Unit = {
      if (threads <= 1 || total == 0) { task(0, 0, total); return }
      schedule match {
        case StaticSchedule =>
          val per = (total + threads - 1) / threads
          val futures = (0 until threads).map { t =>
            val from = math.min(t * per, total)
            val until = math.min(from + per, total)
            pool.submit(new Callable[Unit] { def call(): Unit = task(t, from, until) })
          }
          futures.foreach(_.get())
        case DynamicSchedule =>
          val chunk = math.max(16, total / (threads * 16))
          val next = new AtomicInteger(0)
          val futures = (0 until threads).map { t =>
            pool.submit(new Callable[Unit] {
              def call(): Unit = {
                var from = next.getAndAdd(chunk)
                while (from < total) {
                  task(t, from, math.min(from + chunk, total))
                  from = next.getAndAdd(chunk)
                }
              }
            })
          }
          futures.foreach(_.get())
      }
    }

    // Per-thread scratch: dense hub->dist table of L(u) and candidate
    // accumulators, reset via touch lists.
    final class Scratch {
      val tmpDist: Array[Int] = Array.fill(n)(-1)
      val candCnt: Array[Long] = new Array[Long](n)
      val candList: IntBuf = new IntBuf(64)
    }
    val scratches = Array.fill(math.max(1, threads))(new Scratch)

    var d = 1
    var totalNew = 1L
    var rounds = 0
    val newHubs = new Array[Array[Int]](n)
    val newCnts = new Array[Array[Long]](n)

    // task order for this round; cost-sorted when dynamic
    val taskOrder = new Array[Int](n)

    while (totalNew > 0) {
      totalNew = 0L
      // --- plan the schedule -------------------------------------------
      if (schedule == DynamicSchedule && threads > 1) {
        val cost = new Array[Long](n)
        var u = 0
        while (u < n) {
          var c = 0L
          g.foreachNbr(u)(v => c += (hubs(v).length - prevStart(v)).toLong)
          cost(u) = c
          u += 1
        }
        val sorted = Array.tabulate(n)(identity).sortBy(u => -cost(u))
        System.arraycopy(sorted, 0, taskOrder, 0, n)
      } else {
        // node-order-based static schedule: tasks laid out by rank
        System.arraycopy(order, 0, taskOrder, 0, n)
      }

      // --- phase A: compute candidates + prune (parallel, read-only) ----
      paradigm match {
        case Pull =>
          parallelFor(n) { (tid, from, until) =>
            val s = scratches(tid)
            var k = from
            while (k < until) {
              val u = taskOrder(k)
              pullVertex(u, d, s)
              k += 1
            }
          }
        case Push =>
          pushRound(d)
      }

      // --- phase B: append (parallel, each vertex owned by one thread) --
      parallelFor(n) { (_, from, until) =>
        var k = from
        while (k < until) {
          val u = taskOrder(k)
          val nh = newHubs(u)
          if (nh != null && nh.length > 0) {
            val oldLen = hubs(u).length
            val h2 = java.util.Arrays.copyOf(hubs(u), oldLen + nh.length)
            val d2 = java.util.Arrays.copyOf(dists(u), oldLen + nh.length)
            val c2 = java.util.Arrays.copyOf(cnts(u), oldLen + nh.length)
            System.arraycopy(nh, 0, h2, oldLen, nh.length)
            java.util.Arrays.fill(d2, oldLen, oldLen + nh.length, d)
            System.arraycopy(newCnts(u), 0, c2, oldLen, nh.length)
            hubs(u) = h2; dists(u) = d2; cnts(u) = c2
            prevStart(u) = oldLen
          } else {
            prevStart(u) = hubs(u).length
          }
          newHubs(u) = null; newCnts(u) = null
          k += 1
        }
      }
      var u = 0
      while (u < n) { totalNew += hubs(u).length - prevStart(u); u += 1 }
      if (totalNew > 0) rounds += 1
      d += 1
    }

    /** Pull-based candidate processing for one vertex (phase A). */
    def pullVertex(u: Int, d: Int, s: Scratch): Unit = {
      val ru = rank(u)
      val hu = hubs(u); val du = dists(u)
      var i = 0
      while (i < hu.length) { s.tmpDist(hu(i)) = du(i); i += 1 }
      s.candList.clear()
      g.foreachNbr(u) { v =>
        val hv = hubs(v); val cv = cnts(v)
        var j = prevStart(v)
        while (j < hv.length) {
          val w = hv(j)
          if (rank(w) < ru && s.tmpDist(w) < 0) {
            val mult = if (w == v) 1L else g.weight(v)
            if (s.candCnt(w) == 0L) s.candList += w
            s.candCnt(w) += cv(j) * mult
          }
          j += 1
        }
      }
      emitSurvivors(u, d, s)
      i = 0
      while (i < hu.length) { s.tmpDist(hu(i)) = -1; i += 1 }
    }

    /** Apply landmark + query pruning to `s.candList` and store survivors
      * into `newHubs(u)/newCnts(u)`. Expects `s.tmpDist` loaded with L(u).
      */
    def emitSurvivors(u: Int, d: Int, s: Scratch): Unit = {
      var outH: IntBuf = null
      var outC: LongBuf = null
      var k = 0
      while (k < s.candList.len) {
        val w = s.candList(k)
        val c = s.candCnt(w)
        s.candCnt(w) = 0L
        var verdict = -1 // -1 undecided, 0 keep, 1 prune
        if (landmarks != null) verdict = landmarks.decide(w, u, d)
        if (verdict == -1) {
          // query rule: scan L(w) for a common hub beating distance d
          val hw = hubs(w); val dw = dists(w)
          var j = 0
          verdict = 0
          while (j < hw.length && verdict == 0) {
            val t = s.tmpDist(hw(j))
            if (t >= 0 && t + dw(j) < d) verdict = 1
            j += 1
          }
        }
        if (verdict == 0) {
          if (outH == null) { outH = new IntBuf(8); outC = new LongBuf(8) }
          outH += w
          outC += c
        }
        k += 1
      }
      if (outH != null) { newHubs(u) = outH.toArray; newCnts(u) = outC.toArray }
    }

    /** Push-based round: sources emit their round-(d-1) entries to
      * neighbors, partitioned by target; per-partition threads then merge
      * and prune with the same rules as pull.
      */
    def pushRound(d: Int): Unit = {
      val parts = math.max(1, threads)
      // buffers(sourceThread)(targetPartition) = flat triples (u, w, cnt)
      val buffers =
        Array.fill(parts)(Array.fill(parts)((new IntBuf(64), new IntBuf(64), new LongBuf(64))))
      parallelFor(n) { (tid, from, until) =>
        val mine = buffers(tid)
        var k = from
        while (k < until) {
          val v = taskOrder(k)
          val hv = hubs(v); val cv = cnts(v)
          var j = prevStart(v)
          while (j < hv.length) {
            val w = hv(j)
            val rw = rank(w)
            val mult = if (w == v) 1L else g.weight(v)
            val c = cv(j) * mult
            g.foreachNbr(v) { u =>
              if (rank(u) > rw) {
                val (bu, bw, bc) = mine(u % parts)
                bu += u; bw += w; bc += c
              }
            }
            j += 1
          }
          k += 1
        }
      }
      // merge + prune per target partition
      parallelFor(parts) { (_, from, until) =>
        var p = from
        while (p < until) {
          val perTarget = mutable.HashMap.empty[Int, mutable.HashMap[Int, Long]]
          var src = 0
          while (src < parts) {
            val (bu, bw, bc) = buffers(src)(p)
            var i = 0
            while (i < bu.len) {
              val m = perTarget.getOrElseUpdate(bu(i), mutable.HashMap.empty)
              m(bw(i)) = m.getOrElse(bw(i), 0L) + bc(i)
              i += 1
            }
            src += 1
          }
          val s = new Scratch
          for ((u, cands) <- perTarget) {
            val hu = hubs(u); val du = dists(u)
            var i = 0
            while (i < hu.length) { s.tmpDist(hu(i)) = du(i); i += 1 }
            s.candList.clear()
            for ((w, c) <- cands) if (s.tmpDist(w) < 0) {
              s.candList += w
              s.candCnt(w) = c
            }
            emitSurvivors(u, d, s)
            i = 0
            while (i < hu.length) { s.tmpDist(hu(i)) = -1; i += 1 }
          }
          p += 1
        }
      }
    }

    if (pool != null) pool.shutdown()
    val lcMs = (System.nanoTime() - lcStart) / 1e6

    val entries: Array[scala.collection.Seq[(Int, Int, Long)]] =
      Array.tabulate(n)(u => hubs(u).indices.map(i => (hubs(u)(i), dists(u)(i), cnts(u)(i))))
    val idx = LabelIndex.fromEntries(order, entries)
    (idx, BuildStats(orderMs, llMs, lcMs, rounds, idx.entryCount))
  }
}
