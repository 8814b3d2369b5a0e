package repro.jobs

import repro.exp.Experiments
import repro.exp.Experiments.{f1, f2, mdTable}
import repro.graph.GraphGen

/** Thin CLI entrypoints, one per paper table/experiment, so every number in
  * EXPERIMENTS.md can be regenerated with
  * `sbt "runMain repro.jobs.<Name>"` (or spark-submit for the Spark job).
  */
object DatasetStatsJob {
  def main(args: Array[String]): Unit = {
    println(mdTable(
      Seq("key", "dataset", "paper |V|", "paper |E|", "paper d_avg", "ours |V|", "ours |E|", "ours d_avg"),
      GraphGen.datasetSpecs.map { s =>
        val g = GraphGen.analogue(s)
        Seq(s.key, s.paperName, s.paperV.toString, s.paperE.toString, f1(s.paperAvgDeg),
            g.n.toString, g.m.toString, f1(g.avgDeg))
      },
    ))
  }
}

object Exp1Job {
  def main(args: Array[String]): Unit = {
    Experiments.warmup()
    println(mdTable(
      Seq("dataset", "HP-SPC_s ms", "PSPC(1T) ms", "PSPC+ ms"),
      GraphGen.datasetSpecs.map { s =>
        val r = Experiments.datasetResult(s)
        Seq(s.key, f1(r.hp.indexMs), f1(r.pspc1.indexMs), f1(r.pspcP.indexMs))
      },
    ))
  }
}

object Exp2Job {
  def main(args: Array[String]): Unit = {
    Experiments.warmup()
    println(mdTable(
      Seq("dataset", "HP-SPC_s MB", "PSPC MB", "PSPC+ MB"),
      GraphGen.datasetSpecs.map { s =>
        val r = Experiments.datasetResult(s)
        Seq(s.key, f2(r.hp.sizeMB), f2(r.pspc1.sizeMB), f2(r.pspcP.sizeMB))
      },
    ))
  }
}

object Exp3Job {
  def main(args: Array[String]): Unit = {
    Experiments.warmup()
    println(mdTable(
      Seq("dataset", "HP-SPC_s us", "PSPC us", "PSPC+ us"),
      GraphGen.datasetSpecs.map { s =>
        val r = Experiments.datasetResult(s)
        Seq(s.key, f2(r.hp.queryUs), f2(r.pspc1.queryUs), f2(r.pspcP.queryUs))
      },
    ))
  }
}

object Exp4Job {
  def main(args: Array[String]): Unit = {
    Experiments.warmup()
    val threads = Seq(1, 2, 4, 8, 16).filter(_ <= Experiments.MaxThreads)
    for (key <- Seq("FB", "GO", "GW", "WI")) {
      val spec = GraphGen.datasetSpecs.find(_.key == key).get
      val rows = Experiments.speedupSweep(spec, threads, scale = 3.0)
      val base = rows.head
      println(s"### $key")
      println(mdTable(
        Seq("threads", "index ms", "index speedup", "query us", "query speedup"),
        rows.map(r => Seq(r.threads.toString, f1(r.indexMs), f2(base.indexMs / r.indexMs),
                          f2(r.queryUs), f2(base.queryUs / r.queryUs))),
      ))
    }
  }
}

object Exp5Job {
  def main(args: Array[String]): Unit = {
    Experiments.warmup()
    val keys = Seq("FB", "GW", "WI", "GO")
    println("### 5a: landmark labeling")
    println(mdTable(Seq("dataset", "LL ms", "NLL ms"), keys.map { k =>
      val s = GraphGen.datasetSpecs.find(_.key == k).get
      val (ll, nll) = Experiments.ablationLandmarks(s)
      Seq(k, f1(ll), f1(nll))
    }))
    println("### 5b: schedule")
    println(mdTable(Seq("dataset", "dynamic ms", "static ms"), keys.map { k =>
      val s = GraphGen.datasetSpecs.find(_.key == k).get
      val (d, st) = Experiments.ablationSchedule(s)
      Seq(k, f1(d), f1(st))
    }))
    println("### 5c: node orders (road graph)")
    println(mdTable(
      Seq("order", "order ms", "total ms", "LC ms", "MB"),
      Experiments.ablationOrders(Experiments.roadGraph())
        .map(r => Seq(r.order, f1(r.orderMs), f1(r.indexMs), f1(r.lcMs), f2(r.sizeMB))),
    ))
  }
}

object Exp6Job {
  def main(args: Array[String]): Unit = {
    Experiments.warmup()
    println(mdTable(
      Seq("delta", "index ms", "MB", "query us"),
      Experiments.deltaSweep(Experiments.roadGraph(), Seq(0, 1, 2, 3, 4, 6))
        .map(r => Seq(r.delta.toString, f1(r.indexMs), f2(r.sizeMB), f2(r.queryUs))),
    ))
  }
}

object Exp7Job {
  def main(args: Array[String]): Unit = {
    Experiments.warmup()
    for (key <- Seq("FB", "WI")) {
      val s = GraphGen.datasetSpecs.find(_.key == key).get
      println(s"### $key")
      println(mdTable(
        Seq("#landmarks", "index ms"),
        Experiments.landmarkSweep(s, Seq(0, 10, 50, 100, 200, 400))
          .map(r => Seq(r.k.toString, f1(r.indexMs))),
      ))
    }
  }
}

object Exp8Job {
  def main(args: Array[String]): Unit = {
    Experiments.warmup()
    println(mdTable(
      Seq("dataset", "Order ms", "LL ms", "LC ms"),
      GraphGen.datasetSpecs.map { s =>
        val b = Experiments.breakdown(s)
        Seq(b.key, f1(b.orderMs), f1(b.llMs), f1(b.lcMs))
      },
    ))
  }
}
