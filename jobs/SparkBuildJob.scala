package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.Experiments
import repro.graph.GraphGen
import repro.order.VertexOrder
import repro.spark.{GraphxPspc, SparkPspc, SparkQueries}

/** Distributed PSPC construction on Spark (DataFrame and GraphX variants),
  * runnable under spark-submit:
  *
  * {{{
  * spark-submit --class repro.jobs.SparkBuildJob repro.jar [nVertices] [avgDeg]
  * }}}
  */
object SparkBuildJob {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(400)
    val avgDeg = args.lift(1).map(_.toDouble).getOrElse(8.0)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("pspc-spark-build")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val g = GraphGen.largestComponent(GraphGen.chungLu(n, avgDeg, 2.5, seed = 21))
      val order = VertexOrder.degreeOrder(g)
      val (dfIdx, dfMs) = Experiments.timeMs(SparkPspc.build(spark, g, order))
      val (gxIdx, gxMs) = Experiments.timeMs(GraphxPspc.build(spark, g, order))
      require(dfIdx.canonical == gxIdx.canonical, "DataFrame and GraphX labels must agree")

      import spark.implicits._
      val rnd = new scala.util.Random(5)
      val queries = spark
        .createDataset(Seq.fill(1000)((rnd.nextInt(g.n), rnd.nextInt(g.n))).distinct)
        .toDF("s", "t")
      val answered = SparkQueries.evaluate(spark, dfIdx.toDF(spark), queries).count()

      println(f"graph |V|=${g.n} |E|=${g.m}")
      println(f"DataFrame build: $dfMs%.0f ms, entries=${dfIdx.entryCount}")
      println(f"GraphX build:    $gxMs%.0f ms, entries=${gxIdx.entryCount}")
      println(s"answered $answered batch queries via DataFrame joins")
    } finally spark.stop()
  }
}
