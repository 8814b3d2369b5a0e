package repro.bench

import repro.{SparkSpec, TestUtil}
import repro.core.Pspc
import repro.exp.Experiments
import repro.exp.Experiments.f1
import repro.graph.GraphGen
import repro.order.VertexOrder
import repro.spark.{GraphxPspc, SparkPspc, SparkQueries}

/** Distributed-dataflow construction (the repro band's target shape):
  * PSPC's distance rounds as DataFrame aggregations and as a GraphX/RDD
  * job, validated against the threaded builder and timed. Absolute times
  * are dominated by per-round job overhead at this scale — the point is
  * that the rounds parallelize with no cross-partition dependency.
  */
class SparkPspcBench extends SparkSpec {

  test("distributed dataflow: DataFrame and GraphX builds match the threaded index") {
    val g = GraphGen.largestComponent(GraphGen.chungLu(400, 8.0, 2.5, seed = 21))
    val order = VertexOrder.degreeOrder(g)

    val ((localIdx, _), localMs) = Experiments.timeMs(Pspc.build(g, order, threads = Experiments.MaxThreads))
    val (dfIdx, dfMs) = Experiments.timeMs(SparkPspc.build(spark, g, order))
    val (gxIdx, gxMs) = Experiments.timeMs(GraphxPspc.build(spark, g, order))

    TestUtil.assertSameLabels(localIdx, dfIdx)
    TestUtil.assertSameLabels(localIdx, gxIdx)

    // batch queries through the Catalyst dataflow
    import spark.implicits._
    val rnd = new scala.util.Random(5)
    val queries = spark
      .createDataset(Seq.fill(2000)((rnd.nextInt(g.n), rnd.nextInt(g.n))).distinct)
      .toDF("s", "t")
    val (answered, queryMs) =
      Experiments.timeMs(SparkQueries.evaluate(spark, dfIdx.toDF(spark), queries).count())

    BenchReport.section("Distributed dataflow (repro band target)") {
      BenchReport.table(
        Seq("engine", "build ms", "entries"),
        Seq(
          Seq(s"threaded PSPC+ (${Experiments.MaxThreads}T)", f1(localMs), localIdx.entryCount.toString),
          Seq("Spark DataFrame (Catalyst)", f1(dfMs), dfIdx.entryCount.toString),
          Seq("Spark GraphX/RDD", f1(gxMs), gxIdx.entryCount.toString),
        ),
      ) +
        s"\ngraph: |V|=${g.n} |E|=${g.m}; identical label multisets across all three.\n" +
        s"Batch of ${answered} SPC queries answered via DataFrame joins in ${f1(queryMs)} ms."
    }
    assert(dfIdx.entryCount == localIdx.entryCount && gxIdx.entryCount == localIdx.entryCount)
    assert(answered > 0)
  }
}
