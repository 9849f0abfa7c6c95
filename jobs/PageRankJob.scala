package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.WebGraphs
import repro.core.{Clugp, ClugpConfig, EdgeStream, Metrics}
import repro.gas.{GasEngine, NetworkModel, VertexCutGraph}

/** spark-submit entrypoint: partition a dataset with CLUGP, run PageRank
  * on the GAS engine over the placement, and report the modelled
  * computation/communication split (the paper's Fig. 8 pipeline).
  *
  * Usage: `PageRankJob [dataset] [k] [iters] [rtt_ms]`
  */
object PageRankJob {
  def main(args: Array[String]): Unit = {
    val dataset = args.lift(0).getOrElse("uk-lite")
    val k       = args.lift(1).map(_.toInt).getOrElse(32)
    val iters   = args.lift(2).map(_.toInt).getOrElse(10)
    val rttMs   = args.lift(3).map(_.toDouble).getOrElse(10.0)

    val spark = SparkSession.builder.appName("clugp-pagerank")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    try {
      val spec = WebGraphs.all.find(_.name == dataset)
        .getOrElse(sys.error(s"unknown dataset $dataset"))
      val stream   = EdgeStream.fromDF(spec.df(spark))
      val assigned = Metrics.assignmentDF(spark, stream,
        Clugp.run(stream, k, ClugpConfig()).part)
      val topo  = VertexCutGraph.topology(assigned, k)
      val ranks = GasEngine.pageRank(spark, assigned, iters)
      val top = ranks.orderBy(org.apache.spark.sql.functions.desc("rank")).limit(5).collect()
      val model = NetworkModel(rttSeconds = rttMs / 1000.0)
      val (comp, comm) = model.split(topo)
      println(s"dataset=$dataset k=$k rf=${topo.replicationFactor} mirrors=${topo.mirrors}")
      println(f"modelled per-iteration: compute=$comp%.4fs communication=$comm%.4fs " +
        f"run(${iters}it)=${model.runSeconds(topo, iters)}%.2fs")
      println("top-5 pagerank: " + top.map(r => s"${r.getLong(0)}:${f"${r.getDouble(1)}%.6f"}").mkString(", "))
    } finally spark.stop()
  }
}
