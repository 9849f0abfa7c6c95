package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.WebGraphs
import repro.core._

/** spark-submit entrypoint for the ablation study (paper Fig. 9):
  * CLUGP vs CLUGP-S (no splitting) vs CLUGP-G (greedy placement) on one
  * dataset across a k sweep.
  *
  * Usage: `AblationJob [dataset] [k1,k2,...]`
  */
object AblationJob {
  def main(args: Array[String]): Unit = {
    val dataset = args.lift(0).getOrElse("it-lite")
    val ks = args.lift(1).map(_.split(",").map(_.trim.toInt).toSeq).getOrElse(Seq(4, 16, 64, 256))
    val spark = SparkSession.builder.appName("clugp-ablation")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    try {
      val spec = WebGraphs.all.find(_.name == dataset)
        .getOrElse(sys.error(s"unknown dataset $dataset"))
      val stream = EdgeStream.fromDF(spec.df(spark))
      val variants = Seq(
        "CLUGP"   -> ClugpConfig(),
        "CLUGP-S" -> ClugpConfig(splitting = false),
        "CLUGP-G" -> ClugpConfig(gameMode = GreedyPlacement))
      for (k <- ks; (name, cfg) <- variants) {
        val q = Metrics.evaluate(stream, Clugp.run(stream, k, cfg).part, k)
        println(f"$dataset k=$k $name%-8s rf=${q.replicationFactor}%.3f " +
          f"balance=${q.relativeBalance}%.3f")
      }
    } finally spark.stop()
  }
}
