package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.WebGraphs
import repro.core.EdgeStream
import repro.exp.Runner

/** spark-submit entrypoint for the k-sweep experiment families (paper
  * Figs. 3, 6, 7): one dataset, all six algorithms, k ∈ sweep; prints
  * RF, balance, runtime and space per row.
  *
  * Usage: `SweepJob [dataset] [k1,k2,...]`
  */
object SweepJob {
  def main(args: Array[String]): Unit = {
    val dataset = args.lift(0).getOrElse("uk-lite")
    val ks = args.lift(1).map(_.split(",").map(_.trim.toInt).toSeq).getOrElse(Seq(4, 16, 64, 256))
    val spark = SparkSession.builder.appName("clugp-sweep")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    try {
      val spec = WebGraphs.all.find(_.name == dataset)
        .getOrElse(sys.error(s"unknown dataset $dataset"))
      val stream = EdgeStream.fromDF(spec.df(spark))
      val rows = for (k <- ks; a <- Runner.allAlgorithms())
        yield Runner.run(dataset, stream, a, k).row
      println(Runner.table(
        Seq("dataset", "algo", "k", "rf", "balance", "time_ms", "space_bytes"), rows))
    } finally spark.stop()
  }
}
