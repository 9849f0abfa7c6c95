package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.WebGraphs
import repro.core.EdgeStream
import repro.exp.Runner

/** spark-submit entrypoint: partition one synthetic dataset with one (or
  * all) algorithms and print the quality/cost row(s).
  *
  * Usage: `PartitionJob [dataset] [k] [algo|all]`, e.g.
  * `spark-submit --class repro.jobs.PartitionJob repro.jar uk-lite 64 all`
  */
object PartitionJob {
  def main(args: Array[String]): Unit = {
    val dataset = args.lift(0).getOrElse("uk-lite")
    val k       = args.lift(1).map(_.toInt).getOrElse(64)
    val algo    = args.lift(2).getOrElse("all")

    val spark = SparkSession.builder.appName("clugp-partition")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    try {
      val spec = WebGraphs.all.find(_.name == dataset)
        .getOrElse(sys.error(s"unknown dataset $dataset; have ${WebGraphs.all.map(_.name)}"))
      val stream = EdgeStream.fromDF(spec.df(spark))
      val algos = Runner.allAlgorithms()
        .filter(a => algo == "all" || a.name.equalsIgnoreCase(algo))
      val rows = algos.map(a => Runner.run(dataset, stream, a, k).row)
      println(Runner.table(
        Seq("dataset", "algo", "k", "rf", "balance", "time_ms", "space_bytes"), rows))
    } finally spark.stop()
  }
}
