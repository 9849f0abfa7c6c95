package repro.bench

import repro.SparkSpec
import repro.core.Metrics
import repro.gas.{GasTopology, NetworkModel, VertexCutGraph}

/** Paper Fig. 4 — Twitter (social graph): (a) RF of CLUGP is slightly
  * above HDRF's (the framework targets web graphs), but (b) total task
  * runtime (partitioning + PageRank) favours CLUGP because heuristic
  * partitioning time explodes with k.
  */
class F4SocialGraphBench extends SparkSpec {

  test("Fig 4a: replication factor vs k on twitter-lite") {
    val rows = for (k <- BenchData.KSweep; r <- BenchData.runAll(spark, "twitter-lite", k))
      yield Seq(k.toString, r.algo, f"${r.rf}%.3f", f"${r.balance}%.3f", r.timeMs.toString)
    BenchData.emit("F4a twitter-lite replication factor",
      Seq("k", "algo", "rf", "balance", "time_ms"), rows)

    val byKey = rows.map(r => (r(0).toInt, r(1)) -> r(2).toDouble).toMap
    // HDRF (and Greedy) beat CLUGP on the social graph — paper Fig. 4
    for (k <- Seq(64, 256))
      assert(byKey((k, "HDRF")) < byKey((k, "CLUGP")),
        s"k=$k: HDRF should win on social graphs")
    // but CLUGP still beats plain Hashing
    for (k <- BenchData.KSweep)
      assert(byKey((k, "CLUGP")) < byKey((k, "Hashing")))
  }

  test("Fig 4b: total task runtime (partitioning + modelled PageRank)") {
    val s = BenchData.stream(spark, "twitter-lite")
    val iters = 10
    val model = NetworkModel(rttSeconds = 0.010)
    val rows = for (k <- BenchData.KSweep; r <- BenchData.runAll(spark, "twitter-lite", k))
      yield {
        val mirrors = r.mirrors
        val topo = GasTopology(k, s.degrees.count(_ > 0).toLong,
          mirrors + s.degrees.count(_ > 0), mirrors, r.partitionSizes)
        val prSec = model.runSeconds(topo, iters)
        Seq(k.toString, r.algo, (r.timeMs / 1000.0).toString.take(6), f"$prSec%.2f",
          f"${r.timeMs / 1000.0 + prSec}%.2f")
      }
    BenchData.emit("F4b twitter-lite total runtime (s)",
      Seq("k", "algo", "partition_s", "pagerank_s", "total_s"), rows)

    // at the largest k the heuristics' partitioning cost has grown
    // multiples over CLUGP's (the paper's scalability argument)
    val t = rows.map(r => (r(0).toInt, r(1)) -> r(2).toDouble).toMap
    assert(t((256, "HDRF")) > t((64, "HDRF")), "HDRF time must grow with k")
    val hdrfGrowth = t((256, "HDRF")) / math.max(1e-9, t((4, "HDRF")))
    val clugpGrowth = t((256, "CLUGP")) / math.max(1e-9, t((4, "CLUGP")))
    assert(clugpGrowth < hdrfGrowth,
      s"CLUGP growth $clugpGrowth should be below HDRF growth $hdrfGrowth")
  }
}
