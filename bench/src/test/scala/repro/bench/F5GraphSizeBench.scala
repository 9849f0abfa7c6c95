package repro.bench

import repro.{SparkSpec, SynthData, WebGraphs}
import repro.core.{EdgeStream, Metrics}
import repro.exp.Runner
import repro.partitioners.{HdrfPartitioner, HashingPartitioner}

/** Paper Fig. 5 — RF vs graph size (samples of uk-2002, k fixed): CLUGP's
  * RF grows only ~20% across the size sweep while HDRF's grows ~80%.
  * We sample uk-lite by crawl-order prefix (§VI: "randomly sample
  * UK-2002" — prefix sampling is the streaming-order analogue that keeps
  * BFS semantics intact).
  */
class F5GraphSizeBench extends SparkSpec {

  test("Fig 5: replication factor vs graph size (uk-lite samples, k=64)") {
    val spec = WebGraphs.UKLite
    val full = spec.df(spark).cache()
    val k = 64
    val fractions = Seq(0.02, 0.1, 0.3, 1.0)
    val results = for (f <- fractions) yield {
      val s = EdgeStream.fromDF(SynthData.sampleGraph(full, spec.nV, f))
      val rows = Seq(new HashingPartitioner, new HdrfPartitioner(),
        Runner.allAlgorithms().last) // CLUGP
        .map(a => (a.name, Runner.run(s"uk-$f", s, a, k)))
      (f, s.numEdges, rows)
    }
    BenchData.emit("F5 rf vs graph size (uk-lite, k=64)",
      Seq("fraction", "edges", "algo", "rf"),
      results.flatMap { case (f, e, rows) =>
        rows.map { case (n, r) => Seq(f.toString, e.toString, n, f"${r.rf}%.3f") }
      })

    def rfOf(f: Double, algo: String): Double =
      results.find(_._1 == f).get._3.find(_._1 == algo).get._2.rf
    // CLUGP has the best quality at every size
    for (f <- fractions) {
      assert(rfOf(f, "CLUGP") <= rfOf(f, "HDRF"), s"f=$f")
      assert(rfOf(f, "CLUGP") < rfOf(f, "Hashing"), s"f=$f")
    }
    // CLUGP's growth across the sweep is well below Hashing's
    val clugpGrowth = rfOf(1.0, "CLUGP") / rfOf(0.02, "CLUGP")
    val hashGrowth = rfOf(1.0, "Hashing") / rfOf(0.02, "Hashing")
    assert(clugpGrowth < hashGrowth, s"clugp $clugpGrowth vs hashing $hashGrowth")
  }
}
