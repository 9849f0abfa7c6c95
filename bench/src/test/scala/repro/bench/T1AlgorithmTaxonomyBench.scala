package repro.bench

import repro.SparkSpec

/** Paper Table I — taxonomy of vertex-cut streaming partitioners:
  * Hashing/DBH low time + low quality, Mint medium/medium,
  * Greedy/HDRF high time + high quality, CLUGP low time + high quality.
  * Measured at k = 64 on uk-lite; "quality" = lower replication factor.
  */
class T1AlgorithmTaxonomyBench extends SparkSpec {

  test("Table I: time-cost and quality ranking") {
    val results = BenchData.runAll(spark, "uk-lite", 64)
    BenchData.emit("T1 algorithm taxonomy (uk-lite, k=64)",
      Seq("algo", "rf", "balance", "time_ms", "space_bytes", "paper_time", "paper_quality"),
      results.map { r =>
        val (pt, pq) = r.algo match {
          case "Hashing" => ("Low", "Low")
          case "DBH"     => ("Low", "Low")
          case "Mint"    => ("Medium", "Medium")
          case "Greedy"  => ("High", "High")
          case "HDRF"    => ("High", "High")
          case _         => ("Low", "High")
        }
        Seq(r.algo, f"${r.rf}%.3f", f"${r.balance}%.3f",
            r.timeMs.toString, r.spaceBytes.toString, pt, pq)
      })

    val byName = results.map(r => r.algo -> r).toMap
    // quality ranking of Table I: CLUGP < {HDRF, Greedy} < Mint < {DBH} < Hashing
    assert(byName("CLUGP").rf < byName("HDRF").rf)
    assert(byName("CLUGP").rf < byName("Greedy").rf)
    assert(byName("HDRF").rf < byName("Mint").rf)
    assert(byName("Mint").rf < byName("Hashing").rf)
    assert(byName("DBH").rf < byName("Hashing").rf)
    // balance: all non-hashing methods ≈ 1.0
    Seq("Mint", "Greedy", "HDRF", "CLUGP").foreach { a =>
      assert(byName(a).balance < 1.1, s"$a balance ${byName(a).balance}")
    }
  }
}
