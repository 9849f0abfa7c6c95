package repro.bench

import repro.SparkSpec

/** Paper Fig. 3 — replication factor vs number of partitions on the four
  * web graphs, all six algorithms. Paper shape: CLUGP lowest and most
  * stable everywhere (k 4→256 growth ≈1.5×), ~½ of HDRF at k = 256;
  * Hashing grows ~10×; heuristics in between.
  */
class F3ReplicationFactorBench extends SparkSpec {

  private val datasets = Seq("uk-lite", "arabic-lite", "webbase-lite", "it-lite")

  for (ds <- datasets) {
    test(s"Fig 3: replication factor vs k on $ds") {
      val rows = for (k <- BenchData.KSweep; r <- BenchData.runAll(spark, ds, k))
        yield Seq(ds, k.toString, r.algo, f"${r.rf}%.3f", f"${r.balance}%.3f")
      BenchData.emit(s"F3 replication factor ($ds)",
        Seq("dataset", "k", "algo", "rf", "balance"), rows)

      val byKey = rows.map(r => (r(1).toInt, r(2)) -> r(3).toDouble).toMap
      for (k <- BenchData.KSweep) {
        // CLUGP is the best method at every k (paper: all testings)
        for (other <- Seq("Hashing", "DBH", "Mint", "Greedy", "HDRF"))
          assert(byKey((k, "CLUGP")) <= byKey((k, other)),
            s"$ds k=$k: CLUGP ${byKey((k, "CLUGP"))} vs $other ${byKey((k, other))}")
      }
      // CLUGP at k=256 is at most ~60% of HDRF (paper: ~50%)
      assert(byKey((256, "CLUGP")) < 0.7 * byKey((256, "HDRF")),
        s"$ds: CLUGP/HDRF ratio at k=256 too high")
      // CLUGP growth 4→256 far below Hashing growth (paper: 1.5× vs 10×)
      val clugpGrowth = byKey((256, "CLUGP")) / byKey((4, "CLUGP"))
      val hashGrowth = byKey((256, "Hashing")) / byKey((4, "Hashing"))
      assert(clugpGrowth < hashGrowth / 2,
        s"$ds: CLUGP growth $clugpGrowth vs Hashing growth $hashGrowth")
    }
  }
}
