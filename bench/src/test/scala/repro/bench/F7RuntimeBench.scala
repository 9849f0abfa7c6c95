package repro.bench

import repro.SparkSpec

/** Paper Fig. 7 — partitioning runtime vs k on UK and IT: heuristic and
  * Mint runtimes climb steeply with k (HDRF ~35,000 s at k=256 on IT in
  * the paper), while CLUGP and the hashing family stay nearly flat
  * (CLUGP 1,162 → 1,869 s over the same sweep, ≈1.6×).
  */
class F7RuntimeBench extends SparkSpec {

  for (ds <- Seq("uk-lite", "it-lite")) {
    test(s"Fig 7: partitioning time vs k on $ds") {
      val rows = for (k <- BenchData.KSweep; r <- BenchData.runAll(spark, ds, k))
        yield Seq(ds, k.toString, r.algo, r.timeMs.toString)
      BenchData.emit(s"F7 runtime vs k ($ds)",
        Seq("dataset", "k", "algo", "time_ms"), rows)

      val t = rows.map(r => (r(1).toInt, r(2)) -> r(3).toLong).toMap
      def growth(algo: String): Double =
        t((256, algo)).toDouble / math.max(1, t((4, algo)))
      // k-sensitive methods grow much faster than CLUGP (paper's claim)
      assert(growth("HDRF") > growth("CLUGP"),
        s"$ds: HDRF growth ${growth("HDRF")} vs CLUGP ${growth("CLUGP")}")
      assert(growth("Mint") > growth("CLUGP"))
      // at k=256 the slow one-pass methods cost more than CLUGP
      assert(t((256, "Mint")) > t((256, "CLUGP")),
        s"$ds: Mint ${t((256, "Mint"))}ms vs CLUGP ${t((256, "CLUGP"))}ms")
    }
  }
}
