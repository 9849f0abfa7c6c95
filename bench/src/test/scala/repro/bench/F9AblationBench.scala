package repro.bench

import repro.SparkSpec
import repro.core._

/** Paper Fig. 9 — ablation on IT: CLUGP vs CLUGP-S (no splitting) and
  * CLUGP-G (greedy cluster placement instead of the game). Paper shape:
  * CLUGP ≤ CLUGP-S everywhere with the gap growing in k, and the game
  * clearly beats greedy placement.
  */
class F9AblationBench extends SparkSpec {

  test("Fig 9: CLUGP vs CLUGP-S vs CLUGP-G on it-lite") {
    val s = BenchData.stream(spark, "it-lite")
    val variants = Seq(
      "CLUGP"   -> ClugpConfig(),
      "CLUGP-S" -> ClugpConfig(splitting = false),
      "CLUGP-G" -> ClugpConfig(gameMode = GreedyPlacement))
    val rows = for (k <- BenchData.KSweep; (name, cfg) <- variants) yield {
      val q = Metrics.evaluate(s, Clugp.run(s, k, cfg).part, k)
      Seq(k.toString, name, f"${q.replicationFactor}%.3f", f"${q.relativeBalance}%.3f")
    }
    BenchData.emit("F9 ablation (it-lite)", Seq("k", "variant", "rf", "balance"), rows)

    val rf = rows.map(r => (r(0).toInt, r(1)) -> r(2).toDouble).toMap
    for (k <- BenchData.KSweep) {
      // the game beats greedy placement at every k
      assert(rf((k, "CLUGP")) < rf((k, "CLUGP-G")), s"k=$k vs greedy")
      // splitting never loses by more than a whisker, and wins at mid k
      assert(rf((k, "CLUGP")) <= rf((k, "CLUGP-S")) * 1.05, s"k=$k vs no-split")
    }
    assert(rf((64, "CLUGP")) < rf((64, "CLUGP-S")), "splitting should win at k=64")
  }
}
