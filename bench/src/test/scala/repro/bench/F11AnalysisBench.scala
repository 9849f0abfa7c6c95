package repro.bench

import repro.SparkSpec
import repro.core._

/** Paper Fig. 11 — (a) RF vs the relative load-balance bound τ: RF
  * decreases slightly as τ relaxes; (b) RF vs the relative weight of the
  * two cost factors: a wide U-shaped valley — extremes hurt, anything in
  * [0.3, 0.7] is within ~10%.
  */
class F11AnalysisBench extends SparkSpec {

  test("Fig 11a: RF vs relative load balance τ") {
    val s = BenchData.stream(spark, "uk-lite")
    val k = 64
    val rows = for (tau <- Seq(1.0, 1.2, 1.5, 2.0)) yield {
      val q = Metrics.evaluate(s, Clugp.run(s, k, ClugpConfig(tau = tau)).part, k)
      Seq(tau.toString, f"${q.replicationFactor}%.3f", f"${q.relativeBalance}%.3f")
    }
    BenchData.emit("F11a rf vs tau (uk-lite, k=64)", Seq("tau", "rf", "balance"), rows)
    val rfs = rows.map(_(1).toDouble)
    // paper: RF moves only slightly with τ (their direction: a slight
    // decrease as τ relaxes; ours drifts slightly up — see EXPERIMENTS.md)
    assert(rfs.max / rfs.min < 1.15, s"rf should be τ-stable, got $rfs")
    // balance bound is respected at each tau
    rows.foreach(r => assert(r(2).toDouble <= r(0).toDouble + 0.01))
  }

  test("Fig 11b: RF vs relative weight of load vs cut") {
    val s = BenchData.stream(spark, "uk-lite")
    val k = 64
    val weights = Seq(0.1, 0.3, 0.5, 0.7, 0.9)
    val rows = for (w <- weights) yield {
      val q = Metrics.evaluate(s, Clugp.run(s, k, ClugpConfig(weight = w)).part, k)
      Seq(w.toString, f"${q.replicationFactor}%.3f")
    }
    BenchData.emit("F11b rf vs relative weight (uk-lite, k=64)", Seq("weight", "rf"), rows)
    val rf = rows.map(r => r(0).toDouble -> r(1).toDouble).toMap
    // mid-range weights sit in a shallow valley: within ~10% of each other
    val mid = Seq(0.3, 0.5, 0.7).map(rf)
    assert(mid.max / mid.min < 1.15, s"mid-range spread too wide: $mid")
  }
}
