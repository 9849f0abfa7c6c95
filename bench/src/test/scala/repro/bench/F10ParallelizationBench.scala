package repro.bench

import repro.SparkSpec
import repro.core._

/** Paper Fig. 10 — parallelization of the cluster partitioning game:
  * (a) computation time falls with the thread count (paper: 1091 s at 8
  * threads → 429 s at 32 on their testbed); (b) runtime is insensitive
  * to batch size, rising only slightly with bigger batches.
  */
class F10ParallelizationBench extends SparkSpec {

  private def gameTime(threads: Int, batch: Int): (Long, Double) = {
    val s = BenchData.stream(spark, "it-lite")
    val k = 64
    val c = new Clugp(ClugpConfig(gameMode = ParallelGame(batch, threads)))
    val q = Metrics.evaluate(s, c.partition(s, k).part, k)
    (c.lastStats.gameMs, q.replicationFactor)
  }

  test("Fig 10a: game time vs number of threads") {
    val batch = 6400
    val rows = for (t <- Seq(1, 2, 4, 8, 16)) yield {
      val (ms, rf) = gameTime(t, batch)
      Seq(t.toString, ms.toString, f"$rf%.3f")
    }
    BenchData.emit("F10a game time vs threads (it-lite, k=64, batch=6400)",
      Seq("threads", "game_ms", "rf"), rows)
    val t = rows.map(r => r(0).toInt -> r(1).toLong).toMap
    // more threads should not be slower overall (paper: good speedup);
    // allow generous noise at millisecond scales
    assert(t(8) <= t(1) * 1.2 + 50, s"8 threads ${t(8)}ms vs 1 thread ${t(1)}ms")
    // quality is thread-count independent (deterministic batch games)
    assert(rows.map(_(2)).distinct.length == 1)
  }

  test("Fig 10b: game time vs batch size") {
    val rows = for (b <- Seq(800, 3200, 6400, 25600)) yield {
      val (ms, rf) = gameTime(8, b)
      Seq(b.toString, ms.toString, f"$rf%.3f")
    }
    BenchData.emit("F10b game time vs batch size (it-lite, k=64, 8 threads)",
      Seq("batch", "game_ms", "rf"), rows)
    // runtime stays within a small factor across a 32× batch range
    val times = rows.map(_(1).toLong)
    assert(times.max <= math.max(200, times.min * 6),
      s"batch-size sensitivity too high: $times")
  }
}
