package repro.bench

import repro.SparkSpec

/** Paper Fig. 6 — partitioner state space vs k on IT: Hashing 0; DBH a
  * k-independent degree array; Mint O(batch); CLUGP O(|V|)-flat in k;
  * Greedy/HDRF replica tables grow with k and dominate at large k.
  * (The paper's 8–10× heuristic-over-CLUGP gap assumes VGP's per-vertex
  * hash-set tables; our reimplementation packs replicas into bitsets, so
  * the gap compresses — the growth *shape* is what we assert.)
  */
class F6SpaceBench extends SparkSpec {

  test("Fig 6: space vs k on it-lite") {
    val rows = for (k <- BenchData.KSweep; r <- BenchData.runAll(spark, "it-lite", k))
      yield Seq(k.toString, r.algo, r.spaceBytes.toString)
    BenchData.emit("F6 space vs k (it-lite)", Seq("k", "algo", "space_bytes"), rows)

    val sp = rows.map(r => (r(0).toInt, r(1)) -> r(2).toLong).toMap
    // Hashing: zero state at every k
    BenchData.KSweep.foreach(k => assert(sp((k, "Hashing")) == 0))
    // DBH: k-independent
    assert(sp((4, "DBH")) == sp((256, "DBH")))
    // heuristic replica tables grow with k (entries track the RF growth)
    assert(sp((256, "Greedy")) > 3 * sp((4, "Greedy")) / 2)
    assert(sp((256, "HDRF")) > 3 * sp((4, "HDRF")) / 2)
    // CLUGP is ~flat in k (within 2×)
    assert(sp((256, "CLUGP")) < 2 * sp((4, "CLUGP")))
    // Mint stays below CLUGP (paper: O(batch) < O(|V|))
    BenchData.KSweep.foreach(k => assert(sp((k, "Mint")) < sp((k, "CLUGP"))))
    // the heuristics exceed CLUGP at every k (paper: 8–10× overall)
    for (k <- BenchData.KSweep; a <- Seq("Greedy", "HDRF"))
      assert(sp((k, a)) > sp((k, "CLUGP")), s"$a at k=$k")
  }
}
