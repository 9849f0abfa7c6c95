package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestGraphs, WebGraphs}

class ClugpSpec extends SparkSpec {

  test("end-to-end: complete, valid, balanced assignment") {
    val s = TestGraphs.tiny(spark)
    for (k <- Seq(2, 4, 16, 64)) {
      val a = Clugp.run(s, k)
      assert(a.part.length == s.numEdges)
      assert(a.part.forall(p => p >= 0 && p < k))
      val q = Metrics.evaluate(s, a.part, k)
      assert(q.relativeBalance <= 1.0 + k.toDouble / s.numEdges + 1e-9,
        s"k=$k balance=${q.relativeBalance}")
    }
  }

  test("deterministic end to end") {
    val s = TestGraphs.tiny(spark)
    val a = Clugp.run(s, 8)
    val b = Clugp.run(s, 8)
    assert(a.part.toSeq == b.part.toSeq)
  }

  test("variant names reflect the configuration") {
    assert(new Clugp().name == "CLUGP")
    assert(new Clugp(ClugpConfig(splitting = false)).name == "CLUGP-S")
    assert(new Clugp(ClugpConfig(gameMode = GreedyPlacement)).name == "CLUGP-G")
    assert(new Clugp().preferredOrder == "bfs")
  }

  test("CLUGP beats the hashing family on a web graph (Fig. 3 ordering)") {
    val s = TestGraphs.tiny(spark)
    val k = 16
    val clugp = Metrics.evaluate(s, Clugp.run(s, k).part, k).replicationFactor
    val hash = Metrics.evaluate(s,
      new repro.partitioners.HashingPartitioner().partition(s, k).part, k).replicationFactor
    val dbh = Metrics.evaluate(s,
      new repro.partitioners.DbhPartitioner().partition(s, k).part, k).replicationFactor
    assert(clugp < dbh && dbh < hash, s"clugp=$clugp dbh=$dbh hash=$hash")
  }

  test("game placement beats greedy placement (Fig. 9 CLUGP vs CLUGP-G)") {
    val s = TestGraphs.tiny(spark)
    val k = 32
    val game = Metrics.evaluate(s, Clugp.run(s, k).part, k).replicationFactor
    val greedy = Metrics.evaluate(s,
      Clugp.run(s, k, ClugpConfig(gameMode = GreedyPlacement)).part, k).replicationFactor
    assert(game <= greedy * 1.02, s"game=$game greedy=$greedy")
  }

  test("lastStats reports pass timings and game telemetry") {
    val s = TestGraphs.tiny(spark)
    val c = new Clugp(ClugpConfig(gameMode = SequentialGame))
    c.partition(s, 8)
    val st = c.lastStats
    assert(st.numClusters > 0)
    assert(st.clusteringMs >= 0 && st.gameMs >= 0 && st.transformMs >= 0)
    assert(st.gameRounds > 0)
  }

  test("tau shapes the balance bound") {
    val s = TestGraphs.tiny(spark)
    for (tau <- Seq(1.0, 1.2, 1.5)) {
      val a = Clugp.run(s, 16, ClugpConfig(tau = tau))
      val q = Metrics.evaluate(s, a.part, 16)
      assert(q.relativeBalance <= tau + 16.0 / s.numEdges + 1e-9)
    }
  }

  test("space accounting is O(|V|) plus cluster state") {
    val s = TestGraphs.tiny(spark)
    val a = Clugp.run(s, 8)
    assert(a.spaceBytes >= 8L * s.numVertices)
    assert(a.spaceBytes < 64L * s.numVertices + 16L * s.numEdges)
  }

  test("distributed mode assigns every edge exactly once") {
    val df = WebGraphs.Tiny.df(spark)
    val n = df.count()
    val assigned = Clugp.partitionDistributed(spark, df, 8, numSlices = 4)
    assert(assigned.count() == n)
    assert(assigned.select("id").distinct().count() == n)
    assert(assigned.where(col("part") < 0 || col("part") >= 8).count() == 0)
  }

  test("distributed mode quality is close to single-node quality") {
    val df = WebGraphs.Tiny.df(spark)
    val s = TestGraphs.tiny(spark)
    val local = Metrics.evaluate(s, Clugp.run(s, 8).part, 8).replicationFactor
    val assigned = Clugp.partitionDistributed(spark, df, 8, numSlices = 4)
    val dist = Metrics.replicationFactorDF(assigned).collect()(0).getDouble(0)
    // slices lose cross-slice structure; allow a modest degradation
    assert(dist < local * 1.8 + 0.5, s"dist=$dist local=$local")
    // and distributed partitioning must still beat hashing
    val hash = Metrics.evaluate(s,
      new repro.partitioners.HashingPartitioner().partition(s, 8).part, 8).replicationFactor
    assert(dist < hash)
  }

  test("oracle: distributed assignment balance via DuckDB") {
    val df = WebGraphs.Tiny.df(spark)
    val assigned = Clugp.partitionDistributed(spark, df, 4, numSlices = 2)
    Oracle.assertEquivalent(Metrics.partitionSizesDF(assigned),
      "SELECT part, COUNT(*) AS edges FROM assigned GROUP BY part ORDER BY part",
      "assigned" -> assigned)
  }

  test("weight parameter moves lambda without breaking the pipeline") {
    val s = TestGraphs.tiny(spark)
    for (w <- Seq(0.1, 0.5, 0.9)) {
      val a = Clugp.run(s, 8, ClugpConfig(weight = w))
      assert(a.part.length == s.numEdges)
      val q = Metrics.evaluate(s, a.part, 8)
      assert(q.replicationFactor >= 1.0)
    }
  }
}
