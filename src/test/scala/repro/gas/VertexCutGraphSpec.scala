package repro.gas

import org.apache.spark.sql.functions._
import repro.core.{Clugp, EdgeStream, Metrics}
import repro.{Oracle, SparkSpec, TestGraphs}

class VertexCutGraphSpec extends SparkSpec {

  test("topology counts agree with driver-side metrics") {
    val s = TestGraphs.tiny(spark).take(5000)
    val seen = (s.src ++ s.dst).distinct.length.toLong
    for (k <- Seq(4, 16)) {
      val part = Clugp.run(s, k).part
      val q = Metrics.evaluate(s, part, k)
      val topo = VertexCutGraph.topology(Metrics.assignmentDF(spark, s, part), k)
      assert(topo.k == k)
      assert(topo.masters == seen)
      assert(topo.mirrors == q.numReplicas)
      assert(topo.replicas == q.numReplicas + seen)
      assert(math.abs(topo.replicationFactor - q.replicationFactor) < 1e-9)
      assert(topo.edgesPerPartition.toSeq == q.partitionSizes.toSeq)
      assert(topo.maxEdges == q.partitionSizes.max)
      assert(topo.messagesPerIteration == 2 * q.numReplicas)
    }
  }

  test("hand example topology") {
    // (0,1)->p0, (1,2)->p1: vertex 1 is mirrored
    val s = EdgeStream.fromPairs(Seq((1L, 2L), (2L, 3L)))
    val topo = VertexCutGraph.topology(Metrics.assignmentDF(spark, s, Array(0, 1)), 2)
    assert(topo.masters == 3 && topo.replicas == 4 && topo.mirrors == 1)
    assert(topo.messagesPerIteration == 2)
    assert(topo.edgesPerPartition.toSeq == Seq(1L, 1L))
  }

  test("replicaTable marks exactly one master per vertex") {
    val s = TestGraphs.tiny(spark).take(3000)
    val seen = (s.src ++ s.dst).distinct.length.toLong
    val df = Metrics.assignmentDF(spark, s, Clugp.run(s, 8).part)
    val rt = VertexCutGraph.replicaTable(spark, df)
    val masters = rt.where(col("isMaster")).groupBy("v").count()
    assert(masters.where(col("count") =!= 1).count() == 0)
    assert(masters.count() == seen)
    // master is the lowest-numbered holding partition
    val bad = rt.groupBy("v").agg(min("part") as "mn")
      .join(rt.where(col("isMaster")), "v")
      .where(col("mn") =!= col("part"))
    assert(bad.count() == 0)
  }

  test("oracle: replica table cardinality matches DuckDB") {
    val s = TestGraphs.handStream
    val df = Metrics.assignmentDF(spark, s, Array(0, 1, 0, 1, 2, 2, 0, 1))
    val counts = VertexCutGraph.replicaTable(spark, df)
      .groupBy("v").agg(count(lit(1)) as "replicas").orderBy("v")
    Oracle.assertEquivalent(counts,
      """SELECT v, COUNT(*) AS replicas FROM (
        |  SELECT DISTINCT v, part FROM (
        |    SELECT src AS v, part FROM assigned
        |    UNION ALL SELECT dst AS v, part FROM assigned
        |  )
        |) GROUP BY v ORDER BY v""".stripMargin,
      "assigned" -> df)
  }

  test("empty partitions report zero edges") {
    val s = EdgeStream.fromPairs(Seq((1L, 2L)))
    val topo = VertexCutGraph.topology(Metrics.assignmentDF(spark, s, Array(0)), 4)
    assert(topo.edgesPerPartition.toSeq == Seq(1L, 0L, 0L, 0L))
    assert(topo.mirrors == 0)
  }
}
