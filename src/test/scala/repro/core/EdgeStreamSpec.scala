package repro.core

import repro.{Oracle, SparkSpec, TestGraphs}

class EdgeStreamSpec extends SparkSpec {

  test("fromPairs remaps ids densely by first appearance") {
    val s = EdgeStream.fromPairs(Seq((10L, 20L), (20L, 30L), (10L, 30L)))
    assert(s.numVertices == 3)
    assert(s.src.toSeq == Seq(0, 1, 0))
    assert(s.dst.toSeq == Seq(1, 2, 2))
  }

  test("fromPairs keeps stream order") {
    val s = EdgeStream.fromPairs(Seq((5L, 6L), (1L, 2L), (5L, 2L)))
    assert(s.numEdges == 3)
    // first edge is (5,6) -> densified (0,1)
    assert(s.src(0) == 0 && s.dst(0) == 1)
  }

  test("degrees counts both endpoints") {
    val s = TestGraphs.handStream
    assert(s.degrees.sum == 2 * s.numEdges)
    // vertex '1' (dense 0) has edges (1,2),(1,3),(6,1) -> degree 3
    assert(s.degrees(0) == 3)
  }

  test("shuffled preserves the edge multiset") {
    val s = TestGraphs.tiny(spark)
    val sh = s.shuffled(123)
    assert(sh.numEdges == s.numEdges && sh.numVertices == s.numVertices)
    def ms(x: EdgeStream) =
      x.src.indices.map(i => (x.src(i), x.dst(i))).groupBy(identity).view.mapValues(_.size).toMap
    assert(ms(sh) == ms(s))
  }

  test("shuffled is deterministic in the seed and changes the order") {
    val s = TestGraphs.tiny(spark)
    val a = s.shuffled(7); val b = s.shuffled(7); val c = s.shuffled(8)
    assert(a.src.toSeq == b.src.toSeq && a.dst.toSeq == b.dst.toSeq)
    assert(a.src.toSeq != c.src.toSeq || a.dst.toSeq != c.dst.toSeq)
    assert(a.src.toSeq != s.src.toSeq || a.dst.toSeq != s.dst.toSeq)
  }

  test("take returns a prefix") {
    val s = TestGraphs.tiny(spark)
    val t = s.take(100)
    assert(t.numEdges == 100)
    assert(t.src.toSeq == s.src.take(100).toSeq)
  }

  test("fromDF sorts by (src, id) — BFS order") {
    import spark.implicits._
    val df = Seq((3L, 1L, 0L), (1L, 2L, 1L), (1L, 3L, 2L), (2L, 3L, 3L))
      .toDF("src", "dst", "id")
    val s = EdgeStream.fromDF(df)
    // sorted stream: (1,2),(1,3),(2,3),(3,1); dense ids: 1->0,2->1,3->2
    assert(s.src.toSeq == Seq(0, 0, 1, 2))
    assert(s.dst.toSeq == Seq(1, 2, 2, 0))
  }

  test("toDF roundtrips the stream") {
    val s = TestGraphs.handStream
    val df = s.toDF(spark)
    assert(df.count() == s.numEdges)
    val back = df.orderBy("id").collect()
    assert(back.map(_.getLong(1)).toSeq == s.src.map(_.toLong).toSeq)
    assert(back.map(_.getLong(2)).toSeq == s.dst.map(_.toLong).toSeq)
  }

  test("oracle: degree computation via DataFrame matches DuckDB") {
    import org.apache.spark.sql.functions._
    val s = TestGraphs.handStream
    val edges = s.toDF(spark)
    val sparkDeg = edges.select(col("src") as "v")
      .union(edges.select(col("dst") as "v"))
      .groupBy("v").agg(count(lit(1)) as "degree")
    Oracle.assertEquivalent(sparkDeg,
      """SELECT v, COUNT(*) AS degree FROM (
        |  SELECT src AS v FROM edges UNION ALL SELECT dst AS v FROM edges
        |) GROUP BY v""".stripMargin,
      "edges" -> edges)
  }

  test("oracle: per-source out-degree matches DuckDB") {
    import org.apache.spark.sql.functions._
    val s = TestGraphs.tiny(spark)
    val edges = s.toDF(spark).limit(2000)
    val outDeg = edges.groupBy("src").agg(count(lit(1)) as "outdeg")
    Oracle.assertEquivalent(outDeg,
      "SELECT src, COUNT(*) AS outdeg FROM edges GROUP BY src",
      "edges" -> edges)
  }
}
