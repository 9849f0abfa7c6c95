package repro.gas

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** PowerGraph-like Gather-Apply-Scatter engine over a vertex-cut
  * placement, on Spark DataFrames.
  *
  * Each iteration is the GAS two-level aggregation the real system runs:
  * a *local* gather per (vertex, partition) — the work each distributed
  * node does on its own edges — followed by a *master* combine across
  * partitions, which is exactly the mirror→master synchronization whose
  * message count the paper's Fig. 8 measures. Values are therefore
  * identical to a single-machine run, while costs (max per-partition
  * edges, mirror messages) come from the placement.
  */
object GasEngine {

  /** PageRank over the placement.
    *
    * Standard normalized formulation with dangling-mass redistribution:
    * `r'(v) = (1−d)/n + d·(Σ_{u→v} r(u)/outdeg(u) + dangling/n)`.
    * Ranks sum to 1 every iteration.
    *
    * @param assigned DataFrame `(id, src, dst, part)`
    * @return DataFrame `(v, rank)` for every vertex in the graph
    */
  def pageRank(spark: SparkSession, assigned: DataFrame, iters: Int = 10,
               damping: Double = 0.85): DataFrame = {
    val edges = assigned.select("src", "dst", "part").localCheckpoint(true)
    val verts = edges.select(col("src") as "v")
      .union(edges.select(col("dst") as "v")).distinct().localCheckpoint(true)
    val n = verts.count().toDouble
    val outDeg = edges.groupBy(col("src") as "v").agg(count(lit(1)) as "outdeg")
      .localCheckpoint(true)

    var ranks = verts.select(col("v"), lit(1.0 / n) as "rank").localCheckpoint(true)
    var it = 0
    while (it < iters) {
      val withDeg = ranks.join(outDeg, Seq("v"), "left")
      val dangling = withDeg.where(col("outdeg").isNull)
        .agg(coalesce(sum("rank"), lit(0.0))).collect()(0).getDouble(0)
      // local gather: each partition sums contributions on its own edges
      val localGather = edges
        .join(withDeg.where(col("outdeg").isNotNull), edges("src") === withDeg("v"))
        .select(col("dst"), col("part"), (col("rank") / col("outdeg")) as "contrib")
        .groupBy(col("dst"), col("part"))
        .agg(sum("contrib") as "partial")
      // mirror→master combine: partials cross partitions to the master
      val gathered = localGather.groupBy(col("dst") as "v").agg(sum("partial") as "acc")
      ranks = verts.join(gathered, Seq("v"), "left")
        .select(col("v"),
          (lit((1.0 - damping) / n) +
            lit(damping) * (coalesce(col("acc"), lit(0.0)) + lit(dangling / n))) as "rank")
        .localCheckpoint(true)
      it += 1
    }
    ranks
  }

  /** Connected components (edges treated as undirected, as PowerGraph's
    * CC does): iterated min-label propagation until a fixpoint.
    *
    * @return DataFrame `(v, component)` where component is the minimum
    *         vertex id of the component
    */
  def connectedComponents(spark: SparkSession, assigned: DataFrame,
                          maxIters: Int = 50): (DataFrame, Int) = {
    val und = assigned.select(col("src") as "a", col("dst") as "b", col("part"))
      .union(assigned.select(col("dst") as "a", col("src") as "b", col("part")))
      .localCheckpoint(true)
    val verts = und.select(col("a") as "v").distinct().localCheckpoint(true)
    var labels = verts.select(col("v"), col("v") as "component").localCheckpoint(true)
    var it = 0
    var converged = false
    while (it < maxIters && !converged) {
      // local gather of neighbour minima per partition, then master combine
      val localMin = und.join(labels, und("b") === labels("v"))
        .groupBy(col("a"), col("part")).agg(min("component") as "partial")
      val gathered = localMin.groupBy(col("a") as "v").agg(min("partial") as "nbrMin")
      val next = labels.join(gathered, Seq("v"), "left")
        .select(col("v"),
          least(col("component"), coalesce(col("nbrMin"), col("component"))) as "component")
        .localCheckpoint(true)
      val changed = next.join(labels.withColumnRenamed("component", "old"), "v")
        .where(col("component") =!= col("old")).count()
      labels = next
      converged = changed == 0
      it += 1
    }
    (labels, it)
  }

  /** Exact driver-side PageRank reference (same formulation) for
    * correctness checks of the GAS path. */
  def pageRankReference(src: Array[Int], dst: Array[Int], nV: Int,
                        iters: Int = 10, damping: Double = 0.85): Array[Double] = {
    val outDeg = new Array[Int](nV)
    src.foreach(outDeg(_) += 1)
    var r = Array.fill(nV)(1.0 / nV)
    var it = 0
    while (it < iters) {
      val acc = new Array[Double](nV)
      var i = 0
      while (i < src.length) { acc(dst(i)) += r(src(i)) / outDeg(src(i)); i += 1 }
      var dangling = 0.0
      var v = 0
      while (v < nV) { if (outDeg(v) == 0) dangling += r(v); v += 1 }
      val next = new Array[Double](nV)
      v = 0
      while (v < nV) {
        next(v) = (1.0 - damping) / nV + damping * (acc(v) + dangling / nV)
        v += 1
      }
      r = next; it += 1
    }
    r
  }

  /** Exact driver-side connected-components reference (union-find). */
  def connectedComponentsReference(src: Array[Int], dst: Array[Int], nV: Int): Array[Int] = {
    val parent = Array.tabulate(nV)(identity)
    def find(x: Int): Int = {
      var r = x
      while (parent(r) != r) { parent(r) = parent(parent(r)); r = parent(r) }
      r
    }
    var i = 0
    while (i < src.length) {
      val a = find(src(i)); val b = find(dst(i))
      if (a != b) parent(math.max(a, b)) = math.min(a, b)
      i += 1
    }
    // component id = min vertex id in component
    Array.tabulate(nV)(find)
  }
}
