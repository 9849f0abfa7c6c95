package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.partitioners.{PartitionAssignment, StreamingPartitioner}

/** How pass 2 maps clusters to partitions. */
sealed trait GameMode
/** Single-threaded best-response over all clusters (one batch). */
case object SequentialGame extends GameMode
/** Paper §V-D: consecutive-id batches played by a thread pool. */
final case class ParallelGame(batchSize: Int = 6400, threads: Int = 8) extends GameMode
/** CLUGP-G ablation: big-cluster-to-small-partition greedy, no game. */
case object GreedyPlacement extends GameMode

/** CLUGP configuration (defaults = paper §VI-A).
  *
  * @param tau        imbalance factor τ of pass 3
  * @param splitting  enable the splitting operation of pass 1
  *                   (`false` = the CLUGP-S ablation)
  * @param gameMode   pass-2 strategy
  * @param weight     relative weight of load balancing vs edge-cutting
  *                   (Fig. 11(b)); 0.5 = equal importance = λ at λ_max,
  *                   implemented as λ = λ_max · w/(1−w)
  * @param vMaxFactor maximum cluster volume as a multiple of |E|/k
  * @param init       initial strategy profile of the game
  * @param seed       seed of the game's random initial strategies
  */
final case class ClugpConfig(
    tau: Double = 1.0,
    splitting: Boolean = true,
    gameMode: GameMode = ParallelGame(),
    weight: Double = 0.5,
    vMaxFactor: Double = 1.0,
    init: InitStrategy = RangeInit,
    seed: Long = 17)

/** Per-pass timing and sizes of one CLUGP run, for the scalability and
  * parallelization experiments (Figs. 7 and 10). */
final case class ClugpStats(
    clusteringMs: Long, gameMs: Long, transformMs: Long,
    numClusters: Int, gameRounds: Long, gameMoves: Long)

/** The paper's contribution: CLUstering-based restreaming Graph
  * Partitioning — three passes over the edge stream (cluster, play the
  * partitioning game, transform), §III.
  */
final class Clugp(cfg: ClugpConfig = ClugpConfig()) extends StreamingPartitioner {
  override def name: String = cfg.gameMode match {
    case GreedyPlacement         => "CLUGP-G"
    case _ if !cfg.splitting     => "CLUGP-S"
    case _                       => "CLUGP"
  }
  override def preferredOrder: String = "bfs"

  /** Last run's per-pass stats (set by [[partition]]). */
  @volatile var lastStats: ClugpStats = ClugpStats(0, 0, 0, 0, 0, 0)

  override def partition(stream: EdgeStream, k: Int): PartitionAssignment = {
    val t0 = System.nanoTime()
    val vMax = math.max(2L, (cfg.vMaxFactor * stream.numEdges / k).toLong)
    // pass 1: streaming clustering
    val clustering = StreamingClustering.cluster(stream, vMax, cfg.splitting)
    val t1 = System.nanoTime()
    // pass 2: cluster partitioning game (on the cluster multigraph)
    val cg = ClusterGraph.build(stream, clustering)
    val lambda = cg.lambdaMax(k) * (cfg.weight / (1.0 - cfg.weight))
    val placed = cfg.gameMode match {
      case SequentialGame     => ClusterPartitioning.game(cg, k, lambda, cfg.seed, init = cfg.init)
      case ParallelGame(b, t) => ClusterPartitioning.parallelGame(cg, k, lambda, b, t, cfg.seed, init = cfg.init)
      case GreedyPlacement    => ClusterPartitioning.greedy(cg, k)
    }
    val t2 = System.nanoTime()
    // pass 3: partition transformation
    val part = PartitionTransformation.transform(stream, clustering, placed.assignment, k, cfg.tau)
    val t3 = System.nanoTime()

    lastStats = ClugpStats((t1 - t0) / 1000000, (t2 - t1) / 1000000, (t3 - t2) / 1000000,
      clustering.numClusters, placed.rounds, placed.moves)
    // space: clu + deg arrays (the paper's O(2|V|)) + divided flags +
    // cluster volumes + game tables
    val space = 8L * stream.numVertices + stream.numVertices +
      8L * clustering.numClusters + 4L * clustering.numClusters + 8L * k
    PartitionAssignment(part, space, (t3 - t0) / 1000000)
  }
}

object Clugp {

  /** Convenience single-node run with paper defaults. */
  def run(stream: EdgeStream, k: Int, cfg: ClugpConfig = ClugpConfig()): PartitionAssignment =
    new Clugp(cfg).partition(stream, k)

  /** Distributed mode (paper §III-C last ¶): each distributed node runs
    * the three passes over its slice of the edge stream, and the final
    * partitioning is the union of the per-node results.
    *
    * Implemented at the RDD layer: the stream is range-partitioned into
    * `numSlices` contiguous slices (preserving BFS order within a slice),
    * `mapPartitions` runs the full local pipeline per slice against the
    * same k logical partitions, and the per-edge assignments are unioned.
    *
    * @param edges DataFrame `(src: Long, dst: Long, id: Long)` from
    *              [[repro.SynthData.webGraph]]
    * @return DataFrame `(id, src, dst, part)`
    */
  def partitionDistributed(spark: SparkSession, edges: DataFrame, k: Int,
                           cfg: ClugpConfig = ClugpConfig(),
                           numSlices: Int = 8): DataFrame = {
    import spark.implicits._
    val ordered = edges.select($"src", $"dst", $"id")
      .as[(Long, Long, Long)].rdd
      .map { case (s, d, i) => ((s, i), (s, d, i)) }
      .repartitionAndSortWithinPartitions(
        new org.apache.spark.RangePartitioner(numSlices,
          edges.select($"src", $"id").as[(Long, Long)].rdd.map(t => (t, ()))))
      .values
    val assigned = ordered.mapPartitions { it =>
      val buf = it.toArray
      if (buf.isEmpty) Iterator.empty
      else {
        // local dense remap, local three-pass CLUGP, then emit global ids
        val local = EdgeStream.fromPairs(buf.map(e => (e._1, e._2)).toIndexedSeq)
        val res   = new Clugp(cfg).partition(local, k)
        buf.iterator.zipWithIndex.map { case ((s, d, i), j) => (i, s, d, res.part(j)) }
      }
    }
    assigned.toDF("id", "src", "dst", "part")
  }
}
