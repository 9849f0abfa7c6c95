package repro.core

import java.util.concurrent.{Callable, Executors, TimeUnit}

/** Result of the second CLUGP pass.
  *
  * @param assignment cluster id → partition id (the `⟨c_i, p_j⟩` table)
  * @param rounds best-response rounds until Nash equilibrium, summed over
  *               batches (for the paper's round-complexity claims)
  * @param moves  total strategy changes performed
  */
final case class ClusterPartitioningResult(assignment: Array[Int], rounds: Long, moves: Long)

/** Initial strategy profile of the cluster partitioning game. */
sealed trait InitStrategy
/** Uniform random partition per cluster (paper Algorithm 3 line 2). */
case object RandomInit extends InitStrategy
/** Volume-balanced contiguous id ranges: clustering preserves graph
  * locality (§V-D — adjacent cluster ids are structurally adjacent), so
  * starting from contiguous ranges hands best-response a low-cut,
  * balanced profile to refine instead of a scattered one. */
case object RangeInit extends InitStrategy

/** Second CLUGP pass: map clusters to the k partitions (paper §V).
  *
  * Clusters are players of an exact potential game; each best-responds by
  * choosing the partition minimizing its individual cost (Equation 11)
  *
  *   φ(a_i) = λ/k · |c_i| · |a_i|  +  ½ (e(c_i, V∖a_i) + e(V∖a_i, c_i))
  *
  * until no player can improve — a pure Nash equilibrium, which exists
  * because the game admits the exact potential function of Definition 4.
  * Parallel mode groups clusters into consecutive-id batches (clustering
  * preserves locality, §V-D) and lets a thread pool drive an independent
  * game per batch.
  */
object ClusterPartitioning {

  /** Default cap on best-response rounds. Theorem 6 bounds rounds by the
    * number of cut edges; in practice convergence is a handful of rounds,
    * and the cap only guards pathological floating-point cost ties. */
  val MaxRounds = 200

  /** Play the game over the whole cluster graph in one batch. */
  def game(cg: ClusterGraph, k: Int, lambda: Double, seed: Long = 17,
           maxRounds: Int = MaxRounds,
           init: InitStrategy = RangeInit): ClusterPartitioningResult =
    gameOn(cg, (0 until cg.numClusters).toArray, k, lambda, seed, maxRounds, init)

  /** Paper §V-D parallel mode: consecutive-id batches of `batchSize`
    * clusters, each batch an independent game run on `threads` threads.
    * Each batch balances its own clusters over the same k logical
    * partitions using only intra-batch structure — the space/state per
    * thread is O(batchSize), matching the paper's accounting.
    */
  def parallelGame(cg: ClusterGraph, k: Int, lambda: Double,
                   batchSize: Int = 6400, threads: Int = 8, seed: Long = 17,
                   maxRounds: Int = MaxRounds,
                   init: InitStrategy = RangeInit): ClusterPartitioningResult = {
    val m = cg.numClusters
    if (m == 0) return ClusterPartitioningResult(Array.emptyIntArray, 0, 0)
    val batches = (0 until m).grouped(math.max(1, batchSize)).map(_.toArray).toArray
    val pool    = Executors.newFixedThreadPool(math.max(1, threads))
    try {
      val futures = batches.zipWithIndex.map { case (ids, bi) =>
        pool.submit(new Callable[ClusterPartitioningResult] {
          def call(): ClusterPartitioningResult =
            gameOn(cg, ids, k, lambda, seed + bi, maxRounds, init)
        })
      }
      val out = new Array[Int](m)
      var rounds = 0L; var moves = 0L
      futures.zip(batches).foreach { case (f, ids) =>
        val r = f.get()
        var i = 0
        while (i < ids.length) { out(ids(i)) = r.assignment(ids(i)); i += 1 }
        rounds += r.rounds; moves += r.moves
      }
      ClusterPartitioningResult(out, rounds, moves)
    } finally { pool.shutdown(); pool.awaitTermination(1, TimeUnit.MINUTES) }
  }

  /** The CLUGP-G ablation (Fig. 9): skip the game; greedily place each
    * cluster, largest first, on the currently smallest partition. */
  def greedy(cg: ClusterGraph, k: Int): ClusterPartitioningResult = {
    val m = cg.numClusters
    val out = new Array[Int](m)
    val load = new Array[Long](k)
    (0 until m).sortBy(c => -cg.sizes(c)).foreach { c =>
      var best = 0; var p = 1
      while (p < k) { if (load(p) < load(best)) best = p; p += 1 }
      out(c) = best; load(best) += cg.sizes(c)
    }
    ClusterPartitioningResult(out, 0, 0)
  }

  /** Best-response dynamics restricted to the cluster ids in `ids`;
    * clusters outside the batch are invisible (their load and cut edges
    * are not counted), so batches need no shared mutable state. */
  private def gameOn(cg: ClusterGraph, ids: Array[Int], k: Int, lambda: Double,
                     seed: Long, maxRounds: Int,
                     init: InitStrategy): ClusterPartitioningResult = {
    val m = cg.numClusters
    val part = Array.fill(m)(-1)
    val inBatch = new Array[Boolean](m)
    ids.foreach(inBatch(_) = true)

    // initial strategies (deterministic)
    val load = new Array[Long](k)
    init match {
      case RandomInit =>
        val rnd = new scala.util.Random(seed)
        ids.foreach { c => val p = rnd.nextInt(k); part(c) = p; load(p) += cg.sizes(c) }
      case RangeInit =>
        // contiguous id ranges with ≈ equal cluster volume per partition
        val total = math.max(1L, ids.map(cg.sizes).sum)
        var cum = 0L
        ids.foreach { c =>
          val p = math.min(k - 1, (cum * k / total).toInt)
          part(c) = p; load(p) += cg.sizes(c); cum += cg.sizes(c)
        }
    }

    val wToPart = new Array[Long](k) // cut edges from c to clusters currently in p
    var rounds = 0L; var moves = 0L
    var changed = true
    while (changed && rounds < maxRounds) {
      changed = false
      rounds += 1
      var idx = 0
      while (idx < ids.length) {
        val c = ids(idx)
        // bucket neighbor weights by the neighbors' current partition
        java.util.Arrays.fill(wToPart, 0L)
        val nIds = cg.neighborIds(c); val nW = cg.neighborWeights(c)
        var j = 0
        while (j < nIds.length) {
          val nb = nIds(j)
          if (inBatch(nb)) wToPart(part(nb)) += nW(j)
          j += 1
        }
        val cur = part(c)
        load(cur) -= cg.sizes(c) // evaluate all k choices with c removed
        var best = 0; var bestCost = Double.MaxValue; var curCost = Double.MaxValue
        var p = 0
        while (p < k) {
          // |a_i| includes c_i itself; cut cost = ½·(incident cut edges
          // to clusters outside p) with both directions pre-summed in w
          val cost = lambda / k * cg.sizes(c) * (load(p) + cg.sizes(c)) +
            0.5 * (cg.cutDegree(c) - wToPart(p))
          if (cost < bestCost) { best = p; bestCost = cost }
          if (p == cur) curCost = cost
          p += 1
        }
        // move only on a strict improvement so the dynamics terminate
        // (exact potential game: each move lowers Φ by the same amount)
        val next = if (bestCost < curCost - 1e-9) best else cur
        load(next) += cg.sizes(c)
        if (next != cur) { part(c) = next; moves += 1; changed = true }
        idx += 1
      }
    }
    ClusterPartitioningResult(part, rounds, moves)
  }
}
