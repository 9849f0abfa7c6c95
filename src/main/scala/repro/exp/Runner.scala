package repro.exp

import repro.core._
import repro.partitioners._

/** One partitioning run's measurements — a row of the experiment tables. */
final case class RunResult(
    dataset: String, algo: String, k: Int,
    rf: Double, balance: Double, timeMs: Long, spaceBytes: Long,
    mirrors: Long, partitionSizes: Array[Long]) {
  def row: Seq[String] = Seq(dataset, algo, k.toString, f"$rf%.3f",
    f"$balance%.3f", timeMs.toString, spaceBytes.toString)
}

/** Runs the paper's six partitioners under §VI-A's protocol: each
  * algorithm gets its best stream order (BFS for CLUGP/Mint, random for
  * the rest) and default parameters. */
object Runner {

  /** Fresh instances of all competitors (stateful, so per-run). */
  def allAlgorithms(gameThreads: Int = 8): Seq[StreamingPartitioner] = Seq(
    new HashingPartitioner,
    new DbhPartitioner,
    new MintPartitioner(),
    new GreedyPartitioner,
    new HdrfPartitioner(),
    new Clugp(ClugpConfig(gameMode = ParallelGame(threads = gameThreads))),
  )

  /** Run `algo` on the BFS-ordered `stream` with its preferred order. */
  def run(dataset: String, stream: EdgeStream, algo: StreamingPartitioner,
          k: Int, shuffleSeed: Long = 99): RunResult = {
    val s = if (algo.preferredOrder == "bfs") stream else stream.shuffled(shuffleSeed)
    val a = algo.partition(s, k)
    val q = Metrics.evaluate(s, a.part, k)
    RunResult(dataset, algo.name, k, q.replicationFactor, q.relativeBalance,
      a.timeMs, a.spaceBytes, q.numReplicas, q.partitionSizes)
  }

  /** Render an aligned text table (what each bench prints). */
  def table(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val w = header.indices.map(i => all.map(_(i).length).max)
    def fmt(r: Seq[String]) =
      r.zip(w).map { case (c, n) => c.padTo(n, ' ') }.mkString("  ")
    (fmt(header) +: rows.map(fmt)).mkString("\n")
  }
}
