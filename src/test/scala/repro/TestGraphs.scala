package repro

import org.apache.spark.sql.SparkSession
import repro.core.EdgeStream

/** Shared, lazily-built test graphs so suites don't regenerate them.
  * All derive from [[WebGraphs.Tiny]]/[[WebGraphs.TinySocial]] (~30k
  * edges, 2k vertices) — big enough for power-law/locality structure,
  * small enough for sub-second partitioner runs.
  */
object TestGraphs {
  private var tinyCache: EdgeStream = _
  private var socialCache: EdgeStream = _

  def tiny(spark: SparkSession): EdgeStream = synchronized {
    if (tinyCache == null) tinyCache = EdgeStream.fromDF(WebGraphs.Tiny.df(spark))
    tinyCache
  }

  def tinySocial(spark: SparkSession): EdgeStream = synchronized {
    if (socialCache == null) socialCache = EdgeStream.fromDF(WebGraphs.TinySocial.df(spark))
    socialCache
  }

  /** A tiny deterministic hand-stream for exact-value tests. */
  def handStream: EdgeStream = EdgeStream.fromPairs(Seq(
    (1L, 2L), (1L, 3L), (2L, 3L), (4L, 5L), (4L, 6L), (5L, 6L), (3L, 4L), (6L, 1L)
  ))
}
