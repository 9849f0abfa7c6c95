package repro.partitioners

import repro.core.EdgeStream

/** Per-vertex replica table `A(v) ⊆ P` — the global state heuristic
  * partitioners must consult and lock per edge, which is exactly the
  * scalability bottleneck the paper attacks (§I).
  *
  * Storage here is a packed bitset for speed, but [[spaceBytes]] models
  * the *reference implementations* the paper measured (VGP keeps a
  * `HashSet<Integer>` of partitions per vertex, ≈48 B per replica entry
  * plus per-vertex object overhead) — Fig. 6's 8–10× heuristic-over-
  * CLUGP gap is a property of that comparator, which is closed to us
  * only as measurements, so we reproduce its footprint (DESIGN.md §3).
  */
private[partitioners] final class ReplicaTable(nV: Int, k: Int) {
  private val words = (k + 63) / 64
  private val bits  = new Array[Long](nV.toLong.toInt * words)
  private var entries = 0L

  @inline def contains(v: Int, p: Int): Boolean =
    (bits(v * words + (p >> 6)) & (1L << (p & 63))) != 0
  @inline def add(v: Int, p: Int): Unit = {
    val idx = v * words + (p >> 6); val m = 1L << (p & 63)
    if ((bits(idx) & m) == 0) { bits(idx) |= m; entries += 1 }
  }
  @inline def isEmpty(v: Int): Boolean = {
    var w = 0
    while (w < words) { if (bits(v * words + w) != 0) return false; w += 1 }
    true
  }
  /** Bytes of state of the VGP-style table — Fig. 6's space metric. */
  def spaceBytes: Long = 48L * entries + 16L * nV
}

/** PowerGraph's Greedy heuristic (the paper's "Greedy"): place each edge
  * to minimize new replicas, tie-broken by load, under a hard capacity
  * bound (the paper reports relative balance 1.0 for every algorithm).
  * Needs the full replica table and partition loads — high quality, high
  * time/space cost.
  */
final class GreedyPartitioner(tau: Double = 1.02) extends StreamingPartitioner {
  override val name = "Greedy"

  override def partition(stream: EdgeStream, k: Int): PartitionAssignment = timed {
    val nV = stream.numVertices
    val A = new ReplicaTable(nV, k)
    val load = new Array[Long](k)
    val capacity = math.max(1L, math.ceil(tau * stream.numEdges / k.toDouble).toLong)
    val out = new Array[Int](stream.numEdges)
    var i = 0
    while (i < out.length) {
      val u = stream.src(i); val v = stream.dst(i)
      val uE = A.isEmpty(u); val vE = A.isEmpty(v)
      // the min-loaded partition is always eligible (placing on the
      // minimum can never worsen relative balance), which keeps tiny
      // streams from degenerating under the hard capacity
      var minLoad = Long.MaxValue
      var q = 0
      while (q < k) { if (load(q) < minLoad) minLoad = load(q); q += 1 }
      var best = -1; var bestLoad = Long.MaxValue
      @inline def consider(p: Int): Unit =
        if ((load(p) < capacity || load(p) == minLoad) && load(p) < bestLoad) {
          best = p; bestLoad = load(p)
        }

      if (!uE || !vE) {
        // least-loaded partition already holding both, else either
        var p = 0
        while (p < k) {
          if (A.contains(u, p) && A.contains(v, p)) consider(p)
          p += 1
        }
        if (best < 0) {
          p = 0
          while (p < k) {
            if (A.contains(u, p) || A.contains(v, p)) consider(p)
            p += 1
          }
        }
      }
      if (best < 0) { // new endpoints, or all candidates at capacity
        var p = 0; while (p < k) { consider(p); p += 1 }
      }
      out(i) = best
      A.add(u, best); A.add(v, best)
      load(best) += 1
      i += 1
    }
    (out, A.spaceBytes + 8L * k)
  }
}

/** HDRF (Petroni et al., CIKM'15) — the paper's state-of-the-art
  * baseline: High-Degree (vertices are) Replicated First. Scores every
  * partition per edge with a replication term favouring partitions that
  * already hold the *lower*-degree endpoint, plus a load-balance term.
  *
  * @param lambdaBal balance weight (HDRF's λ, default 1.0 as in VGP)
  * @param tau hard capacity bound as a fraction of |E|/k (the paper
  *        reports relative balance 1.0 for every algorithm)
  */
final class HdrfPartitioner(lambdaBal: Double = 1.0, tau: Double = 1.02)
    extends StreamingPartitioner {
  override val name = "HDRF"

  override def partition(stream: EdgeStream, k: Int): PartitionAssignment = timed {
    val nV = stream.numVertices
    val A = new ReplicaTable(nV, k)
    val deg = new Array[Int](nV) // partial degrees
    val load = new Array[Long](k)
    val capacity = math.max(1L, math.ceil(tau * stream.numEdges / k.toDouble).toLong)
    val out = new Array[Int](stream.numEdges)
    val eps = 1.0
    var maxLoad = 0L; var minLoad = 0L
    var i = 0
    while (i < out.length) {
      val u = stream.src(i); val v = stream.dst(i)
      deg(u) += 1; deg(v) += 1
      val du = deg(u).toDouble; val dv = deg(v).toDouble
      val thetaU = du / (du + dv)
      var best = -1; var bestScore = Double.MinValue
      var p = 0
      while (p < k) {
        // min-loaded partitions stay eligible even at capacity, so tiny
        // streams don't degenerate under the hard bound
        if (load(p) < capacity || load(p) == minLoad) {
          // C_rep: 1 + (1 − θ) for each endpoint already on p — the
          // high-degree endpoint contributes less, so it gets cut first
          var cRep = 0.0
          if (A.contains(u, p)) cRep += 1.0 + (1.0 - thetaU)
          if (A.contains(v, p)) cRep += 1.0 + thetaU
          val cBal = (maxLoad - load(p)).toDouble / (eps + (maxLoad - minLoad).toDouble)
          val score = cRep + lambdaBal * cBal
          if (score > bestScore) { bestScore = score; best = p }
        }
        p += 1
      }
      if (best < 0) { // all partitions at capacity (cannot happen for tau>1)
        best = 0
        p = 1
        while (p < k) { if (load(p) < load(best)) best = p; p += 1 }
      }
      out(i) = best
      A.add(u, best); A.add(v, best)
      load(best) += 1
      if (load(best) > maxLoad) maxLoad = load(best)
      var q = 0; minLoad = Long.MaxValue
      while (q < k) { if (load(q) < minLoad) minLoad = load(q); q += 1 }
      i += 1
    }
    (out, A.spaceBytes + 4L * nV + 8L * k)
  }
}
