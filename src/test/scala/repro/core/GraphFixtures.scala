package repro.core

/** Shared helpers for core graph tests: direct CSR construction, an
  * independent brute-force betweenness reference, and random bipartite
  * graph generation.
  */
object GraphFixtures {

  /** Build a CSR from attribute membership lists. `attrs(i)` is the list of
    * value ids (each in `[0, numValues)`) contained in attribute i, whose
    * node id becomes `numValues + i`.
    */
  def csrOf(numValues: Int, attrs: Seq[Seq[Int]]): Csr = {
    val edges = for {
      (vals, ai) <- attrs.zipWithIndex
      v <- vals.distinct
    } yield (v, numValues + ai)
    Csr.fromEdges(numValues + attrs.size, numValues, edges.iterator)
  }

  /** Brute-force betweenness per the paper's Eq. (2), computed from
    * all-pairs BFS path counts with the combinatorial identity
    * `σ_vw(u) = σ_vu · σ_uw` iff `d(v,u) + d(u,w) = d(v,w)` — deliberately
    * a different algorithm from Brandes so the two validate each other.
    * Ordered-pair convention, unnormalized.
    */
  def bcReference(csr: Csr): Array[Double] = {
    val n = csr.numNodes
    val dist = Array.fill(n, n)(-1)
    val sigma = Array.fill(n, n)(0.0)
    for (s <- 0 until n) {
      val queue = scala.collection.mutable.Queue(s)
      dist(s)(s) = 0; sigma(s)(s) = 1.0
      while (queue.nonEmpty) {
        val v = queue.dequeue()
        csr.foreachNeighbor(v) { w =>
          if (dist(s)(w) < 0) { dist(s)(w) = dist(s)(v) + 1; queue.enqueue(w) }
          if (dist(s)(w) == dist(s)(v) + 1) sigma(s)(w) += sigma(s)(v)
        }
      }
    }
    Array.tabulate(n) { u =>
      var acc = 0.0
      for {
        v <- 0 until n if v != u
        w <- 0 until n if w != u && w != v
        if sigma(v)(w) > 0 && dist(v)(u) >= 0 && dist(u)(w) >= 0
        if dist(v)(u) + dist(u)(w) == dist(v)(w)
      } acc += sigma(v)(u) * sigma(u)(w) / sigma(v)(w)
      acc
    }
  }

  /** Deterministic random bipartite graph: each of `numAttrs` attributes
    * holds a random subset of the `numValues` values.
    */
  def randomCsr(numValues: Int, numAttrs: Int, seed: Long): Csr = {
    val rnd = new scala.util.Random(seed)
    val attrs = Seq.fill(numAttrs) {
      val size = 1 + rnd.nextInt(math.max(1, numValues - 1))
      rnd.shuffle((0 until numValues).toList).take(size)
    }
    csrOf(numValues, attrs)
  }

  def maxAbsDiff(a: Array[Double], b: Array[Double]): Double =
    a.zip(b).map { case (x, y) => math.abs(x - y) }.max
}
