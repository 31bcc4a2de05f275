package repro.data

/** Deterministic vocabulary pools for the synthetic benchmarks.
  *
  * Pools are disjoint by construction (every token embeds its pool tag);
  * homographs are *planted* by overwriting chosen slots of two pools with
  * the same string, exactly mirroring how the paper's SB contains values
  * like "Jaguar" in both an animal table and a car table.
  */
object Vocab {

  /** `n` distinct tokens for pool `tag`, e.g. `CITY_00017`. Upper-case so
    * they are fixed points of the lake normalization.
    */
  def pool(tag: String, n: Int): IndexedSeq[String] =
    (0 until n).map(i => f"${tag.toUpperCase}%s_$i%05d")

  /** Plant `count` homographs across two pools: slots `aSlots(i)` of `a`
    * and `bSlots(i)` of `b` are both replaced by the homograph token.
    * Returns the modified pools and the planted tokens.
    */
  def plantHomographs(
      a: IndexedSeq[String],
      b: IndexedSeq[String],
      count: Int,
      namePrefix: String,
      seed: Long): (IndexedSeq[String], IndexedSeq[String], IndexedSeq[String]) = {
    require(count <= a.size && count <= b.size, "pools too small for requested homographs")
    val rnd = new scala.util.Random(seed)
    val aSlots = rnd.shuffle(a.indices.toList).take(count)
    val bSlots = rnd.shuffle(b.indices.toList).take(count)
    val toks = (0 until count).map(i => f"${namePrefix.toUpperCase}%s_$i%03d")
    val a2 = aSlots.zip(toks).foldLeft(a) { case (acc, (s, t)) => acc.updated(s, t) }
    val b2 = bSlots.zip(toks).foldLeft(b) { case (acc, (s, t)) => acc.updated(s, t) }
    (a2, b2, toks)
  }

  /** Sample `rows` values from a pool: a shuffled pass over the whole pool
    * first (guaranteeing every token appears when `rows >= pool size`),
    * then uniform draws. Deterministic in `seed`.
    */
  def sampleColumn(pool: IndexedSeq[String], rows: Int, seed: Long): IndexedSeq[String] = {
    val rnd = new scala.util.Random(seed)
    val perm = rnd.shuffle(pool.indices.toList)
    (0 until rows).map { i =>
      if (i < pool.size) pool(perm(i))
      else pool(rnd.nextInt(pool.size))
    }
  }
}
