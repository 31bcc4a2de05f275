package repro.core

import org.apache.spark.sql.SparkSession
import scala.collection.immutable.ArraySeq

/** Bipartite local clustering coefficient (paper §3.3, Eq. (1)).
  *
  * For a value node u let A(u) be its *attribute* neighbours (the columns
  * it occurs in) and VN(u) its *value* neighbours (values sharing at least
  * one column). The pairwise clustering coefficient of two co-occurring
  * values is the Jaccard similarity of their attribute sets,
  *
  *   `c_uv = |A(u) ∩ A(v)| / |A(u) ∪ A(v)|`,
  *
  * and `LCC(u) = avg_{v ∈ VN(u)} c_uv` (0 when VN(u) is empty).
  *
  * Note on fidelity: the paper's Eq. (1) is written over value-neighbour
  * sets `N(·)`, but its own §3.3 remark ("the measure ... is no more than
  * the average Jaccard similarity between the set of attributes that a
  * value co-occurs with") and the worked Example 3.6 numbers
  * (LCC(Jaguar)=0.36, Puma=0.43, Toyota/Panda=0.46 on Figure 1) match the
  * attribute-set Jaccard exactly (0.357/0.433/0.458) and not the
  * value-neighbour Jaccard (Jaguar would be 0.286). We therefore implement
  * the attribute-set variant, which reproduces the paper's numbers; see
  * DESIGN.md.
  *
  * Exact computation factors values into equivalence classes by their
  * attribute set: every member of class A has the same LCC
  *
  *   `LCC(A) = Σ_B (|B| − [A==B]) · J(A,B) / (Σ_B |B| − 1)`
  *
  * where B ranges over classes sharing ≥1 attribute with A and J is the
  * attribute-set Jaccard. Classes are scored in parallel with Spark.
  */
object Lcc {

  /** Exact LCC for every value node; result indexed by valueId. */
  def compute(spark: SparkSession, csr: Csr): Array[Double] = {
    val nv = csr.numValues
    if (nv == 0) return Array.emptyDoubleArray

    // --- Classes: values grouped by exact attribute set. ---
    val classOf = new Array[Int](nv)
    val classKeys = new scala.collection.mutable.HashMap[ArraySeq[Int], Int]()
    val sizeB = scala.collection.mutable.ArrayBuffer.empty[Int]
    var v = 0
    while (v < nv) {
      val key = ArraySeq.unsafeWrapArray(csr.neighborsOf(v))
      val cid = classKeys.getOrElseUpdate(key, { sizeB += 0; sizeB.size - 1 })
      classOf(v) = cid
      sizeB(cid) += 1
      v += 1
    }
    val numClasses = sizeB.size
    val classAttrs: Array[Array[Int]] =
      classKeys.toArray.sortBy(_._2).map(_._1.toArray) // sorted (CSR lists are sorted)
    val classSize: Array[Int] = sizeB.toArray

    // --- attr -> classes containing it ---
    val attrClasses = Array.fill(csr.numAttrs)(scala.collection.mutable.ArrayBuffer.empty[Int])
    var c = 0
    while (c < numClasses) {
      classAttrs(c).foreach(a => attrClasses(a - nv) += c)
      c += 1
    }

    // --- co-classes of A: classes sharing >=1 attribute with A (incl. A) ---
    val coClasses: Array[Array[Int]] = Array.tabulate(numClasses) { a =>
      val s = scala.collection.mutable.SortedSet.empty[Int]
      classAttrs(a).foreach(att => s ++= attrClasses(att - nv))
      s.toArray
    }

    // --- per-class LCC via Spark over classes ---
    val sc = spark.sparkContext
    val bAttrs = sc.broadcast(classAttrs)
    val bCo = sc.broadcast(coClasses)
    val bSize = sc.broadcast(classSize)
    val slices = math.max(1, math.min(numClasses, sc.defaultParallelism * 4))
    val classLcc: Map[Int, Double] = sc
      .parallelize(0 until numClasses, slices)
      .map { a =>
        val attrsL = bAttrs.value; val coL = bCo.value; val sizeL = bSize.value
        val aAttrs = attrsL(a)
        var denom = -1L // exclude u itself from its value-neighbour count
        coL(a).foreach(b => denom += sizeL(b))
        if (denom <= 0) (a, 0.0)
        else {
          var num = 0.0
          coL(a).foreach { b =>
            val inter = sortedIntersectionSize(aAttrs, attrsL(b))
            val union = aAttrs.length + attrsL(b).length - inter
            val weight = sizeL(b) - (if (b == a) 1 else 0)
            if (weight > 0 && union > 0) num += weight.toDouble * inter / union
          }
          (a, num / denom)
        }
      }
      .collect()
      .toMap
    bAttrs.destroy(); bCo.destroy(); bSize.destroy()

    Array.tabulate(nv)(u => classLcc(classOf(u)))
  }

  /** Size of the intersection of two sorted int arrays. */
  private[core] def sortedIntersectionSize(a: Array[Int], b: Array[Int]): Int = {
    var i = 0; var j = 0; var cnt = 0
    while (i < a.length && j < b.length) {
      val x = a(i); val y = b(j)
      if (x == y) { cnt += 1; i += 1; j += 1 }
      else if (x < y) i += 1
      else j += 1
    }
    cnt
  }

  /** Direct-from-definition reference implementation (tests only). */
  def bruteForce(csr: Csr): Array[Double] = {
    val nv = csr.numValues
    def attrsOf(u: Int): Set[Int] = csr.neighborsOf(u).toSet
    def valueNeighbors(u: Int): Set[Int] = {
      val s = scala.collection.mutable.Set.empty[Int]
      csr.foreachNeighbor(u)(a => csr.foreachNeighbor(a)(w => s += w))
      s -= u
      s.toSet
    }
    Array.tabulate(nv) { u =>
      val vn = valueNeighbors(u)
      if (vn.isEmpty) 0.0
      else {
        val au = attrsOf(u)
        val sum = vn.iterator.map { w =>
          val aw = attrsOf(w)
          val inter = au.intersect(aw).size
          val union = au.union(aw).size
          if (union == 0) 0.0 else inter.toDouble / union
        }.sum
        sum / vn.size
      }
    }
  }
}
