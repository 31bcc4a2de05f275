package repro.data

import org.scalatest.funsuite.AnyFunSuite

class VocabSpec extends AnyFunSuite {

  test("pool produces n distinct upper-case tokens") {
    val p = Vocab.pool("city", 100)
    assert(p.size === 100)
    assert(p.distinct.size === 100)
    assert(p.forall(t => t == t.toUpperCase))
    assert(p.forall(_.startsWith("CITY_")))
  }

  test("pools with different tags are disjoint") {
    assert(Vocab.pool("a", 50).toSet.intersect(Vocab.pool("b", 50).toSet).isEmpty)
  }

  test("plantHomographs places the same token in both pools") {
    val a = Vocab.pool("a", 30)
    val b = Vocab.pool("b", 40)
    val (a2, b2, toks) = Vocab.plantHomographs(a, b, 5, "hom", seed = 3)
    assert(toks.size === 5)
    toks.foreach { t =>
      assert(a2.count(_ == t) === 1)
      assert(b2.count(_ == t) === 1)
    }
    assert(a2.size === 30 && b2.size === 40)
    assert(a2.toSet.intersect(b2.toSet) === toks.toSet)
  }

  test("plantHomographs is deterministic in the seed") {
    val a = Vocab.pool("a", 30); val b = Vocab.pool("b", 30)
    val r1 = Vocab.plantHomographs(a, b, 4, "h", 9)
    val r2 = Vocab.plantHomographs(a, b, 4, "h", 9)
    assert(r1 === r2)
  }

  test("plantHomographs rejects oversized requests") {
    intercept[IllegalArgumentException] {
      Vocab.plantHomographs(Vocab.pool("a", 3), Vocab.pool("b", 10), 5, "h", 1)
    }
  }

  test("sampleColumn covers the whole pool when rows >= pool size") {
    val p = Vocab.pool("x", 20)
    val col = Vocab.sampleColumn(p, 50, seed = 4)
    assert(col.size === 50)
    assert(col.toSet === p.toSet)
  }

  test("sampleColumn only draws from the pool and is deterministic") {
    val p = Vocab.pool("x", 200)
    val c1 = Vocab.sampleColumn(p, 40, seed = 5)
    val c2 = Vocab.sampleColumn(p, 40, seed = 5)
    assert(c1 === c2)
    assert(c1.toSet.subsetOf(p.toSet))
    assert(c1.distinct.size === 40) // first pass is a permutation prefix
  }
}
