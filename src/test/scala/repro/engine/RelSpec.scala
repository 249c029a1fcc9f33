package repro.engine

import org.scalatest.funsuite.AnyFunSuite

/** Unit tests for relations, hash indexes and the incremental join cache. */
class RelSpec extends AnyFunSuite {

  test("Rel deduplicates rows on insert") {
    val r = new Rel(2)
    assert(r.add(Array("a", "b")))
    assert(!r.add(Array("a", "b")))
    assert(r.add(Array("a", "c")))
    assert(r.size == 2)
  }

  test("Rel rejects rows of wrong arity") {
    val r = new Rel(2)
    intercept[IllegalArgumentException](r.add(Array("a")))
  }

  test("Rel.contains reflects inserted rows") {
    val r = new Rel(3)
    r.add(Array("a", "b", "c"))
    assert(r.contains(Array("a", "b", "c")))
    assert(!r.contains(Array("a", "b", "d")))
  }

  test("HashIdx probes rows by column value") {
    val r = Rel.of(Seq(Array("a", "1"), Array("a", "2"), Array("b", "3")), 2)
    val idx = new HashIdx(r, 0).refresh()
    assert(idx.probe("a").map(_(1)).toSet == Set("1", "2"))
    assert(idx.probe("b").map(_(1)).toSet == Set("3"))
    assert(idx.probe("z").isEmpty)
  }

  test("HashIdx refresh picks up rows appended after construction") {
    val r = new Rel(2)
    r.add(Array("a", "1"))
    val idx = new HashIdx(r, 0).refresh()
    assert(idx.probe("a").size == 1)
    r.add(Array("a", "2"))
    assert(idx.probe("a").size == 1) // stale until refreshed
    idx.refresh()
    assert(idx.probe("a").size == 2)
  }

  test("HashIdx can index the second column") {
    val r = Rel.of(Seq(Array("a", "x"), Array("b", "x")), 2)
    val idx = new HashIdx(r, 1).refresh()
    assert(idx.probe("x").map(_(0)).toSet == Set("a", "b"))
  }

  test("JoinCache disabled rebuilds the index on every call") {
    val jc = new JoinCache(false)
    val r  = Rel.of(Seq(Array("a", "1")), 2)
    jc.index(r, 0); jc.index(r, 0); jc.index(r, 0)
    assert(jc.builds == 3)
  }

  test("JoinCache enabled builds once per (rel, col) and refreshes incrementally") {
    val jc = new JoinCache(true)
    val r  = Rel.of(Seq(Array("a", "1")), 2)
    val i1 = jc.index(r, 0)
    r.add(Array("a", "2"))
    val i2 = jc.index(r, 0)
    assert(i1 eq i2)
    assert(jc.builds == 1)
    assert(i2.probe("a").size == 2)
    jc.index(r, 1)
    assert(jc.builds == 2) // different column = different build structure
  }

  test("JoinCache distinguishes relations by identity, not content") {
    val jc = new JoinCache(true)
    val r1 = Rel.of(Seq(Array("a", "1")), 2)
    val r2 = Rel.of(Seq(Array("a", "1")), 2)
    jc.index(r1, 0); jc.index(r2, 0)
    assert(jc.builds == 2)
  }
}
