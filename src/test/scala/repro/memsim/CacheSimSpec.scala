package repro.memsim

import org.scalatest.funsuite.AnyFunSuite

class CacheSimSpec extends AnyFunSuite {

  test("cold access misses, repeat access hits") {
    val c = new CacheSim(1024, 4)
    assert(!c.access(0L))
    assert(c.access(0L))
    assert(c.access(63L)) // same line
    assert(!c.access(64L)) // next line
    assert(c.hits == 2 && c.misses == 2)
  }

  test("capacity eviction under LRU within a set") {
    // 1 KB, 4-way, 64 B lines -> 4 sets; lines mapping to set 0 are multiples of 4.
    val c = new CacheSim(1024, 4)
    val set0 = (0 until 5).map(i => i * 4 * 64L) // 5 lines, one set, 4 ways
    set0.foreach(a => assert(!c.access(a)))
    // line 0 was LRU -> evicted
    assert(!c.access(set0(0)))
    // line 1 is still resident? it became LRU after the access of set0(0) evicted it...
    // deterministic: after inserting 5 lines, lines 1..4 resident; re-access 0 evicts 1.
    assert(!c.access(set0(1)))
  }

  test("distinct sets do not interfere") {
    val c = new CacheSim(1024, 4)
    (0 until 4).foreach(s => assert(!c.access(s * 64L)))
    (0 until 4).foreach(s => assert(c.access(s * 64L)))
  }

  test("contains does not change state") {
    val c = new CacheSim(1024, 4)
    assert(!c.contains(0L))
    c.access(0L)
    assert(c.contains(0L))
    assert(c.hits == 0 && c.misses == 1)
  }

  test("fill makes subsequent access a hit without counting a demand miss") {
    val c = new CacheSim(1024, 4)
    c.fill(128L)
    assert(c.access(128L))
    assert(c.misses == 0)
  }

  test("reset clears tags and counters") {
    val c = new CacheSim(1024, 4)
    c.access(0L); c.access(0L)
    c.reset()
    assert(c.hits == 0 && c.misses == 0)
    assert(!c.access(0L))
  }

  test("rejects capacity not divisible by line*ways") {
    intercept[IllegalArgumentException](new CacheSim(1000, 4))
  }

  test("LRU is per-set: hot line survives heavy traffic in other sets") {
    val c = new CacheSim(1024, 4)
    c.access(0L) // set 0
    (1 to 100).foreach(i => c.access((4 * i + 1) * 64L)) // set 1 traffic
    assert(c.access(0L))
  }
}
