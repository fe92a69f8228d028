package repro.core

import repro.graph.CSRGraph
import repro.memsim.MemSim

/** One random-walk query (the paper's walker Q).
  *
  * Each walker owns a `SplittableRandom` seeded by its query id, so the
  * sequence of draws — and therefore the walk — is independent of which
  * engine runs it and in what interleaving order. The engine-equivalence
  * tests rely on this.
  */
final class Walker(val id: Int, val source: Int, seedBase: Long) {
  val rng = new java.util.SplittableRandom(seedBase ^ (id * 0x9E3779B97F4A7C15L))
  var cur: Int = source
  var prev: Int = -1
  var length: Int = 0 // steps taken; path has length+1 vertices
  val path = new scala.collection.mutable.ArrayBuffer[Int](16)
  path += source
  var done: Boolean = false

  /** The engine moves the walker along edge `e` to vertex `v`. */
  def move(v: Int): Unit = {
    prev = cur
    cur = v
    length += 1
    path += v
  }
}

/** Charging context handed to user-defined functions: dispatches reads as
  * streaming (inside Gather's sequential scan) or dependent (random).
  */
final class SimCtx(val sim: MemSim, val g: CSRGraph) {
  var streaming: Boolean = false
  @inline def read(addr: Long): Unit =
    if (streaming) sim.streamRead(addr) else sim.read(addr)
  @inline def compute(n: Int): Unit = sim.compute(n)
  @inline def mispredict(p: Double): Unit = sim.mispredict(p)
}
