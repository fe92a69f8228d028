package repro.memsim

/** One level of a set-associative, LRU, write-allocate cache.
  *
  * Addresses are byte addresses in the simulated address space (see
  * [[repro.graph.CSRGraph]] for the layout). The cache tracks cache-line
  * tags only — no data is stored, since the engines operate on the real
  * JVM arrays and the simulator only accounts for latency.
  *
  * @param capacityBytes total capacity; must be a multiple of lineBytes*ways
  * @param ways          associativity
  * @param lineBytes     cache-line size (64 B, as on the paper's Skylake)
  */
final class CacheSim(val capacityBytes: Int, val ways: Int, val lineBytes: Int = 64) {
  require(capacityBytes % (lineBytes * ways) == 0,
    s"capacity $capacityBytes not divisible by line*ways ${lineBytes * ways}")

  val numSets: Int = capacityBytes / (lineBytes * ways)
  // tags(set * ways + way): line address (addr / lineBytes), -1 = invalid.
  private val tags = Array.fill[Long](numSets * ways)(-1L)
  // lru(set * ways + way): monotonically increasing access stamp.
  private val lru = new Array[Long](numSets * ways)
  private var stamp = 0L

  var hits: Long = 0L
  var misses: Long = 0L

  @inline private def setOf(line: Long): Int = ((line % numSets) + numSets).toInt % numSets

  /** Probe and update LRU. Returns true on hit; on miss the line is filled
    * (evicting the LRU way). The caller decides what a miss costs.
    */
  def access(addr: Long): Boolean = {
    val line = addr / lineBytes
    val set = setOf(line)
    val base = set * ways
    stamp += 1
    var w = 0
    while (w < ways) {
      if (tags(base + w) == line) { lru(base + w) = stamp; hits += 1; return true }
      w += 1
    }
    // miss: evict LRU way
    var victim = base
    var oldest = lru(base)
    w = 1
    while (w < ways) {
      if (lru(base + w) < oldest) { oldest = lru(base + w); victim = base + w }
      w += 1
    }
    tags(victim) = line
    lru(victim) = stamp
    misses += 1
    false
  }

  /** Probe without filling — used to decide which level serves a demand miss. */
  def contains(addr: Long): Boolean = {
    val line = addr / lineBytes
    val base = setOf(line) * ways
    var w = 0
    while (w < ways) { if (tags(base + w) == line) return true; w += 1 }
    false
  }

  /** Fill the line without counting a demand hit/miss (prefetch fill path). */
  def fill(addr: Long): Unit = {
    val line = addr / lineBytes
    val set = setOf(line)
    val base = set * ways
    var w = 0
    while (w < ways) { if (tags(base + w) == line) { lru(base + w) = stamp; return }; w += 1 }
    var victim = base
    var oldest = lru(base)
    w = 1
    while (w < ways) {
      if (lru(base + w) < oldest) { oldest = lru(base + w); victim = base + w }
      w += 1
    }
    tags(victim) = line
    stamp += 1
    lru(victim) = stamp
  }

  def reset(): Unit = {
    java.util.Arrays.fill(tags, -1L)
    java.util.Arrays.fill(lru, 0L)
    stamp = 0L; hits = 0L; misses = 0L
  }
}
