package repro.memsim

/** Top-down microarchitecture analysis (TMAM) pipeline-slot breakdown.
  *
  * Mirrors the five columns of the paper's Tables 1, 7, 8, 11, 12:
  * front-end bound, bad speculation, core bound, memory bound, retiring.
  * Fractions sum to 1.
  *
  * Accounting: each cycle provides `pipelineWidth` slots. Retiring slots
  * are retired instructions (1 uop each). Stall cycles charged by the
  * simulator map to empty slots of the corresponding category; the
  * non-retiring share of compute cycles (the machine is not width-bound
  * at IPC < width) is split between core-bound (execution-port pressure)
  * and front-end (fetch/decode) with a fixed Skylake-like ratio.
  */
final case class Tmam(
    frontEnd: Double,
    badSpec: Double,
    core: Double,
    memory: Double,
    retiring: Double,
) {
  def row(label: String): String =
    f"$label%-10s ${frontEnd * 100}%6.1f%% ${badSpec * 100}%6.1f%% ${core * 100}%6.1f%% ${memory * 100}%6.1f%% ${retiring * 100}%6.1f%%"
}

object Tmam {
  /** Share of non-retiring compute slots attributed to core-bound (the
    * rest is front-end). */
  val CoreShare = 0.72

  def from(s: SimStats): Tmam = {
    val totalSlots = s.pipelineWidth * math.max(s.cycles, 1e-9)
    val retiring = s.instructions.toDouble
    val memSlots = s.pipelineWidth * s.memStallCycles
    val badSlots = s.pipelineWidth * s.badSpecCycles
    val coreStallSlots = s.pipelineWidth * s.coreStallCycles
    val idleComputeSlots =
      math.max(0.0, s.pipelineWidth * s.computeCycles - retiring)
    val core = coreStallSlots + idleComputeSlots * CoreShare
    val frontEnd = idleComputeSlots * (1 - CoreShare)
    Tmam(
      frontEnd = frontEnd / totalSlots,
      badSpec = badSlots / totalSlots,
      core = core / totalSlots,
      memory = memSlots / totalSlots,
      retiring = retiring / totalSlots,
    )
  }

  val header: String =
    f"${"Method"}%-10s ${"FrontEnd"}%7s ${"BadSpec"}%7s ${"Core"}%7s ${"Memory"}%7s ${"Retire"}%7s"
}
