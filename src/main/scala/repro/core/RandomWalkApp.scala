package repro.core

import repro.graph.CSRGraph
import repro.sampling.WalkerType

/** The step-centric API of §4.2: users set the walker type and implement
  * `weight` (transition probability of edge e), `update` (terminate?) and,
  * for O-REJ, `maxWeight`.
  *
  * `weight` must charge the [[SimCtx]] for every memory access the UDF
  * would perform (user-space cost, which step interleaving cannot hide).
  */
trait RandomWalkApp extends Serializable {
  def name: String
  def walkerType: WalkerType.Value

  /** Transition weight of edge `e` for walker `w` (>= 0). */
  def weight(ctx: SimCtx, g: CSRGraph, w: Walker, e: Int): Double

  /** Upper bound on `weight` for O-REJ; unsupported by default. */
  def maxWeight(g: CSRGraph): Double =
    sys.error(s"$name does not define MaxWeight")

  /** Called after the walker moved along `e`; true terminates the query. */
  def update(ctx: SimCtx, g: CSRGraph, w: Walker, e: Int): Boolean
}
