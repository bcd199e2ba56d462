package repro.partition

import repro.core.Model._

/** Fennel streaming partitioner (Tsourakakis et al., [30]).
  *
  * Places each unassigned vertex v on the partition maximising the marginal
  * gain `N(S_i, v) − α·γ·|S_i|^(γ−1)` with γ = 1.5 (the value used throughout
  * the Loom paper's evaluation) and α = m·k^(γ−1)/n^γ, subject to the hard
  * balance constraint |S_i| < ν·n/k with ν = 1.1.
  */
final class FennelPartitioner(k: Int, nExpected: Long, mExpected: Long,
                              gamma: Double = 1.5, nu: Double = 1.1)
    extends StreamingPartitioner {
  override val name = "Fennel"

  private val n     = math.max(1L, nExpected).toDouble
  private val m     = math.max(1L, mExpected).toDouble
  private val alpha = m * math.pow(k.toDouble, gamma - 1) / math.pow(n, gamma)
  private val hardCap = math.max(1.0, nu * n / k)

  override val state = new PartitionState(k, capacity = hardCap)

  private val adjacency = new AdjacencyTracker

  override def add(e: LEdge): Unit = {
    adjacency.add(e)
    place(e.u)
    place(e.v)
  }

  private def place(v: VId): Unit = if (!state.isAssigned(v)) {
    val counts = adjacency.neighbourCounts(v, state)
    var best      = -1
    var bestScore = Double.NegativeInfinity
    var i         = 0
    while (i < state.k) {
      if (state.size(i) < hardCap) {
        val score = counts(i) - alpha * gamma * math.pow(state.size(i).toDouble, gamma - 1)
        if (score > bestScore ||
            (score == bestScore && best >= 0 && state.size(i) < state.size(best))) {
          best = i; bestScore = score
        }
      }
      i += 1
    }
    state.assign(v, if (best >= 0) best else state.leastLoaded)
  }
}
