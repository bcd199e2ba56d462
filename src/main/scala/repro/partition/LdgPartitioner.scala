package repro.partition

import repro.core.Model._

/** Linear Deterministic Greedy streaming partitioner (Stanton & Kliot, [29]).
  *
  * Edge-stream variant as described in the Loom paper §4: when an edge
  * arrives, each yet-unassigned endpoint v is placed on the partition
  * maximising `N(S_i, v) · (1 − |V(S_i)|/C)` where N counts v's already-seen
  * neighbours in S_i and C is the per-partition capacity. Ties (including
  * the all-zero score of a fresh vertex) go to the least-loaded partition,
  * which keeps LDG's imbalance within a few percent (paper §5.2).
  */
final class LdgPartitioner(k: Int, nExpected: Long, slack: Double = 1.1)
    extends StreamingPartitioner {
  override val name  = "LDG"
  override val state =
    new PartitionState(k, capacity = math.max(1.0, slack * nExpected.toDouble / k))

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
      if (state.size(i) < state.capacity) {
        val score = counts(i) * (1.0 - state.size(i) / state.capacity)
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
