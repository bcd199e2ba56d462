package repro.core

import scala.collection.mutable
import repro.core.Model._
import repro.core.Signature._

/** A motif-matching sub-graph currently inside the stream window: a set of
  * window edges plus the TPSTry++ node (motif) it matches.
  *
  * Identity is an interned id, not structural: matches live in many hash
  * collections on the matcher's hot path and structural hashing would
  * re-hash the whole edge set on every operation. The matcher deduplicates
  * structurally via its own edge-set index, so two live instances never
  * share an edge set.
  */
final class MotifMatch private (val id: Long, val sub: SubGraph, val node: TPSTry#Node) {
  def edges: Set[LEdge]    = sub.edges
  lazy val vertices: Set[VId] = sub.vertices
  def support: Double      = node.support
  def size: Int            = sub.size

  override def hashCode: Int = java.lang.Long.hashCode(id)
  override def equals(o: Any): Boolean = o match {
    case m: MotifMatch => m.id == id
    case _             => false
  }
  override def toString: String = s"MotifMatch#$id(${sub.edges}, ${node})"
}

object MotifMatch {
  private val counter = new java.util.concurrent.atomic.AtomicLong(0L)
  def apply(sub: SubGraph, node: TPSTry#Node): MotifMatch =
    new MotifMatch(counter.incrementAndGet(), sub, node)
}

/** Graph-stream motif matcher (paper §3, Alg. 2).
  *
  * Maintains the sliding window P_temp and the matchList: a map from vertex
  * ids to the motif-matching sub-graphs in the window containing them. Each
  * time a motif-compatible edge enters the window, existing matches are grown
  * by the new edge, and pairs of matches meeting at the edge's endpoints are
  * joined — both purely via factor deltas against the (motif-filtered)
  * TPSTry++, never via explicit isomorphism tests.
  *
  * Performance notes: growth and joining only ever consult matches that are
  * still below the largest motif size (a maxed-out match can neither grow
  * nor absorb another), so those are indexed separately per vertex; and the
  * join step pairs only matches containing the new edge with the rest —
  * pairs of two pre-existing matches were joinable before the edge arrived
  * and were handled then. Both bounds matter at hub vertices, where the
  * number of (genuine) overlapping matches grows quadratically in the
  * in-window degree.
  */
final class MotifMatcher(val motifs: MotifIndex) {

  private implicit val coder: LabelCoder = motifs.trie.coder

  // Window edges in arrival order (LinkedHashMap preserves insertion order).
  private val window = mutable.LinkedHashMap.empty[LEdge, Unit]
  // All live matches, deduplicated by their edge set.
  private val allMatches = mutable.Map.empty[Set[LEdge], MotifMatch]
  // matchList: vertex -> matches containing it.
  private val matchList = mutable.Map.empty[VId, mutable.LinkedHashSet[MotifMatch]]
  // Sub-index of matchList: only matches that can still grow (size < max).
  private val growable = mutable.Map.empty[VId, mutable.LinkedHashSet[MotifMatch]]

  private val maxMotifEdges = motifs.maxMotifEdges

  def windowSize: Int                  = window.size
  def windowEdges: Vector[LEdge]       = window.keys.toVector
  def oldestEdge: Option[LEdge]        = window.headOption.map(_._1)
  def matchCount: Int                  = allMatches.size
  def matchesAt(v: VId): Vector[MotifMatch] =
    matchList.get(v).map(_.toVector).getOrElse(Vector.empty)

  /** All live matches that contain edge e. */
  def matchesContaining(e: LEdge): Vector[MotifMatch] =
    (matchesAt(e.u) ++ matchesAt(e.v)).distinct.filter(_.edges.contains(e))

  /** Check whether a lone stream edge matches a single-edge motif. If not,
    * the caller assigns it immediately and never adds it to the window.
    */
  def singleEdgeMotif(e: LEdge): Option[TPSTry#Node] = motifs.matchSingleEdge(e)

  /** Insert a motif-compatible edge into the window, discovering all new
    * motif matches it creates (Alg. 2). `singleNode` must be the node
    * returned by [[singleEdgeMotif]] for e.
    *
    * Returns the number of matches added.
    */
  def insert(e: LEdge, singleNode: TPSTry#Node): Int = {
    require(!window.contains(e), s"duplicate stream edge $e")
    window(e) = ()
    var added = 0
    if (register(MotifMatch(SubGraph.of(e), singleNode))) added += 1

    // Grow existing (growable) matches at e's endpoints by the single edge e.
    val existing = growableAt(e.u, e.v).filterNot(_.edges.contains(e))
    for (m <- existing) {
      val delta = fac(e, m.sub)
      motifs.motifChild(m.node, delta).foreach { c =>
        if (register(MotifMatch(m.sub + e, c))) added += 1
      }
    }

    // Join pairs of matches meeting at e: grow the larger by the smaller's
    // edges, following motif links in the trie (Alg. 2 lines 11–18). Any
    // match that is new at this step must contain e — pairs of two pre-
    // existing matches were joinable when their own last edge arrived.
    val withE = growableAt(e.u, e.v).filter(_.edges.contains(e))
    val all   = growableAt(e.u, e.v)
    for (m1 <- withE; m2 <- all if m1 != m2) {
      val (big, small) = if (m1.size >= m2.size) (m1, m2) else (m2, m1)
      val remaining    = small.edges -- big.edges
      if (remaining.nonEmpty && big.size + remaining.size <= maxMotifEdges)
        added += grow(big, remaining)
    }
    added
  }

  /** Recursively add `remaining` edges to `cur`, registering every motif
    * match found along the way (intermediate matches are genuine matches —
    * each step followed a motif link).
    */
  private def grow(cur: MotifMatch, remaining: Set[LEdge]): Int = {
    var added = 0
    for (e2 <- remaining if cur.size < maxMotifEdges && cur.sub.incident(e2)) {
      val delta = fac(e2, cur.sub)
      motifs.motifChild(cur.node, delta).foreach { c =>
        val next  = MotifMatch(cur.sub + e2, c)
        val fresh = register(next)
        if (fresh) added += 1
        // Recurse even on a duplicate: a different `remaining` may extend it.
        added += grow(next, remaining - e2)
      }
    }
    added
  }

  /** Remove a set of edges from the window (they have been assigned to
    * permanent partitions); every match referencing a removed edge is
    * dropped from the matchList.
    */
  def removeEdges(es: Set[LEdge]): Unit = {
    es.foreach(window.remove)
    val doomed = es.iterator
      .flatMap(e => matchesAt(e.u) ++ matchesAt(e.v))
      .filter(m => m.edges.exists(es))
      .toVector.distinct
    doomed.foreach { m =>
      allMatches.remove(m.edges)
      m.vertices.foreach { v =>
        matchList.get(v).foreach { set =>
          set.remove(m)
          if (set.isEmpty) matchList.remove(v)
        }
        growable.get(v).foreach { set =>
          set.remove(m)
          if (set.isEmpty) growable.remove(v)
        }
      }
    }
  }

  private def growableAt(u: VId, v: VId): Vector[MotifMatch] = {
    val a = growable.get(u).map(_.toVector).getOrElse(Vector.empty)
    val b = growable.get(v).map(_.toVector).getOrElse(Vector.empty)
    (a ++ b).distinct
  }

  private def register(m: MotifMatch): Boolean =
    if (allMatches.contains(m.edges)) false
    else {
      allMatches(m.edges) = m
      m.vertices.foreach { v =>
        matchList.getOrElseUpdate(v, mutable.LinkedHashSet.empty) += m
        if (m.size < maxMotifEdges)
          growable.getOrElseUpdate(v, mutable.LinkedHashSet.empty) += m
      }
      true
    }
}
