package repro.core

import repro.core.Model._

/** Exact sub-graph isomorphism by backtracking (VF2-lite).
  *
  * Used as a verification substrate: it cross-checks the probabilistic
  * signature matching (paper §2.3 claims no false negatives and a small
  * false-positive rate) and provides brute-force pattern-match enumeration
  * against which the Spark join-based engine is validated. Only ever invoked
  * on small graphs — patterns are of the order of 10 edges.
  */
object NaiveIso {

  /** True iff q1 and q2 are isomorphic (label-preserving, edge-preserving). */
  def isomorphic(q1: QueryGraph, q2: QueryGraph): Boolean = {
    if (q1.numVertices != q2.numVertices || q1.numEdges != q2.numEdges) return false
    if (q1.labels.sorted != q2.labels.sorted) return false
    val adj2 = adjacency(q2)
    extend(q1, q2, adj2, Map.empty, 0).nonEmpty
  }

  /** All embeddings of pattern q into data graph g, as maps from pattern
    * vertex index to data vertex id. Injective on vertices.
    */
  def embeddings(q: QueryGraph, g: SubGraph): Vector[Map[Int, VId]] = {
    val verts  = g.vertices.toVector.sorted
    val labels = verts.map(v => v -> g.labelOf(v)).toMap
    val adj: Map[VId, Set[VId]] = {
      val m = scala.collection.mutable.Map.empty[VId, Set[VId]].withDefaultValue(Set.empty)
      g.edges.foreach { e => m(e.u) += e.v; m(e.v) += e.u }
      m.toMap.withDefaultValue(Set.empty)
    }
    def rec(mapping: Map[Int, VId], next: Int): Vector[Map[Int, VId]] =
      if (next == q.numVertices) Vector(mapping)
      else {
        val used = mapping.values.toSet
        verts.iterator
          .filter(v => !used(v) && labels(v) == q.labels(next))
          .filter { v =>
            q.edges.forall { case (a, b) =>
              val mA = if (a == next) Some(v) else mapping.get(a)
              val mB = if (b == next) Some(v) else mapping.get(b)
              (mA, mB) match {
                case (Some(x), Some(y)) => adj(x).contains(y)
                case _                  => true // not yet both mapped
              }
            }
          }
          .flatMap(v => rec(mapping + (next -> v), next + 1))
          .toVector
      }
    rec(Map.empty, 0)
  }

  /** Distinct matches (sub-graphs) of q in g: embeddings deduplicated by the
    * set of data edges they use, so automorphic re-labellings count once.
    */
  def matches(q: QueryGraph, g: SubGraph): Vector[Set[(VId, VId)]] =
    embeddings(q, g)
      .map { m =>
        q.edges.map { case (a, b) =>
          val (x, y) = (m(a), m(b))
          if (x <= y) (x, y) else (y, x)
        }.toSet
      }
      .distinct

  /** True iff q occurs as a sub-graph of the (small) pattern graph big. */
  def containedIn(q: QueryGraph, big: QueryGraph): Boolean = {
    // Treat `big` as a data graph with vertex ids 0..n-1.
    val g = SubGraph(big.edges.map { case (a, b) =>
      LEdge(a.toLong, big.labels(a), b.toLong, big.labels(b))
    }.toSet)
    // Isolated vertices in `big` can't matter: q has no isolated vertices
    // (every QueryGraph edge covers its endpoints) unless numVertices exceeds
    // edge coverage, which our constructors do not produce.
    embeddings(q, g).nonEmpty
  }

  private def adjacency(q: QueryGraph): Map[Int, Set[Int]] = {
    val m = scala.collection.mutable.Map.empty[Int, Set[Int]].withDefaultValue(Set.empty)
    q.edges.foreach { case (a, b) => m(a) += b; m(b) += a }
    m.toMap.withDefaultValue(Set.empty)
  }

  private def extend(q1: QueryGraph, q2: QueryGraph, adj2: Map[Int, Set[Int]],
                     mapping: Map[Int, Int], next: Int): Option[Map[Int, Int]] =
    if (next == q1.numVertices) Some(mapping)
    else {
      val used = mapping.values.toSet
      (0 until q2.numVertices).iterator
        .filter(v => !used(v) && q2.labels(v) == q1.labels(next) &&
                     q2.degree(v) == q1.degree(next))
        .filter { v =>
          q1.edges.forall { case (a, b) =>
            val mA = if (a == next) Some(v) else mapping.get(a)
            val mB = if (b == next) Some(v) else mapping.get(b)
            (mA, mB) match {
              case (Some(x), Some(y)) => adj2(x).contains(y)
              case _                  => true
            }
          } &&
          // edge-count preservation: isomorphism also requires no extra edges,
          // which holds automatically since |E| matches and q1-edges all map.
          true
        }
        .map(v => extend(q1, q2, adj2, mapping + (next -> v), next + 1))
        .collectFirst { case Some(m) => m }
    }
}
