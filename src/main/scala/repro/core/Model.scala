package repro.core

/** Core data model for the Loom reproduction.
  *
  * Graphs are undirected and vertex-labelled (paper §1.3): an online graph is
  * a sequence of labelled edges; a pattern-matching query is a small labelled
  * pattern graph; a workload is a multiset of patterns with frequencies.
  */
object Model {

  /** Vertex identifier in a data graph. */
  type VId = Long

  /** An undirected, vertex-labelled edge of the data graph stream.
    *
    * Labels ride along with the edge because in the streaming model the
    * partitioner may see a vertex for the first time on any edge.
    */
  final case class LEdge(u: VId, uLabel: String, v: VId, vLabel: String) {
    require(u != v, s"self-loops are not supported: $u")

    /** Endpoints as a pair, smaller id first (canonical form). */
    def canonical: (VId, VId) = if (u <= v) (u, v) else (v, u)

    /** Label of endpoint `x`, which must be `u` or `v`. */
    def labelOf(x: VId): String =
      if (x == u) uLabel
      else if (x == v) vLabel
      else throw new IllegalArgumentException(s"$x is not an endpoint of $this")

    /** True if this edge shares at least one endpoint with `other`. */
    def touches(other: LEdge): Boolean =
      u == other.u || u == other.v || v == other.u || v == other.v

    /** True if `x` is one of this edge's endpoints. */
    def contains(x: VId): Boolean = x == u || x == v
  }

  /** A small labelled pattern graph (query graph, paper §1.3).
    *
    * Pattern vertices are integers `0 until numVertices`; `labels(i)` is the
    * label of pattern vertex i; `edges` are undirected pairs of pattern
    * vertex indices.
    */
  final case class QueryGraph(labels: Vector[String], edges: Vector[(Int, Int)]) {
    require(edges.nonEmpty, "a query graph must have at least one edge")
    edges.foreach { case (a, b) =>
      require(a != b, "query graphs may not contain self-loops")
      require(a >= 0 && a < labels.size && b >= 0 && b < labels.size,
              s"edge ($a,$b) out of range for ${labels.size} vertices")
    }

    def numVertices: Int = labels.size
    def numEdges: Int    = edges.size

    /** Degree of pattern vertex i. */
    def degree(i: Int): Int = edges.count { case (a, b) => a == i || b == i }

    /** Pattern vertices adjacent to i. */
    def neighbours(i: Int): Vector[Int] =
      edges.collect { case (a, b) if a == i => b; case (a, b) if b == i => a }

    /** This pattern's edges as label pairs (sorted within the pair). */
    def edgeLabelPairs: Vector[(String, String)] =
      edges.map { case (a, b) =>
        val (la, lb) = (labels(a), labels(b))
        if (la <= lb) (la, lb) else (lb, la)
      }
  }

  object QueryGraph {

    /** A single-edge pattern `la - lb`. */
    def singleEdge(la: String, lb: String): QueryGraph =
      QueryGraph(Vector(la, lb), Vector((0, 1)))

    /** A label-path pattern `l0 - l1 - ... - ln`. */
    def path(ls: String*): QueryGraph = {
      require(ls.size >= 2, "a path needs at least two labels")
      QueryGraph(ls.toVector, (0 until ls.size - 1).map(i => (i, i + 1)).toVector)
    }

    /** A star with centre label `c` and leaf labels `ls`. */
    def star(c: String, ls: String*): QueryGraph =
      QueryGraph((c +: ls).toVector, (1 to ls.size).map(i => (0, i)).toVector)

    /** A cycle over the given labels (triangle for 3 labels, etc.). */
    def cycle(ls: String*): QueryGraph = {
      require(ls.size >= 3, "a cycle needs at least three labels")
      val n = ls.size
      QueryGraph(ls.toVector, (0 until n).map(i => (i, (i + 1) % n)).toVector)
    }
  }

  /** A pattern-matching query workload: patterns with relative frequencies. */
  final case class Workload(queries: Vector[(QueryGraph, Double)]) {
    require(queries.nonEmpty, "a workload must contain at least one query")
    queries.foreach { case (_, f) => require(f > 0, "frequencies must be positive") }

    /** Sum of all query frequencies. */
    def totalFrequency: Double = queries.map(_._2).sum

    /** Largest query size in edges (bounds signature sizes, paper §2.3). */
    def maxQueryEdges: Int = queries.map(_._1.numEdges).max
  }

  /** A concrete sub-graph of the data graph: a set of labelled edges.
    *
    * Utility wrapper used by the motif matcher; kept tiny because matches are
    * bounded by the largest motif (order of 10 edges).
    */
  final case class SubGraph(edges: Set[LEdge]) {
    /** All vertex ids appearing in this sub-graph. */
    lazy val vertices: Set[VId] = edges.flatMap(e => Set(e.u, e.v))

    /** Degree of vertex x within this sub-graph. */
    def degree(x: VId): Int = edges.count(_.contains(x))

    /** Label of vertex x within this sub-graph. */
    def labelOf(x: VId): String =
      edges.collectFirst {
        case e if e.u == x => e.uLabel
        case e if e.v == x => e.vLabel
      }.getOrElse(throw new IllegalArgumentException(s"vertex $x not in sub-graph"))

    def size: Int                     = edges.size
    def contains(e: LEdge): Boolean   = edges.contains(e)
    def containsVertex(x: VId): Boolean = vertices.contains(x)

    /** True if edge e shares a vertex with this sub-graph (or the graph is empty). */
    def incident(e: LEdge): Boolean =
      edges.isEmpty || containsVertex(e.u) || containsVertex(e.v)

    def +(e: LEdge): SubGraph = SubGraph(edges + e)

    /** Convert to a QueryGraph over re-indexed vertices (for iso checks). */
    def toQueryGraph: QueryGraph = {
      val vs  = vertices.toVector.sorted
      val idx = vs.zipWithIndex.toMap
      QueryGraph(vs.map(labelOf), edges.toVector.map(e => (idx(e.u), idx(e.v))))
    }
  }

  object SubGraph {
    val empty: SubGraph           = SubGraph(Set.empty[LEdge])
    def of(es: LEdge*): SubGraph  = SubGraph(es.toSet)
  }
}
