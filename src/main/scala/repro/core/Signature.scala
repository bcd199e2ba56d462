package repro.core

import scala.util.Random
import repro.core.Model._

/** Number-theoretic graph signatures (paper §2.1–§2.3, after Song et al.).
  *
  * Each label l gets a random value r(l) ∈ [1, p). A graph's signature is a
  * **multiset of factors**: one edge factor per edge and one degree factor per
  * unit of vertex degree. Per §2.3 we never materialise the big-integer
  * product — representing signatures as factor multisets distinguishes e.g.
  * {6,2} from {4,3} from {12}, eliminating one source of collisions.
  *
  * Isomorphic graphs always produce identical factor multisets (same labelled
  * edge multiset + same labelled degree sequence), so there are no false
  * negatives; non-isomorphic graphs may collide with small probability.
  */
object Signature {

  /** Default prime modulus; the paper uses p = 251 (§2.3, Fig. 4). */
  val DefaultP: Int = 251

  /** A signature: a canonical (sorted) multiset of integer factors. */
  final case class Sig(factors: Vector[Int]) {
    require(factors == factors.sorted, "Sig factors must be sorted (use Sig.of)")

    def size: Int = factors.size

    /** Multiset union with another signature / factor delta. */
    def ++(that: Sig): Sig = Sig.of(factors ++ that.factors)

    /** Multiset difference (this minus that); None if `that` ⊄ this. */
    def --(that: Sig): Option[Sig] = {
      val counts = scala.collection.mutable.Map.empty[Int, Int]
      factors.foreach(f => counts(f) = counts.getOrElse(f, 0) + 1)
      var ok = true
      that.factors.foreach { f =>
        val c = counts.getOrElse(f, 0)
        if (c == 0) ok = false else counts(f) = c - 1
      }
      if (!ok) None
      else Some(Sig.of(counts.toVector.flatMap { case (f, c) => Vector.fill(c)(f) }))
    }

    /** The big-integer product of the factors (paper §2.1's "signature"). */
    def product: BigInt = factors.foldLeft(BigInt(1))(_ * _)
  }

  object Sig {
    val empty: Sig                    = Sig(Vector.empty)
    def of(fs: Iterable[Int]): Sig    = Sig(fs.toVector.sorted)
    def of(fs: Int*): Sig             = of(fs.toVector)
  }

  /** Assigns each label a distinct pseudo-random value r(l) ∈ [1, p).
    *
    * Values are drawn from a seeded shuffle so that a given (p, seed) yields
    * the same coder everywhere (trie construction and stream matching must
    * agree). Labels are registered lazily, in first-use order; callers that
    * need cross-JVM stability should register labels in a fixed order first.
    */
  final class LabelCoder(val p: Int = DefaultP, seed: Long = 42L) {
    require(p >= 2, "p must be at least 2")
    private val pool    = new Random(seed).shuffle((1 until p).toVector)
    private val values  = scala.collection.mutable.LinkedHashMap.empty[String, Int]

    /** r(l): the random value for label l (registered on first use). */
    def r(label: String): Int = synchronized {
      values.getOrElseUpdate(label, {
        require(values.size < pool.size, s"more labels than available values in [1,$p)")
        pool(values.size)
      })
    }

    /** Labels registered so far, in registration order. */
    def knownLabels: Vector[String] = synchronized(values.keys.toVector)
  }

  /** Map x into [1, p]: the paper does not consider 0 a valid factor and
    * replaces it with p (footnote 3: 11 mod 11 = 11).
    */
  private def nonZero(x: Int, p: Int): Int = {
    val m = ((x % p) + p) % p
    if (m == 0) p else m
  }

  /** Edge factor for an edge between labels la and lb.
    *
    * The paper's formula has a typo (subtracts a value from itself); its
    * worked example computes (r(b) − r(a)) mod 11 = 7 for r(a)=3, r(b)=10, so
    * we use the order-normalised difference, which is symmetric as required
    * for undirected edges.
    */
  def edgeFactor(la: String, lb: String)(implicit coder: LabelCoder): Int = {
    val (x, y) = (coder.r(la), coder.r(lb))
    nonZero(math.max(x, y) - math.min(x, y), coder.p)
  }

  /** The k-th degree factor for a vertex with label l: (r(l) + k) mod p.
    *
    * A vertex of degree n contributes factors for k = 1..n; raising a degree
    * from n−1 to n adds exactly `degreeFactor(l, n)`.
    */
  def degreeFactor(l: String, k: Int)(implicit coder: LabelCoder): Int = {
    require(k >= 1, "degree factors start at k = 1")
    nonZero(coder.r(l) + k, coder.p)
  }

  /** Factors added to sub-graph g's signature by adding edge e (paper's
    * fac(e, g)): one edge factor plus one new degree factor per endpoint.
    */
  def fac(e: LEdge, g: SubGraph)(implicit coder: LabelCoder): Sig =
    Sig.of(
      edgeFactor(e.uLabel, e.vLabel),
      degreeFactor(e.uLabel, g.degree(e.u) + 1),
      degreeFactor(e.vLabel, g.degree(e.v) + 1)
    )

  /** Full signature of a concrete sub-graph (built incrementally edge-by-edge). */
  def ofSubGraph(g: SubGraph)(implicit coder: LabelCoder): Sig = {
    val edgeFs = g.edges.toVector.map(e => edgeFactor(e.uLabel, e.vLabel))
    val degFs = g.vertices.toVector.flatMap { v =>
      (1 to g.degree(v)).map(k => degreeFactor(g.labelOf(v), k))
    }
    Sig.of(edgeFs ++ degFs)
  }

  /** Full signature of a pattern graph. */
  def ofQueryGraph(q: QueryGraph)(implicit coder: LabelCoder): Sig = {
    val edgeFs = q.edges.map { case (a, b) => edgeFactor(q.labels(a), q.labels(b)) }
    val degFs = (0 until q.numVertices).flatMap { i =>
      (1 to q.degree(i)).map(k => degreeFactor(q.labels(i), k))
    }
    Sig.of(edgeFs ++ degFs)
  }

  /** Factors a pattern edge (a,b) adds to pattern sub-graph `have` (a set of
    * edge indices of q): the pattern-side analogue of [[fac]].
    */
  def facPattern(q: QueryGraph, have: Set[Int], edgeIdx: Int)
                (implicit coder: LabelCoder): Sig = {
    val (a, b) = q.edges(edgeIdx)
    def degIn(v: Int): Int = have.count { i =>
      val (x, y) = q.edges(i); x == v || y == v
    }
    Sig.of(
      edgeFactor(q.labels(a), q.labels(b)),
      degreeFactor(q.labels(a), degIn(a) + 1),
      degreeFactor(q.labels(b), degIn(b) + 1)
    )
  }
}
