package repro.core

import scala.util.Random
import repro.SparkSpec
import repro.core.Model._
import repro.core.Signature._
import repro.partition._

/** End-to-end Loom partitioner tests (paper §3–§4). */
class LoomPartitionerSpec extends SparkSpec {
  import QueryGraph._

  private def mkLoom(k: Int, n: Long, w: Workload, window: Int = 100,
                     threshold: Double = 0.4): LoomPartitioner = {
    implicit val c: LabelCoder = new LabelCoder()
    val trie = TPSTry.ofWorkload(w)
    new LoomPartitioner(k, n, trie.motifIndex(threshold), window)
  }

  /** ipt of a workload over a partitioning, computed by brute force. */
  private def bruteIpt(edges: Vector[LEdge], pmap: Map[VId, Int], w: Workload): Double = {
    val g = SubGraph(edges.toSet)
    w.queries.map { case (q, f) =>
      f * NaiveIso.matches(q, g).map { es =>
        es.count { case (x, y) => pmap(x) != pmap(y) }
      }.sum
    }.sum
  }

  /** A two-community a/b graph with motif-heavy intra-community structure. */
  private def communityStream(seed: Int): Vector[LEdge] = {
    val rnd = new Random(seed)
    def community(base: Long): Vector[LEdge] = {
      val as = (0L until 12L).map(base + _)
      val bs = (12L until 20L).map(base + _)
      Vector.tabulate(40) { _ =>
        LEdge(as(rnd.nextInt(as.size)), "a", bs(rnd.nextInt(bs.size)), "b")
      }.distinct
    }
    (community(0) ++ community(100)).distinct
  }

  private val abWorkload = Workload(Vector(
    path("a", "b", "a") -> 3.0,
    path("b", "a", "b") -> 1.0,
  ))

  test("all stream vertices are assigned after finish()") {
    val stream = communityStream(1)
    val loom   = mkLoom(4, 40, abWorkload)
    val pmap   = StreamingPartitioner.run(loom, stream.iterator)
    val verts  = stream.flatMap(e => Seq(e.u, e.v)).toSet
    assert(verts.forall(pmap.contains), "every seen vertex must be placed")
  }

  test("the window is empty after finish()") {
    val loom = mkLoom(4, 40, abWorkload)
    communityStream(2).foreach(loom.add)
    loom.finish()
    assert(loom.matcher.windowSize == 0)
  }

  test("non-motif edges bypass the window entirely") {
    val w    = Workload(Vector(path("a", "b", "a") -> 1.0))
    val loom = mkLoom(2, 10, w)
    loom.add(LEdge(1, "c", 2, "d")) // c-d cannot be a motif edge
    assert(loom.matcher.windowSize == 0)
    assert(loom.state.isAssigned(1) && loom.state.isAssigned(2))
  }

  test("motif edges are buffered, not assigned immediately") {
    val loom = mkLoom(2, 10, abWorkload)
    loom.add(LEdge(1, "a", 2, "b"))
    assert(loom.matcher.windowSize == 1)
    assert(!loom.state.isAssigned(1) && !loom.state.isAssigned(2))
  }

  test("window capacity triggers evictions in arrival order") {
    val loom = mkLoom(2, 100, abWorkload, window = 3)
    val es = (0 until 6).map(i => LEdge(i * 2L, "a", i * 2L + 1, "b"))
    es.foreach(loom.add)
    assert(loom.matcher.windowSize == 3)
    assert(loom.evictions == 3)
    // First three edges' endpoints are assigned; last three still buffered.
    assert(loom.state.isAssigned(0) && loom.state.isAssigned(1))
    assert(!loom.state.isAssigned(10))
  }

  test("a motif-matching cluster is assigned to a single partition") {
    // One tight a-b-a wedge: both edges and all 3 vertices should co-locate.
    val loom = mkLoom(4, 10, abWorkload, window = 10)
    loom.add(LEdge(1, "a", 2, "b"))
    loom.add(LEdge(3, "a", 2, "b"))
    loom.finish()
    val p = loom.state.toMap
    assert(p(1L) == p(2L) && p(2L) == p(3L),
           s"wedge split across partitions: $p")
  }

  test("balance: no partition exceeds its capacity by more than one cluster") {
    val stream = communityStream(3)
    val verts  = stream.flatMap(e => Seq(e.u, e.v)).toSet.size
    val k      = 4
    val loom   = mkLoom(k, verts.toLong, abWorkload)
    StreamingPartitioner.run(loom, stream.iterator)
    val maxSize = loom.state.sizes.max
    // Equal opportunism bounds growth via the ration; allow cluster-granular
    // slack (the largest motif has 3 vertices).
    assert(maxSize <= math.ceil(1.1 * verts.toDouble / k) + 6,
           s"max partition size $maxSize of $verts vertices, k=$k")
  }

  test("Loom beats Hash on ipt for a motif-heavy stream (the paper's claim)") {
    val stream = communityStream(4)
    val verts  = stream.flatMap(e => Seq(e.u, e.v)).toSet.size.toLong
    val loom   = mkLoom(2, verts, abWorkload, window = 50)
    val loomMap = StreamingPartitioner.run(loom, stream.iterator)
    val hash    = new HashPartitioner(2, verts)
    val hashMap = StreamingPartitioner.run(hash, stream.iterator)
    val loomIpt = bruteIpt(stream, loomMap, abWorkload)
    val hashIpt = bruteIpt(stream, hashMap, abWorkload)
    assert(loomIpt < hashIpt,
           s"Loom ipt $loomIpt should beat Hash ipt $hashIpt")
  }

  test("evictions place the oldest edge (never lose stream edges)") {
    val loom = mkLoom(2, 100, abWorkload, window = 2)
    val es = Vector(
      LEdge(1, "a", 2, "b"), LEdge(3, "a", 2, "b"),
      LEdge(5, "a", 6, "b"), LEdge(7, "a", 6, "b"),
    )
    es.foreach(loom.add)
    loom.finish()
    es.foreach { e =>
      assert(loom.state.isAssigned(e.u) && loom.state.isAssigned(e.v), s"$e lost")
    }
  }

  test("window of size 1 degenerates gracefully") {
    val loom = mkLoom(2, 20, abWorkload, window = 1)
    communityStream(5).take(20).foreach(loom.add)
    loom.finish()
    assert(loom.matcher.windowSize == 0)
  }

  test("deterministic: same stream, same configuration, same partitioning") {
    val stream = communityStream(6)
    def run(): Map[VId, Int] = {
      val loom = mkLoom(3, 40, abWorkload)
      StreamingPartitioner.run(loom, stream.iterator)
    }
    assert(run() == run())
  }
}
