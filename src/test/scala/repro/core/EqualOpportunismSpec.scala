package repro.core

import repro.SparkSpec
import repro.core.Model._
import repro.core.Signature._
import repro.partition.PartitionState

/** Equal-opportunism tests (paper §4, eqs. 1–3 and the worked example). */
class EqualOpportunismSpec extends SparkSpec {
  import EqualOpportunism._
  import QueryGraph._

  private implicit val coder: LabelCoder = new LabelCoder()

  private def mkState(k: Int, capacity: Double, sizes: Vector[Int]): PartitionState = {
    val s = new PartitionState(k, capacity)
    var next = 100000L
    sizes.zipWithIndex.foreach { case (cnt, pid) =>
      (0 until cnt).foreach { _ => s.assign(next, pid); next += 1 }
    }
    s
  }

  private def mkMatch(support: Double, edges: LEdge*): MotifMatch = {
    // Build a one-query trie whose root child has the wanted support by
    // mixing in a dummy query; simpler: fabricate via a trie with two queries.
    val trie = new TPSTry
    val q    = SubGraph(edges.toSet).toQueryGraph
    trie.add(q, support)
    if (support < 1.0) trie.add(path("zz", "zz"), 1.0 - support) // absorbs remaining mass
    val sig  = ofSubGraph(SubGraph(edges.toSet))
    MotifMatch(SubGraph(edges.toSet), trie.node(sig).get)
  }

  // ---------- ration l (eq. 2, corrected) ----------

  test("ration is 1 for the smallest partition") {
    val s = mkState(2, 100, Vector(3, 5))
    assert(ration(s, 0, Params()) == 1.0)
  }

  test("ration is 0 at the maximum-imbalance capacity") {
    val s = mkState(2, 20, Vector(10, 23)) // 23 >= capacity 20
    assert(ration(s, 1, Params()) == 0.0)
    assert(ration(s, 0, Params()) == 1.0, "the smallest partition still bids")
  }

  test("ration is (S_min/|V|)·α between the extremes") {
    val s = mkState(2, 100, Vector(10, 11)) // 11 <= 1.1 * 10
    val l = ration(s, 1, Params(alpha = 2.0 / 3.0))
    assert(math.abs(l - (10.0 / 11.0) * (2.0 / 3.0)) < 1e-12)
  }

  test("paper's worked example: a partition 33.3% larger gets ration 1/2") {
    // S1 has 4 vertices, S2 has 3 (33.3% larger); α=2/3 (the paper's default,
    // written reciprocally as 1.5 in its example); b relaxed to allow it.
    val s = mkState(2, 100, Vector(4, 3))
    val l = ration(s, 0, Params(alpha = 2.0 / 3.0, b = 1.5))
    assert(math.abs(l - 0.5) < 1e-12, s"expected 1/2, got $l")
  }

  test("ration with empty partitions does not divide by zero") {
    val s = mkState(3, 100, Vector(0, 0, 0))
    (0 until 3).foreach(pid => assert(ration(s, pid, Params()) == 1.0))
  }

  // ---------- bid (eq. 1) ----------

  test("bid scales with shared vertices, residual capacity and support") {
    val s = mkState(2, 10, Vector(2, 0))
    s.assign(1L, 0); s.assign(2L, 0) // vertices 1,2 on partition 0 (sizes 4,0)
    val m = mkMatch(0.5, LEdge(1, "a", 2, "b"), LEdge(2, "b", 3, "a"))
    val b0 = bid(s, 0, m)
    // N(S0, m) = 2 (vertices 1,2), residual = 1 - 4/10, supp = 0.5
    assert(math.abs(b0 - 2 * 0.6 * 0.5) < 1e-9)
    assert(bid(s, 1, m) == 0.0, "no shared vertices -> zero bid")
  }

  test("bid goes negative above capacity (discourages overfull partitions)") {
    val s = mkState(1, 2, Vector(3))
    s.assign(1L, 0)
    val m = mkMatch(1.0, LEdge(1, "a", 2, "b"))
    assert(bid(s, 0, m) < 0)
  }

  // ---------- allocate (eq. 3) ----------

  test("allocation goes to the partition sharing the most (weighted) vertices") {
    val s = mkState(2, 1000, Vector(5, 8))
    s.assign(1L, 0); s.assign(2L, 0); s.assign(3L, 1) // sizes: 7 vs 9
    val e  = LEdge(1, "a", 2, "b")
    val m1 = mkMatch(1.0, e)
    val out = allocate(s, Vector(m1))
    assert(out.winner == 0)
    assert(out.chosen == Vector(m1))
  }

  test("allocation falls back to the least-loaded partition when all bids are zero") {
    val s = mkState(3, 1000, Vector(4, 2, 7))
    val m = mkMatch(1.0, LEdge(50, "a", 51, "b"))
    val out = allocate(s, Vector(m))
    assert(out.winner == 1)
  }

  test("chosen matches are a support-sorted prefix") {
    val s  = mkState(2, 1000, Vector(0, 0))
    val e  = LEdge(1, "a", 2, "b")
    val hi = mkMatch(0.9, e)
    val lo = mkMatch(0.3, e, LEdge(2, "b", 3, "a"))
    val out = allocate(s, Vector(lo, hi))
    assert(out.chosen.head.support >= out.chosen.last.support)
    assert(out.chosen.head == hi)
  }

  test("a large partition's ration truncates its prefix of matches") {
    // Partition 0 is at the b-boundary: l = (10/11)*(2/3) ≈ 0.606 -> it bids
    // on ceil(0.606*4)=3 of 4 matches. All match vertices are on partition 0,
    // so it wins, but receives only 3 matches.
    val s = mkState(2, 1000, Vector(0, 0))
    (1L to 10L).foreach(v => s.assign(v, 0))
    (11L to 20L).foreach(v => s.assign(v, 1))
    s.assign(21L, 0) // sizes now 11 vs 10
    val e = LEdge(1, "a", 2, "b")
    val ms = Vector(
      mkMatch(0.9, e),
      mkMatch(0.7, e, LEdge(2, "b", 3, "a")),
      mkMatch(0.5, e, LEdge(2, "b", 4, "a")),
      mkMatch(0.3, e, LEdge(2, "b", 5, "a")),
    )
    val out = allocate(s, ms)
    assert(out.winner == 0)
    assert(out.chosen.size == 3, s"ration should truncate to 3, got ${out.chosen.size}")
    assert(out.chosen.map(_.support) == Vector(0.9, 0.7, 0.5))
  }

  test("at least one match is always chosen (the evicted edge must be placed)") {
    val s = mkState(2, 1000, Vector(10, 30)) // partition 1 over cap: l=0
    (1L to 2L).foreach(v => s.assign(v, 1))  // but match vertices are on 1
    val m  = mkMatch(1.0, LEdge(1, "a", 2, "b"))
    val out = allocate(s, Vector(m))
    assert(out.chosen.nonEmpty)
  }

  test("allocate rejects empty match lists") {
    val s = mkState(2, 1000, Vector(0, 0))
    intercept[IllegalArgumentException] { allocate(s, Vector.empty) }
  }
}
