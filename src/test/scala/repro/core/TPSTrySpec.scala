package repro.core

import repro.SparkSpec
import repro.core.Model._
import repro.core.Signature._

/** TPSTry++ construction tests (paper §2.2, Fig. 2/3).
  *
  * Computed supports are cross-checked against brute-force sub-graph
  * containment (NaiveIso) for several workloads.
  */
class TPSTrySpec extends SparkSpec {
  import QueryGraph._

  private def coder() = new LabelCoder(DefaultP, 42L)

  /** Brute-force support: total frequency of queries containing `g`. */
  private def bruteSupport(g: QueryGraph, w: Workload): Double =
    w.queries.collect { case (q, f) if NaiveIso.containedIn(g, q) => f }.sum / w.totalFrequency

  test("single query: trie contains every connected sub-graph exactly once") {
    implicit val c: LabelCoder = coder()
    val trie = new TPSTry
    trie.add(path("a", "b", "c"))
    // Connected sub-graphs: a-b, b-c, a-b-c -> 3 nodes.
    assert(trie.nodes.size == 3)
  }

  test("root children are the single-edge sub-graphs") {
    implicit val c: LabelCoder = coder()
    val trie = new TPSTry
    trie.add(path("a", "b", "c"))
    val rootSigs = trie.root.children.map(_._2.sig).toSet
    val ab = ofQueryGraph(singleEdge("a", "b"))
    val bc = ofQueryGraph(singleEdge("b", "c"))
    assert(rootSigs == Set(ab, bc))
  }

  test("triangle query: 3 single edges + 3 two-edge paths + 1 triangle") {
    implicit val c: LabelCoder = coder()
    val trie = new TPSTry
    trie.add(cycle("a", "b", "c"))
    // sub-graphs: {ab, bc, ca}, {ab+bc, bc+ca, ca+ab}, {triangle} = 7 distinct
    assert(trie.nodes.size == 7)
  }

  test("DAG merging: a-b-a-b cycle node is reachable from multiple parents") {
    implicit val c: LabelCoder = coder()
    val trie = new TPSTry
    val q1   = cycle("a", "b", "a", "b")
    trie.add(q1)
    val cycleSig  = ofQueryGraph(q1)
    val cycleNode = trie.node(cycleSig).get
    // Count trie nodes that link to the full cycle.
    val parents = trie.nodes.count(_.children.exists(_._2 eq cycleNode))
    assert(parents >= 1)
    // The 3-edge path b-a-b-a can extend to the cycle; both 3-edge shapes
    // (a-b-a-b path) are signature-identical here, so one parent suffices,
    // but the cycle node must exist and have support 1.
    assert(cycleNode.support == 1.0)
  }

  test("identical sub-graphs from different queries merge into one node (Fig. 3)") {
    implicit val c: LabelCoder = coder()
    val trie = new TPSTry
    trie.add(path("a", "b", "c"), 1.0) // contains a-b
    trie.add(path("c", "b", "a"), 1.0) // same graph, reversed construction
    val abNode = trie.node(ofQueryGraph(singleEdge("a", "b"))).get
    assert(abNode.support == 1.0, "both queries contain a-b: support = 2/2")
    assert(trie.nodes.size == 3, "reversed path adds no new nodes")
  }

  test("support is counted once per query even with multiple derivations") {
    implicit val c: LabelCoder = coder()
    val trie = new TPSTry
    // q1 has four a-b edges; the single-edge node a-b must have support 1, not 4.
    trie.add(cycle("a", "b", "a", "b"))
    val abNode = trie.node(ofQueryGraph(singleEdge("a", "b"))).get
    assert(abNode.support == 1.0)
  }

  test("supports match brute-force containment for a mixed workload") {
    implicit val c: LabelCoder = coder()
    val w = Workload(Vector(
      path("a", "b", "a")      -> 2.0,
      path("a", "b", "c")      -> 1.0,
      star("b", "a", "a", "c") -> 1.0,
    ))
    val trie = TPSTry.ofWorkload(w)
    trie.nodes.foreach { n =>
      val expected = bruteSupport(n.representative, w)
      assert(math.abs(n.support - expected) < 1e-9,
             s"node ${n.representative}: trie=${n.support} brute=$expected")
    }
  }

  test("support is antitone from parent to child") {
    implicit val c: LabelCoder = coder()
    val w = Workload(Vector(
      path("a", "b", "a")           -> 3.0,
      path("a", "b", "c", "a")      -> 2.0,
      cycle("a", "b", "c")          -> 1.0,
    ))
    val trie = TPSTry.ofWorkload(w)
    trie.nodes.foreach { n =>
      n.children.foreach { case (_, ch) =>
        assert(ch.support <= n.support + 1e-12,
               s"child ${ch.representative} support ${ch.support} exceeds parent ${n.support}")
      }
    }
  }

  test("motif filter keeps exactly the nodes at or above the threshold") {
    implicit val c: LabelCoder = coder()
    val w = Workload(Vector(
      path("a", "b")      -> 3.0,   // a-b support 1.0 (all queries contain it? no)
      path("a", "b", "c") -> 1.0,
      path("a", "b", "a") -> 1.0,
    ))
    val trie  = TPSTry.ofWorkload(w)
    val index = trie.motifIndex(0.4)
    val kept  = index.motifs.map(_.sig).toSet
    trie.nodes.foreach { n =>
      assert(kept.contains(n.sig) == (n.support >= 0.4))
    }
    // a-b occurs in every query: support 1.0 -> motif at any threshold.
    assert(kept.contains(ofQueryGraph(singleEdge("a", "b"))))
    // b-c occurs only in the second query: 1/5 of mass -> not a motif.
    assert(!kept.contains(ofQueryGraph(singleEdge("b", "c"))))
  }

  test("matchSingleEdge resolves stream edges to single-edge motifs") {
    implicit val c: LabelCoder = coder()
    val w     = Workload(Vector(path("a", "b", "a") -> 1.0))
    val index = TPSTry.ofWorkload(w).motifIndex(0.4)
    assert(index.matchSingleEdge(LEdge(7, "a", 9, "b")).isDefined)
    assert(index.matchSingleEdge(LEdge(7, "b", 9, "c")).isEmpty)
  }

  test("motifChild follows factor deltas to motif children only") {
    implicit val c: LabelCoder = coder()
    val w     = Workload(Vector(path("a", "b", "a") -> 1.0, singleEdge("a", "b") -> 1.0))
    val trie  = TPSTry.ofWorkload(w)
    val index = trie.motifIndex(0.4)
    val abNode = trie.node(ofQueryGraph(singleEdge("a", "b"))).get
    // Adding a second a to the b endpoint: delta for a-b-a.
    val g     = SubGraph.of(LEdge(1, "a", 2, "b"))
    val delta = fac(LEdge(3, "a", 2, "b"), g)
    val child = index.motifChild(abNode, delta)
    assert(child.isDefined)
    assert(child.get.sizeEdges == 2)
    // a-b-a has support 0.5 >= 0.4; at threshold 0.6 it must disappear.
    assert(trie.motifIndex(0.6).motifChild(abNode, delta).isEmpty)
  }

  test("incremental workload updates shift supports (evolving Q, §2)") {
    implicit val c: LabelCoder = coder()
    val trie = new TPSTry
    trie.add(path("a", "b", "c"), 1.0)
    val bc = trie.node(ofQueryGraph(singleEdge("b", "c"))).get
    assert(bc.support == 1.0)
    trie.add(path("a", "b", "a"), 3.0)
    assert(math.abs(bc.support - 0.25) < 1e-12, "b-c now in 1 of 4 mass units")
  }

  test("maxMotifEdges reflects the largest motif") {
    implicit val c: LabelCoder = coder()
    val w = Workload(Vector(path("a", "b", "c", "d") -> 1.0))
    assert(TPSTry.ofWorkload(w).motifIndex(0.4).maxMotifEdges == 3)
    val w2 = Workload(Vector(path("a", "b", "c", "d") -> 1.0, path("x", "y") -> 9.0))
    // The 3-edge path has support 0.1 < 0.4: only x-y (and the path's single
    // edges are 0.1 too) remain; largest motif is 1 edge.
    assert(TPSTry.ofWorkload(w2).motifIndex(0.4).maxMotifEdges == 1)
  }

  test("trie growth is bounded for realistic query sizes (compactness, §2)") {
    implicit val c: LabelCoder = coder()
    val trie = new TPSTry
    trie.add(cycle("a", "b", "c", "d", "e", "f"))
    // A 6-cycle has 6 + 6*(5..1 chains) + 1 connected sub-graphs = 6*5+1 = 31
    // minus signature merges; just assert it stays small and finite.
    assert(trie.nodes.size <= 31)
    assert(trie.nodes.size >= 6)
  }
}
