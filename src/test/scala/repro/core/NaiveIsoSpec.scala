package repro.core

import repro.SparkSpec
import repro.core.Model._

class NaiveIsoSpec extends SparkSpec {
  import QueryGraph._

  test("a-b-c and c-b-a are isomorphic") {
    assert(NaiveIso.isomorphic(path("a", "b", "c"), path("c", "b", "a")))
  }

  test("a-b-c and a-c-b are not isomorphic (different middle label)") {
    assert(!NaiveIso.isomorphic(path("a", "b", "c"), path("a", "c", "b")))
  }

  test("a path and a star of the same labels differ") {
    assert(!NaiveIso.isomorphic(path("b", "a", "b", "b"), star("a", "b", "b", "b")))
  }

  test("a 4-cycle a-b-a-b is isomorphic to its rotation") {
    assert(NaiveIso.isomorphic(cycle("a", "b", "a", "b"), cycle("b", "a", "b", "a")))
  }

  test("cycle vs path with same labels are not isomorphic") {
    assert(!NaiveIso.isomorphic(cycle("a", "b", "c"),
                                QueryGraph(Vector("a", "b", "c"), Vector((0, 1), (1, 2)))))
  }

  test("embeddings finds both matches of the paper's q2 example shape") {
    // G fragment: 1(a)-2(b), 2(b)-3(a), 6(a)-2(b): path a-b-a matches
    // {(1,2),(2,3)}, {(6,2),(2,3)} and {(1,2),(2,6)}.
    val g = SubGraph.of(LEdge(1, "a", 2, "b"), LEdge(2, "b", 3, "a"), LEdge(6, "a", 2, "b"))
    val ms = NaiveIso.matches(path("a", "b", "a"), g)
    assert(ms.size == 3)
    assert(ms.contains(Set((1L, 2L), (2L, 3L))))
    assert(ms.contains(Set((2L, 6L), (2L, 3L))))
    assert(ms.contains(Set((1L, 2L), (2L, 6L))))
  }

  test("matches deduplicates automorphic embeddings") {
    // b-a-b has an automorphism swapping the two b's: 2 embeddings, 1 match.
    val g = SubGraph.of(LEdge(1, "b", 2, "a"), LEdge(2, "a", 3, "b"))
    assert(NaiveIso.embeddings(path("b", "a", "b"), g).size == 2)
    assert(NaiveIso.matches(path("b", "a", "b"), g).size == 1)
  }

  test("injectivity: a-b-a needs two distinct a vertices") {
    val g = SubGraph.of(LEdge(1, "a", 2, "b"))
    assert(NaiveIso.matches(path("a", "b", "a"), g).isEmpty)
  }

  test("containedIn: every edge of a pattern is contained in it") {
    val q = path("a", "b", "c")
    assert(NaiveIso.containedIn(QueryGraph.singleEdge("a", "b"), q))
    assert(NaiveIso.containedIn(QueryGraph.singleEdge("b", "c"), q))
    assert(!NaiveIso.containedIn(QueryGraph.singleEdge("a", "c"), q))
  }

  test("containedIn: a graph contains itself, not its proper supergraphs") {
    val q = cycle("a", "b", "c")
    assert(NaiveIso.containedIn(q, q))
    assert(!NaiveIso.containedIn(cycle("a", "b", "c", "d"), q))
  }

  test("label multiplicities matter") {
    assert(!NaiveIso.isomorphic(path("a", "a", "b"), path("a", "b", "b")))
  }
}
