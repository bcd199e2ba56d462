package repro.bench

import repro.engine.ExperimentRunner
import repro.graphgen.{Datasets, StreamOrder}
import repro.workloads.Workloads

/** Table 2 reproduction: time (ms) to partition 10k edges, per partitioner
  * per dataset (BFS streams, k = 8, like the paper's setup).
  *
  * Paper numbers (their 3.1 GHz i7 prototype):
  *   DBLP        91 / 96 / 235 / 28
  *   ProvGen    144 / 146 / 240 / 33
  *   MusicBrainz 48 / 52 / 129 / 18
  *   LUBM-100    47 / 51 / 147 / 22
  *   LUBM-4000   45 / 49 / 138 / 16   (LDG / Fennel / Loom / Hash)
  * We expect the same ordering (Hash < LDG ≈ Fennel < Loom) and a Loom
  * slowdown factor of roughly 1.5–7x over Fennel, not absolute values.
  */
class Table2TimingBench extends BenchBase {

  test("Table 2: time to partition 10k edges") {
    val header = f"${"Dataset"}%-12s ${"LDG(ms)"}%9s ${"Fennel(ms)"}%11s " +
                 f"${"Loom(ms)"}%9s ${"Hash(ms)"}%9s ${"Loom/Fennel"}%12s"
    val lines = Datasets.all.map { d =>
      val stream = StreamOrder.stream(d.generate(spark, benchSf), StreamOrder.Bfs)
      val (n, m) = ExperimentRunner.graphStats(stream)
      val w      = Workloads.forDataset(d.name)
      // Warm-up pass (JIT) on a prefix, then measure the full stream.
      Vector("LDG", "Fennel", "Loom", "Hash").foreach { s =>
        ExperimentRunner.partition(s, stream.take(5000), 8, n, m, w, benchWindow)
      }
      val t = Vector("LDG", "Fennel", "Loom", "Hash").map { s =>
        ExperimentRunner.partition(s, stream, 8, n, m, w, benchWindow).msPer10k
      }
      assert(t.forall(_ > 0), s"${d.name}: zero timing")
      f"${d.name}%-12s ${t(0)}%9.1f ${t(1)}%11.1f ${t(2)}%9.1f ${t(3)}%9.1f ${t(2) / t(1)}%12.2f"
    }
    report("table2", header +: lines)
  }

  test("Table 2 shape: Hash is fastest; Loom is the slowest of the four") {
    val d      = Datasets.dblp
    val stream = StreamOrder.stream(d.generate(spark, benchSf), StreamOrder.Bfs)
    val (n, m) = ExperimentRunner.graphStats(stream)
    val w      = Workloads.forDataset(d.name)
    def time(s: String): Double = {
      ExperimentRunner.partition(s, stream.take(5000), 8, n, m, w, benchWindow)
      ExperimentRunner.partition(s, stream, 8, n, m, w, benchWindow).msPer10k
    }
    val (hash, ldg, fennel, loom) = (time("Hash"), time("LDG"), time("Fennel"), time("Loom"))
    assert(hash < ldg && hash < fennel && hash < loom, s"Hash not fastest: $hash $ldg $fennel $loom")
    assert(loom > fennel, s"Loom ($loom) should cost more than Fennel ($fennel)")
  }
}
