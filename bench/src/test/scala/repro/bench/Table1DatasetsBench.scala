package repro.bench

import repro.graphgen.Datasets

/** Table 1 reproduction: graph datasets, incl. size & heterogeneity.
  *
  * Paper values are the full-size datasets; ours are the schema-faithful
  * synthetic analogues at lite scale (DESIGN.md substitution #1). The
  * invariant reproduced exactly is |L_V| per dataset; sizes scale by ~1/50
  * (LUBM-4000 by ~1/1000).
  */
class Table1DatasetsBench extends BenchBase {

  test("Table 1: dataset sizes and heterogeneity") {
    val header =
      f"${"Dataset"}%-12s ${"paper ~V"}%9s ${"paper ~E"}%9s ${"|L_V|"}%6s " +
      f"${"gen |V|"}%9s ${"gen |E|"}%10s ${"Real"}%5s  Description"
    val lines = Datasets.all.map { d =>
      val edges = d.generate(spark, benchSf).cache()
      try {
        val m = edges.count()
        val n = edges.select("u").union(edges.select("v")).distinct().count()
        assert(m > 0 && n > 0, s"${d.name} generated an empty graph")
        f"${d.name}%-12s ${d.paperV}%9s ${d.paperE}%9s ${d.numLabels}%6d " +
        f"$n%9d $m%10d ${if (d.real) "Y" else "N"}%5s  ${d.description}"
      } finally edges.unpersist()
    }
    report("table1", header +: lines)
  }
}
