package repro.engine

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.Model._

/** Measures partitioning quality as the paper does (§1.3, §5): the number of
  * inter-partition traversals (ipt) incurred when executing a pattern-match
  * query workload over a partitioned graph.
  *
  * For each query q, every distinct match (automorphism-deduplicated
  * sub-graph) is inspected: each matched data edge whose endpoints live in
  * different partitions costs one ipt. Per-query totals are weighted by the
  * query's relative frequency in the workload.
  */
object IptEvaluator {

  /** Result for one query of the workload. */
  final case class QueryIpt(queryIndex: Int, frequency: Double,
                            matchCount: Long, ipt: Long) {
    def weightedIpt: Double = frequency * ipt
  }

  /** Result over a whole workload. */
  final case class WorkloadIpt(perQuery: Vector[QueryIpt]) {
    def totalWeightedIpt: Double = perQuery.map(_.weightedIpt).sum
    def totalMatches: Long       = perQuery.map(_.matchCount).sum
  }

  /** Build the vertex→partition DataFrame `(vid, pid)` from a driver map. */
  def partitionDf(spark: SparkSession, pmap: Map[VId, Int]): DataFrame = {
    import spark.implicits._
    pmap.toSeq.toDF("vid", "pid")
  }

  /** ipt of one query over the partitioned graph.
    *
    * `matches` rows carry the canonical edge array; exploding it and joining
    * the partition map on both endpoints yields per-edge crossing flags.
    */
  def queryIpt(edges: DataFrame, pmapDf: DataFrame, q: QueryGraph): (Long, Long) = {
    val ms = PatternMatcher.matches(edges, q).cache()
    try {
      val cnt = ms.count()
      if (cnt == 0) (0L, 0L)
      else {
        val exploded = ms.select(explode(col("edges")) as "e")
          .select(col("e.x") as "x", col("e.y") as "y")
        val pm1 = pmapDf.select(col("vid") as "xv", col("pid") as "xp")
        val pm2 = pmapDf.select(col("vid") as "yv", col("pid") as "yp")
        val ipt = exploded
          .join(pm1, col("x") === col("xv"))
          .join(pm2, col("y") === col("yv"))
          .select(sum(when(col("xp") =!= col("yp"), 1L).otherwise(0L)) as "ipt")
          .collect()(0).getLong(0)
        (cnt, ipt)
      }
    } finally ms.unpersist()
  }

  /** ipt of a full workload over a partitioning. */
  def evaluate(spark: SparkSession, edges: DataFrame, pmap: Map[VId, Int],
               workload: Workload): WorkloadIpt = {
    val pmapDf = partitionDf(spark, pmap).cache()
    try {
      val per = workload.queries.zipWithIndex.map { case ((q, f), i) =>
        val (cnt, ipt) = queryIpt(edges, pmapDf, q)
        QueryIpt(i, f, cnt, ipt)
      }
      WorkloadIpt(per)
    } finally pmapDf.unpersist()
  }
}
