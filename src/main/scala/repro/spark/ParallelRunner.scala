package repro.spark

import org.apache.spark.sql.SparkSession
import repro.core.GraphStore
import repro.engine.Lbp
import repro.query.{Compiler, Query}

/** Data-parallel execution of an LBP plan: the scan's vertex range is split
  * into Spark partitions, each task runs the same per-partition vectorized
  * operator pipeline against a broadcast [[GraphStore]], and partial counts
  * are summed. The paper's evaluation is single-core; this demonstrates the
  * techniques parallelize over Spark (repro band: single_node_parallelizable).
  */
object ParallelRunner {

  def count(spark: SparkSession, store: GraphStore, q: Query, numPartitions: Int = 16): Long = {
    val bc = spark.sparkContext.broadcast(store)
    val n = store.vertexCounts(store.schema.vertexIdx(q.varByName(q.anchor).label))
    val ranges = partitionRanges(n, numPartitions)
    spark.sparkContext
      .parallelize(ranges, ranges.length)
      .map { case (lo, hi) =>
        val s = bc.value
        Lbp.countRange(s, Compiler.compile(q, s), lo, hi)
      }
      .sum()
      .toLong
  }

  def partitionRanges(n: Int, parts: Int): Seq[(Int, Int)] = {
    val p = math.max(1, math.min(parts, n))
    val step = (n + p - 1) / math.max(1, p)
    (0 until n by math.max(1, step)).map(lo => (lo, math.min(n, lo + step)))
  }
}
