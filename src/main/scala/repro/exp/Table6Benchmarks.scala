package repro.exp

import org.apache.spark.sql.SparkSession
import repro.baseline.SqlBaseline
import repro.core._
import repro.datasets._
import repro.engine.{Lbp, Volcano}
import repro.query.Query

/** Table 6: end-to-end benchmarks on LDBC (IS01–IS07, IC01–IC12) and JOB
  * (1a–33a) across:
  *   GF-CL  — columnar storage + list-based processor,
  *   GF-RV  — row storage + Volcano (also the paper's Neo4j-like baseline),
  *   SPARK  — Spark SQL over vertex/edge tables (MonetDB stand-in),
  *   DUCK   — DuckDB over the same tables (Vertica stand-in).
  * Every query runs as count(*); counts are cross-checked across systems
  * so a benchmark row is also a correctness assertion.
  */
object Table6Benchmarks {

  final case class Row(query: String, count: Long, gfclMs: Double, gfrvMs: Double,
                       sparkMs: Double, duckMs: Double) {
    def rvOverCl: Double = gfrvMs / gfclMs
  }
  final case class Result(benchmark: String, rows: Seq[Row]) {
    def medianSpeedup: Double = {
      val s = rows.map(_.rvOverCl).sorted
      s(s.size / 2)
    }
  }

  def run(spark: SparkSession, benchmark: String, data: GraphData, queries: Seq[Query]): Result = {
    val collected = GraphLoader.collect(data)
    val gfrv = GraphLoader.build(collected, StorageConfig.GFRV)
    val gfcl = GraphLoader.build(collected, StorageConfig.GFCL)
    SqlBaseline.registerSpark(spark, data)
    val duckDir = java.nio.file.Files
      .createTempDirectory("duck-" + benchmark.replaceAll("[^A-Za-z0-9]", "-")).toString
    val duck = SqlBaseline.loadDuckDb(spark, data, duckDir)

    val rows = queries.map { q =>
      // Plans are compiled once; timings measure execution (as the paper's
      // runtimes do — its systems also plan once per run).
      val clPlan = repro.query.Compiler.compile(q, gfcl)
      val rvPlan = repro.query.Compiler.compile(q, gfrv)
      val cCl = Lbp.count(gfcl, clPlan)
      val cRv = Volcano.count(gfrv, rvPlan)
      val cSp = SqlBaseline.sparkCount(spark, q)
      val cDk = SqlBaseline.duckCount(duck, q)
      require(cCl == cRv && cCl == cSp && cCl == cDk,
        s"${q.name}: counts differ GF-CL=$cCl GF-RV=$cRv SPARK=$cSp DUCK=$cDk")
      Row(q.name, cCl,
        gfclMs = Timing.timeMs(Lbp.count(gfcl, clPlan)),
        gfrvMs = Timing.timeMs(Volcano.count(gfrv, rvPlan)),
        sparkMs = Timing.timeMs(SqlBaseline.sparkCount(spark, q)),
        duckMs = Timing.timeMs(SqlBaseline.duckCount(duck, q)))
    }
    duck.close()
    Result(benchmark, rows)
  }

  def render(r: Result): String = {
    val t = new TablePrinter(s"Table 6 — ${r.benchmark} runtime (ms) per system")
    t.row("query", "count", "GF-CL", "GF-RV", "SPARK", "DUCK", "GF-RV/GF-CL")
    r.rows.foreach { row =>
      t.row(row.query, row.count, Timing.fmt(row.gfclMs), Timing.fmt(row.gfrvMs),
        Timing.fmt(row.sparkMs), Timing.fmt(row.duckMs), f"${row.rvOverCl}%.1fx")
    }
    t.row("median", "", "", "", "", "", f"${r.medianSpeedup}%.1fx")
    t.printOut()
  }

  def runLdbc(spark: SparkSession): Result = {
    val n = Scale.t6LdbcPersons
    run(spark, "LDBC IS/IC", LdbcLite(spark, n), LdbcQueries.all(n))
  }

  def runJob(spark: SparkSession): Result =
    run(spark, "JOB", ImdbLite(spark, Scale.imdbTitles), JobQueries.all)
}
