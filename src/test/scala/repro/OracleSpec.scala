package repro

import org.apache.spark.sql.functions._
import repro.query.SqlGen
import repro.engine.Lbp
import repro.exp.MicroQueries

/** Exercises the provided DuckDB result-equality oracle on (i) the TPC-H
  * lite generators and (ii) graph pattern counts, tying engine results to
  * an independent SQL executor.
  */
class OracleSpec extends SparkSpec {

  test("TPC-H-lite aggregation matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val agg = li.groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt", round(sum("l_quantity"), 2) as "qty")
    Oracle.assertEquivalent(agg,
      "SELECT l_returnflag, count(*) AS cnt, round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty " +
        "FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("TPC-H-lite join matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001)
    val c = SynthData.customer(spark, sf = 0.001)
    val j = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(j,
      "SELECT c_mktsegment, count(*) AS cnt FROM orders, customer " +
        "WHERE o_custkey = c_custkey GROUP BY c_mktsegment",
      "orders" -> o, "customer" -> c)
  }

  test("2-hop pattern count: Spark SQL vs DuckDB oracle vs LBP") {
    val q = MicroQueries.khop("link", "node", 2, forward = true, filtered = None)
    val sql = SqlGen.countSql(q)
    TestFixtures.social.ensureSpark()
    val sparkDf = spark.sql(sql)
    Oracle.assertEquivalent(sparkDf, sql,
      "e_link" -> TestFixtures.socialData.edges("link").select("src", "dst"))
    val cnt = sparkDf.collect()(0).getLong(0)
    assert(Lbp.count(TestFixtures.social.gfcl, q) == cnt)
  }

  test("star pattern count: Spark SQL vs DuckDB oracle") {
    val q = repro.query.Query("star",
      vars = Seq(repro.query.QVar("a", "node"), repro.query.QVar("b", "node"),
        repro.query.QVar("c", "node")),
      edges = Seq(repro.query.QEdge("link", "a", "b"), repro.query.QEdge("link", "a", "c")),
      preds = Seq.empty, anchor = "a", joinOrder = Seq(0, 1))
    val sql = SqlGen.countSql(q)
    TestFixtures.social.ensureSpark()
    Oracle.assertEquivalent(spark.sql(sql), sql,
      "e_link" -> TestFixtures.socialData.edges("link").select("src", "dst"))
  }
}
