package repro.engine

import repro.{SparkSpec, TestFixtures}
import repro.datasets.{LdbcQueries, JobQueries}
import repro.spark.ParallelRunner

/** Every LDBC IS/IC query (paper Table 6a/6b) cross-checked on all five
  * systems at tiny scale.
  */
class LdbcQueriesSpec extends SparkSpec {
  for (q <- LdbcQueries.all(TestFixtures.NPersons)) {
    test(s"LDBC ${q.name} agrees across GF-RV, GF-CV, GF-CL, Spark SQL, DuckDB") {
      TestFixtures.checkAllSystems(TestFixtures.ldbc, q)
    }
  }

  test("anchored queries return non-trivial results somewhere in the suite") {
    val counts = LdbcQueries.all(TestFixtures.NPersons)
      .map(q => Volcano.count(TestFixtures.ldbc.gfrv, q))
    assert(counts.exists(_ > 0), s"all-zero counts: $counts")
  }
}

/** Every JOB query (paper Table 6c) cross-checked on all five systems. */
class JobQueriesSpec extends SparkSpec {
  for (q <- JobQueries.all) {
    test(s"JOB ${q.name} agrees across GF-RV, GF-CV, GF-CL, Spark SQL, DuckDB") {
      TestFixtures.checkAllSystems(TestFixtures.imdb, q)
    }
  }

  test("JOB workload does real work at test scale (several positive counts)") {
    // Heavily conjunctive JOB predicates leave many empty results at tiny
    // scale; the joins still execute. A handful must be non-empty.
    val counts = JobQueries.all.map(q => Lbp.count(TestFixtures.imdb.gfcl, q))
    assert(counts.count(_ > 0) >= 5, s"too many empty results: $counts")
  }
}

/** The Spark data-parallel LBP runner returns the single-threaded counts. */
class ParallelRunnerSpec extends SparkSpec {
  import repro.exp.MicroQueries

  test("partitionRanges covers [0, n) exactly") {
    for (n <- Seq(0, 1, 5, 16, 1000); p <- Seq(1, 3, 16, 64)) {
      val ranges = ParallelRunner.partitionRanges(n, p)
      assert(ranges.map { case (lo, hi) => hi - lo }.sum == n, s"n=$n p=$p")
      if (n > 0) {
        assert(ranges.head._1 == 0 && ranges.last._2 == n)
        ranges.sliding(2).foreach {
          case Seq((_, h), (l, _)) => assert(h == l)
          case _                   => ()
        }
      }
    }
  }

  for (hops <- 1 to 2) {
    test(s"parallel ${hops}-hop count equals single-threaded LBP") {
      val q = MicroQueries.khop("link", "node", hops, forward = true, filtered = Some(1_200_000_000L))
      val expected = Lbp.count(TestFixtures.social.gfcl, q)
      assert(ParallelRunner.count(spark, TestFixtures.social.gfcl, q) == expected)
    }
  }

  test("parallel LDBC IC01 equals single-threaded LBP") {
    val q = repro.datasets.LdbcQueries.all(TestFixtures.NPersons).find(_.name == "IC01").get
    val expected = Lbp.count(TestFixtures.ldbc.gfcl, q)
    assert(ParallelRunner.count(spark, TestFixtures.ldbc.gfcl, q, numPartitions = 8) == expected)
  }
}
