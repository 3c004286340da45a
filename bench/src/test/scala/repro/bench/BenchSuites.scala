package repro.bench

import repro.SparkSpec
import repro.exp._

/** Benchmark suites, one per paper table. Each prints the paper-style rows
  * (recorded against the paper's numbers in EXPERIMENTS.md) and asserts the
  * qualitative shape the paper reports — which design wins and roughly by
  * how much — with deliberately loose thresholds so machine noise does not
  * flip them.
  */
class Table2MemoryBench extends SparkSpec {
  test("Table 2: memory shrinks along GF-RV -> GF-CL on LDBC-lite and IMDb-lite") {
    val results = Table2Memory.runAll(spark)
    results.foreach { r =>
      val total = r.row("Total")
      total.bytesPerConfig.sliding(2).foreach { case Seq(a, b) =>
        assert(b <= a * 1.001, s"${r.dataset}: non-monotone ladder ${total.bytesPerConfig}")
      }
      assert(total.totalFactor > 1.5,
        s"${r.dataset}: total reduction ${total.totalFactor} (paper: 2.36x LDBC / 2.03x IMDb)")
      assert(r.row("F. Adj. Lists").totalFactor > 1.8,
        s"${r.dataset}: fwd adjacency reduction (paper: 2.96x)")
      assert(r.row("Vertex Props").totalFactor > 1.15,
        s"${r.dataset}: vertex prop reduction (paper: 1.62x / 1.29x)")
    }
  }
}

class Table3PropPagesBench extends SparkSpec {
  test("Table 3: forward plans over property pages beat edge columns") {
    val r = Table3PropPages.run(spark)
    Table3PropPages.render(r)
    val datasets = Seq("LDBC", "WIKI", "FLICKR")
    // Paper: forward PAGE_P is 1.9x–4.7x faster than forward COL_E.
    val fwd2H = datasets.map(ds => r.ms(ds, "P_F", "COL_E", 2) / r.ms(ds, "P_F", "PAGE_P", 2))
    assert(fwd2H.count(_ > 1.2) >= 2, s"2H forward speedups too small: $fwd2H")
    // Paper: backward plans are comparable under both configs (0.9x–1.1x).
    val bwd2H = datasets.map(ds => r.ms(ds, "P_B", "COL_E", 2) / r.ms(ds, "P_B", "PAGE_P", 2))
    bwd2H.foreach(x => assert(x > 0.5 && x < 2.0, s"backward ratio $x out of band: $bwd2H"))
  }
}

class Table4SingleCardBench extends SparkSpec {
  test("Table 4: vertex columns beat CSR for single-cardinality edges") {
    val r = Table4SingleCard.run(spark)
    Table4SingleCard.render(r)
    // Paper: 1.62x/1.57x/1.64x uncompressed, 1.49x/1.26x/1.34x compressed.
    (0 until 3).foreach { h =>
      assert(r.row("CSR-UNC").ms(h) / r.row("V-COL-UNC").ms(h) > 1.05,
        s"${h + 1}-hop uncompressed: V-COL not faster")
    }
    assert(r.row("CSR-UNC").memMb > r.row("V-COL-UNC").memMb)
    assert(r.row("CSR-C").memMb > r.row("V-COL-C").memMb)
    // Paper: NULL compression shrinks replyOf storage 1.75x (V-COL).
    assert(r.row("V-COL-UNC").memMb / r.row("V-COL-C").memMb > 1.2)
  }
}

class Table5LbpBench extends SparkSpec {
  test("Table 5: LBP beats Volcano, most at multi-hop COUNT(*)") {
    val r = Table5Lbp.run(spark)
    Table5Lbp.render(r)
    for (ds <- Seq("LDBC", "FLICKR", "WIKI"); h <- 2 to 3) {
      assert(r.cell(ds, "FILTER", h).speedup > 1.1,
        s"$ds FILTER ${h}-hop speedup ${r.cell(ds, "FILTER", h).speedup} (paper: 3.8x–15.2x)")
      assert(r.cell(ds, "COUNT(*)", h).speedup > 2.0,
        s"$ds COUNT ${h}-hop speedup ${r.cell(ds, "COUNT(*)", h).speedup} (paper: 12.8x–905x)")
    }
    // Factorized aggregation grows the COUNT(*) advantage beyond FILTER's
    // at 3 hops (paper: e.g. WIKI 11.7x filter vs 905x count).
    for (ds <- Seq("FLICKR", "WIKI")) {
      assert(r.cell(ds, "COUNT(*)", 3).speedup > r.cell(ds, "FILTER", 3).speedup,
        s"$ds: count speedup should exceed filter speedup at 3 hops")
    }
  }
}

class Table6LdbcBench extends SparkSpec {
  test("Table 6a/6b: LDBC IS/IC — GF-CL beats GF-RV; GDBMSs beat RDBMS baselines") {
    val r = Table6Benchmarks.runLdbc(spark)
    Table6Benchmarks.render(r)
    assert(r.medianSpeedup > 1.2, s"median GF-RV/GF-CL = ${r.medianSpeedup} (paper: 2.6x)")
    // Most queries improve (paper: all but one, 1.3x–8.3x).
    assert(r.rows.count(_.rvOverCl > 1.0) >= r.rows.size * 2 / 3)
    // Columnar RDBMS baselines lose to GF-CL on the median of these
    // selective path queries (paper: 13x–46x slower than GF-RV).
    val sparkRatio = r.rows.map(x => x.sparkMs / x.gfclMs).sorted.apply(r.rows.size / 2)
    assert(sparkRatio > 1.0, s"median SPARK/GF-CL = $sparkRatio")
  }
}

class Table6JobBench extends SparkSpec {
  test("Table 6c: JOB — GF-CL beats GF-RV on star joins") {
    val r = Table6Benchmarks.runJob(spark)
    Table6Benchmarks.render(r)
    assert(r.medianSpeedup > 1.2, s"median GF-RV/GF-CL = ${r.medianSpeedup} (paper: 3.1x)")
    assert(r.rows.count(_.rvOverCl > 1.0) >= r.rows.size * 2 / 3)
  }
}

class Table7SensitivityBench extends SparkSpec {
  test("Tables 7/8: J-NULL insensitive to (c,m); vanilla scheme far slower") {
    val r = Table7Sensitivity.run()
    Table7Sensitivity.render(r)
    // Table 7 claim: runtime shows no visible sensitivity to m or c.
    for (rho <- Table7Sensitivity.densities) {
      val times = Table7Sensitivity.cms.map(cm => r.runtimeMs((rho, cm)))
      assert(times.max / times.min < 2.5, s"rho=$rho: sensitivity too high: $times")
      // Vanilla-NULL (no rank index) is the paper's >20x-slower baseline.
      assert(r.vanillaMsScaled(rho) > times.max * 5, s"rho=$rho: vanilla not slower")
    }
    // Table 8 claim: overhead is determined by m/c.
    assert(r.overheadMb((8, 8)) < r.overheadMb((8, 32)))
    assert(r.overheadMb((16, 8)) < r.overheadMb((16, 32)))
    val mc11 = Seq(r.overheadMb((8, 8)), r.overheadMb((16, 16)))
    assert(math.abs(mc11.head - mc11.last) / mc11.head < 0.25,
      s"(8,8) vs (16,16) overheads should be close: $mc11")
  }
}
