package repro.jobs

import repro.exp._

/** spark-submit entrypoints, one per reproduced table, e.g.
  * `spark-submit --class repro.jobs.Table5LbpJob repro.jar`.
  * Scale with REPRO_SCALE (default 1.0).
  */
object Table2MemoryJob {
  def main(args: Array[String]): Unit = {
    val spark = JobMain.session()
    Table2Memory.runAll(spark)
    spark.stop()
  }
}

object Table3PropPagesJob {
  def main(args: Array[String]): Unit = {
    val spark = JobMain.session()
    Table3PropPages.render(Table3PropPages.run(spark))
    spark.stop()
  }
}

object Table4SingleCardJob {
  def main(args: Array[String]): Unit = {
    val spark = JobMain.session()
    Table4SingleCard.render(Table4SingleCard.run(spark))
    spark.stop()
  }
}

object Table5LbpJob {
  def main(args: Array[String]): Unit = {
    val spark = JobMain.session()
    Table5Lbp.render(Table5Lbp.run(spark))
    spark.stop()
  }
}

object Table6LdbcJob {
  def main(args: Array[String]): Unit = {
    val spark = JobMain.session()
    Table6Benchmarks.render(Table6Benchmarks.runLdbc(spark))
    spark.stop()
  }
}

object Table6JobJob {
  def main(args: Array[String]): Unit = {
    val spark = JobMain.session()
    Table6Benchmarks.render(Table6Benchmarks.runJob(spark))
    spark.stop()
  }
}

object Table7SensitivityJob {
  def main(args: Array[String]): Unit = {
    Table7Sensitivity.render(Table7Sensitivity.run())
  }
}
