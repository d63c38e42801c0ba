package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.{CoreFigures, ExtFigures, Harness}

/** One spark-submit entrypoint per evaluation figure-table; each prints
  * the same table as its bench suite. Trial counts honour
  * `ABAE_BENCH_TRIALS` (default 300-scaled; see [[Harness.trials]]).
  */
private object JobSession {
  def run(name: String)(body: SparkSession => Unit): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name).getOrCreate()
    try body(spark)
    finally spark.stop()
  }
}

object Fig2Job {
  def main(args: Array[String]): Unit = JobSession.run("fig2") { spark =>
    println(CoreFigures.renderRmse("T-fig2: budget vs RMSE (ABAE vs uniform)",
      CoreFigures.fig2(spark, Harness.trials(300))))
  }
}

object Fig3Job {
  def main(args: Array[String]): Unit = JobSession.run("fig3") { spark =>
    println(CoreFigures.renderRmse("T-fig3: low budgets vs RMSE (ABAE vs uniform)",
      CoreFigures.fig3(spark, Harness.trials(300))))
  }
}

object Fig4Job {
  def main(args: Array[String]): Unit = JobSession.run("fig4") { spark =>
    println(CoreFigures.renderQ(CoreFigures.fig4(spark, Harness.trials(300))))
  }
}

object Fig5Job {
  def main(args: Array[String]): Unit = JobSession.run("fig5") { spark =>
    println(CoreFigures.renderCi(CoreFigures.fig5(spark, Harness.trials(50), beta = 200)))
  }
}

object Fig6Job {
  def main(args: Array[String]): Unit = JobSession.run("fig6") { spark =>
    println(ExtFigures.renderMultiPred(ExtFigures.fig6(spark, Harness.trials(300))))
  }
}

object Fig7Job {
  def main(args: Array[String]): Unit = JobSession.run("fig7") { spark =>
    println(ExtFigures.renderGroupBy(
      "T-fig7: ABAE-GroupBy (single oracle) vs uniform (max RMSE)",
      ExtFigures.fig7(spark, Harness.trials(100))))
  }
}

object Fig8Job {
  def main(args: Array[String]): Unit = JobSession.run("fig8") { spark =>
    println(ExtFigures.renderGroupBy(
      "T-fig8: ABAE-GroupBy (multiple oracles) vs uniform (max RMSE)",
      ExtFigures.fig8(spark, Harness.trials(100))))
  }
}

object Fig9Job {
  def main(args: Array[String]): Unit = JobSession.run("fig9") { spark =>
    println(CoreFigures.renderLesion(CoreFigures.fig9(spark, Harness.trials(300))))
  }
}

object Fig10Job {
  def main(args: Array[String]): Unit = JobSession.run("fig10") { spark =>
    println(CoreFigures.renderK(CoreFigures.fig10(spark, Harness.trials(200))))
  }
}

object Fig11Job {
  def main(args: Array[String]): Unit = JobSession.run("fig11") { spark =>
    println(CoreFigures.renderC(CoreFigures.fig11(spark, Harness.trials(200))))
  }
}

object Fig12Job {
  def main(args: Array[String]): Unit = JobSession.run("fig12") { spark =>
    println(ExtFigures.renderCombine(ExtFigures.fig12(spark, Harness.trials(150))))
  }
}
