package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp._

/** Shared SparkSession setup for the spark-submit entrypoints (one per
  * reproduced table/figure). Scale with BENCH_SCALE / BENCH_RUNS env vars.
  */
object JobSession {
  def create(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

/** Paper Table 1: dataset statistics. */
object Table1Job {
  def main(args: Array[String]): Unit = println(Table1Exp.render)
}

/** Paper Fig. 4: optimization-strategy evaluation. */
object Fig4StrategyJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig4")
    try {
      val corpus = StrategyExp.measureCorpus(spark)
      println(StrategyExp.render(StrategyExp.evaluate(corpus), corpus))
    } finally spark.stop()
  }
}

/** Paper Fig. 6: end-to-end prediction query runtime on Spark. */
object Fig6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig6")
    try println(Fig6Exp.render(Fig6Exp.run(spark)))
    finally spark.stop()
  }
}

/** Paper Fig. 7: data scalability on Hospital. */
object Fig7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig7")
    try println(ScalabilityExp.render(ScalabilityExp.run(spark)))
    finally spark.stop()
  }
}

/** Paper Fig. 8: SQL Server (DuckDB substrate) comparison incl. MADlib-sim. */
object Fig8Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig8")
    try println(SqlServerExp.render(SqlServerExp.run(spark)))
    finally spark.stop()
  }
}

/** Paper Fig. 9: LR regularization micro-experiment on Credit Card. */
object Fig9Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig9")
    try println(MicroExps.render("Fig 9: LR L1-sweep on Credit Card (sec)",
      MicroExps.fig9(spark)))
    finally spark.stop()
  }
}

/** Paper Fig. 10 + §7.2.2 predicate experiment: DT micro-experiments. */
object Fig10Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig10")
    try {
      println(MicroExps.render("Fig 10: DT depth sweep on Hospital (sec)",
        MicroExps.fig10(spark)))
      println(MicroExps.render("Sec 7.2.2 data predicates (sec)",
        MicroExps.predicateExp(spark)))
    } finally spark.stop()
  }
}

/** Paper Table 2 + Fig. 11: data-induced optimizations. */
object Table2Fig11Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table2")
    try {
      println(DataInducedExp.renderTable2(DataInducedExp.table2(spark)))
      println(DataInducedExp.renderFig11(DataInducedExp.fig11(spark)))
    } finally spark.stop()
  }
}

/** Paper Fig. 12: GPU(-sim) acceleration of complex GB models. */
object Fig12Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig12")
    try println(GpuExp.render(GpuExp.run(spark)))
    finally spark.stop()
  }
}
