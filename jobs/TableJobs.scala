package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.bench.{Harness, LPExperiment, Table1, Table2, Table3, Table4}

/** Shared SparkSession bootstrap for the spark-submit entrypoints.
  * Scale comes from the first CLI arg or REPRO_SCALE (default 1.0).
  */
object JobSession {
  def spark(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.sql.maxPlanStringLength", 8192)
      .config("spark.ui.enabled", "false")
      .getOrCreate()

  def scaleOf(args: Array[String]): Double =
    args.headOption.map(_.toDouble).getOrElse(Harness.defaultScale)
}

/** Table I — benchmark KG statistics. */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("table1")
    val scale = JobSession.scaleOf(args)
    println(Table1.render(Table1.run(spark, scale), scale))
    spark.stop()
  }
}

/** Table II — tasks and measured split ratios. */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("table2")
    println(Table2.render(Table2.run(spark, JobSession.scaleOf(args))))
    spark.stop()
  }
}

/** Table III — extracted-subgraph quality across the four methods. */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("table3")
    println(Table3.render(Table3.run(spark, JobSession.scaleOf(args))))
    spark.stop()
  }
}

/** Table IV — cost breakdown FG vs KG' for the six NC tasks. */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("table4")
    println(Table4.render(Table4.run(spark, JobSession.scaleOf(args))))
    spark.stop()
  }
}

/** Supplementary LP experiment (Figure 7 content; tables only in scope). */
object LPJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("lp")
    println(LPExperiment.render(LPExperiment.run(spark, JobSession.scaleOf(args))))
    spark.stop()
  }
}

/** All tables in sequence. */
object RunAll {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("run-all")
    val scale = JobSession.scaleOf(args)
    println(Table1.render(Table1.run(spark, scale), scale))
    println()
    println(Table2.render(Table2.run(spark, scale)))
    println()
    println(Table3.render(Table3.run(spark, scale)))
    println()
    println(Table4.render(Table4.run(spark, scale)))
    println()
    println(LPExperiment.render(LPExperiment.run(spark, scale)))
    spark.stop()
  }
}
