package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.bench.TableBenches

/** spark-submit entrypoints, one per evaluation table.
  *
  * Usage: `spark-submit --class repro.jobs.Table3Job repro.jar [scale]`
  * where `scale` (default 1.0) scales the synthetic lakes.
  */
object Jobs {
  def session(): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("cmdl-repro")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def scaleOf(args: Array[String]): Double =
    args.headOption.flatMap(_.toDoubleOption).getOrElse(1.0)
}

object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session()
    try {
      val l = TableBenches.lakes(Jobs.scaleOf(args))
      println("=== Table 1: Overview of the evaluation datasets ===")
      println(TableBenches.render(TableBenches.table1(l)))
    } finally spark.stop()
  }
}

object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session()
    try {
      val l = TableBenches.lakes(Jobs.scaleOf(args))
      println("=== Table 2: Overview of the evaluation benchmarks ===")
      println(TableBenches.render(TableBenches.table2(l)))
    } finally spark.stop()
  }
}

object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session()
    try {
      val ctx = TableBenches.context(spark, Jobs.scaleOf(args))
      println("=== Table 3: Evaluation of syntactic join discovery ===")
      println(TableBenches.renderTable3(TableBenches.table3(ctx)))
    } finally spark.stop()
  }
}

object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session()
    try {
      val ctx = TableBenches.context(spark, Jobs.scaleOf(args))
      println("=== Table 4: Evaluation of PK-FK join discovery (Benchmark 2D) ===")
      println(TableBenches.renderTable4(TableBenches.table4(ctx)))
    } finally spark.stop()
  }
}

object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session()
    try {
      val ctx = TableBenches.context(spark, Jobs.scaleOf(args))
      println("=== Table 5: Comparing individual similarity metrics ===")
      println(TableBenches.renderTable5(TableBenches.table5(ctx)))
    } finally spark.stop()
  }
}

object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session()
    try {
      val ctx = TableBenches.context(spark, Jobs.scaleOf(args))
      println("=== Table 6: Query throughput for different labeling functions ===")
      println(TableBenches.renderTable6(TableBenches.table6(ctx)))
    } finally spark.stop()
  }
}
