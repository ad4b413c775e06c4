package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments.Tables

/** spark-submit entrypoints, one per reproduced table (DESIGN §4).
  *
  *   spark-submit --class repro.jobs.Table4Job target/scala-2.13/repro_*.jar
  *
  * Each job builds (or reuses) the shared SparkSession, runs the table's
  * experiment driver, and prints the rendered table to stdout.
  */
object JobRunner {
  def withSpark(appName: String)(body: SparkSession => String): Unit = {
    val spark = SparkSession.builder()
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(appName)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try println(body(spark))
    finally spark.stop()
  }
}

object Table3Job {
  def main(args: Array[String]): Unit =
    JobRunner.withSpark("repro-table3")(s => Tables.runTable3(s).rendered)
}

object Table4Job {
  def main(args: Array[String]): Unit =
    JobRunner.withSpark("repro-table4")(s => Tables.runTable4(s).rendered)
}

object Table5Job {
  def main(args: Array[String]): Unit =
    JobRunner.withSpark("repro-table5")(s => Tables.runTable5(s).rendered)
}

object Table6Job {
  def main(args: Array[String]): Unit =
    JobRunner.withSpark("repro-table6")(s => Tables.runTable6(s).rendered)
}

object Table7Job {
  def main(args: Array[String]): Unit =
    JobRunner.withSpark("repro-table7")(s => Tables.runTable7(s).rendered)
}

object Table8Job {
  def main(args: Array[String]): Unit =
    JobRunner.withSpark("repro-table8")(s => Tables.runTable8(s).rendered)
}

object Table9Job {
  def main(args: Array[String]): Unit =
    JobRunner.withSpark("repro-table9")(s => Tables.runTable9(s).rendered)
}

object Table12Job {
  def main(args: Array[String]): Unit =
    JobRunner.withSpark("repro-table12")(s => Tables.runTable12(s).rendered)
}
