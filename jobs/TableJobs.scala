package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Tables

/** spark-submit entrypoints, one per paper table. Each prints the
  * reproduced table (simulated seconds from measured work) next to the
  * paper's reported numbers.
  *
  * Example:
  *   spark-submit --class repro.jobs.Table4Job repro.jar
  */
object TableJobs {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = TableJobs.session("table4-tc")
    println(Tables.table4(spark, Tables.benchLoader).render)
    spark.stop()
  }
}

object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = TableJobs.session("table5-kcl")
    println(Tables.table5(spark, Tables.benchLoader).render)
    spark.stop()
  }
}

object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = TableJobs.session("table6-sl")
    println(Tables.table6(spark, Tables.benchLoader).render)
    spark.stop()
  }
}

object Table7Job {
  def main(args: Array[String]): Unit = {
    val spark = TableJobs.session("table7-kmc")
    println(Tables.table7(spark, Tables.benchLoader).render)
    spark.stop()
  }
}

object Table8Job {
  def main(args: Array[String]): Unit = {
    val spark = TableJobs.session("table8-fsm")
    println(Tables.table8(spark, Tables.benchLoader).render)
    spark.stop()
  }
}

object Table9Job {
  def main(args: Array[String]): Unit = {
    val spark = TableJobs.session("table9-counting-only")
    println(Tables.table9(spark, Tables.benchLoader).render)
    spark.stop()
  }
}

object MultiGpuJob {
  def main(args: Array[String]): Unit = {
    val spark = TableJobs.session("multi-gpu-scaling")
    println(Tables.multiGpuScaling(spark, Tables.benchLoader)._2)
    spark.stop()
  }
}
