package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.Tables

/** Shared spark-submit bootstrap for the table jobs. */
object JobSession {
  def local(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", false)
      .getOrCreate()

  def emit(rows: Seq[String]): Unit = rows.foreach(println)
}

/** `spark-submit --class repro.jobs.Table2Job`: Rand index vs noise rate. */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table2")
    try JobSession.emit(Tables.table2(spark)) finally spark.stop()
  }
}

/** `spark-submit --class repro.jobs.Table3Job`: Rand index on S1..S4. */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table3")
    try JobSession.emit(Tables.table3(spark)) finally spark.stop()
  }
}

/** `spark-submit --class repro.jobs.Table4Job`: Rand index on real stand-ins. */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table4")
    try JobSession.emit(Tables.table4(spark)) finally spark.stop()
  }
}

/** `spark-submit --class repro.jobs.Table5Job`: S-Approx-DPC time vs accuracy. */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table5")
    try JobSession.emit(Tables.table5(spark)) finally spark.stop()
  }
}

/** `spark-submit --class repro.jobs.Table6Job`: decomposed phase times. */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table6")
    try JobSession.emit(Tables.table6(spark)) finally spark.stop()
  }
}

/** `spark-submit --class repro.jobs.Table7Job`: memory usage. */
object Table7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table7")
    try JobSession.emit(Tables.table7(spark)) finally spark.stop()
  }
}
