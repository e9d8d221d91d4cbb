package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.expts.Tables

/** Shared SparkSession bootstrap for the spark-submit table jobs. */
object JobSession {
  def build(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

/** Regenerates the paper's Table III (dataset statistics). */
object TableIII {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("TableIII")
    try println(Tables.tableIII(spark)) finally spark.stop()
  }
}

/** Regenerates the paper's Table IV (effectiveness matrix). */
object TableIV {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("TableIV")
    try println(Tables.tableIV(spark)) finally spark.stop()
  }
}

/** Regenerates the paper's Table V (running-time matrix). */
object TableV {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("TableV")
    try println(Tables.tableV(spark)) finally spark.stop()
  }
}

/** Regenerates the paper's Table VI (memory-usage matrix). */
object TableVI {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("TableVI")
    try println(Tables.tableVI(spark)) finally spark.stop()
  }
}

/** Regenerates the paper's Table VII (EER-selected attributes). */
object TableVII {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("TableVII")
    try println(Tables.tableVII(spark)) finally spark.stop()
  }
}
