package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.tables.TableII

/** spark-submit entrypoint reproducing paper Table II (offline comparison).
  * Usage: spark-submit --class repro.jobs.TableIIJob <jar>
  */
object TableIIJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("egl-table2")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    try println(TableII.format(TableII.run(spark)))
    finally spark.stop()
  }
}
