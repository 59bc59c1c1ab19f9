package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.tables.TableI

/** spark-submit entrypoint reproducing paper Table I (TRMP stage metrics).
  * Usage: spark-submit --class repro.jobs.TableIJob <jar>
  */
object TableIJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("egl-table1")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    try println(TableI.format(TableI.run(spark)))
    finally spark.stop()
  }
}
