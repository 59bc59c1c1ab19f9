package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.tables.TableIII

/** spark-submit entrypoint reproducing paper Table III (online A/B).
  * Usage: spark-submit --class repro.jobs.TableIIIJob <jar>
  */
object TableIIIJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("egl-table3")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    try println(TableIII.format(TableIII.run(spark)))
    finally spark.stop()
  }
}
