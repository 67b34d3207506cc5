package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Harness

/** spark-submit entrypoint reproducing Table II.
  *
  * Usage: spark-submit --class repro.jobs.TableII repro.jar [k] [eps,eps,...] [full]
  */
object TableII {
  def main(args: Array[String]): Unit = {
    val k = args.lift(0).map(_.toInt).getOrElse(20)
    val epsList = args.lift(1).map(_.split(',').map(_.toDouble).toSeq).getOrElse(Seq(0.3, 0.2, 0.15))
    val full = args.lift(2).contains("full")
    val spark = SparkSession.builder.appName("repro-table2")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.serializer", "org.apache.spark.serializer.KryoSerializer").getOrCreate()
    try {
      val rows = Harness.tableIISuite(full).map(Harness.tableIIRow(spark, _, k, epsList, println))
      val table = Harness.renderTableII(rows, epsList)
      println(table)
      println(s"written: ${Harness.writeResults("table2.md", table)}")
    } finally spark.stop()
  }
}
