package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness._

/** spark-submit entrypoint reproducing Table 2 (logical I/O: % of tuples
  * accessed per layout scheme) for one workload.
  *
  * Usage: Table2Job [tpch|int|ext] [sfOrRows] [b]
  *   e.g. spark-submit --class repro.jobs.Table2Job repro.jar tpch 0.1 4096
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val which = args.headOption.getOrElse("tpch")
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(s"qdtree-table2-$which")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val ctx = which match {
        case "tpch" => Contexts.tpch(spark, sf = args.lift(1).map(_.toDouble).getOrElse(0.1))
        case "int"  => Contexts.errorLogInt(spark, rows = args.lift(1).map(_.toLong).getOrElse(600000L))
        case "ext"  => Contexts.errorLogExt(spark, rows = args.lift(1).map(_.toLong).getOrElse(600000L))
        case other  => sys.error(s"unknown workload $other")
      }
      val cfg = Table2.Config(b = args.lift(2).map(_.toInt).getOrElse(4096))
      val result = Table2.run(ctx, cfg)
      println(result.render)
    } finally spark.stop()
  }
}
