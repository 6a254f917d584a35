package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness._

/** spark-submit entrypoint for the physical-execution experiments
  * (§7.4.1 Fig. 5 / §7.5.1 Fig. 7): wall-clock of the workload over
  * BID-partitioned Parquet for qd-tree (route / no-route) vs Bottom-Up+
  * vs the deployed baseline.
  *
  * Usage: PhysicalExecJob [tpch|int|ext] [sfOrRows] [b]
  */
object PhysicalExecJob {
  def main(args: Array[String]): Unit = {
    val which = args.headOption.getOrElse("tpch")
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(s"qdtree-physexec-$which")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val ctx = which match {
        case "tpch" => Contexts.tpch(spark, sf = args.lift(1).map(_.toDouble).getOrElse(0.05))
        case "int"  => Contexts.errorLogInt(spark, rows = args.lift(1).map(_.toLong).getOrElse(300000L))
        case "ext"  => Contexts.errorLogExt(spark, rows = args.lift(1).map(_.toLong).getOrElse(300000L))
        case other  => sys.error(s"unknown workload $other")
      }
      val cfg = Table2.Config(b = args.lift(2).map(_.toInt).getOrElse(4096))
      val t2 = Table2.run(ctx, cfg)
      val runs = PhysicalExecPipeline.run(spark, ctx, t2)
      println(PhysicalExecPipeline.render(ctx, runs))
    } finally spark.stop()
  }
}
