package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness._

/** spark-submit entrypoints — one per reproduced table. Example:
  *
  * {{{
  *   spark-submit --class repro.jobs.Fig1TpchSharing target/scala-2.13/repro_2.13-0.1.0-SNAPSHOT.jar [sf]
  * }}}
  *
  * Kernel-only jobs (Fig 6, 8, 9, 10, 11, 17) run fine under plain
  * `java -cp` too; they do not require a SparkSession.
  */
object JobUtil {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def sfArg(args: Array[String]): Double = args.headOption.map(_.toDouble).getOrElse(0.1)
}

object Fig1TpchSharing {
  def main(args: Array[String]): Unit =
    println(TpchHarness.sharing(JobUtil.session("fig1"), sf = JobUtil.sfArg(args)))
}

object Fig12TpchStreaming {
  def main(args: Array[String]): Unit =
    println(TpchHarness.streamingRates(JobUtil.session("fig12"), sf = JobUtil.sfArg(args)))
}

object Fig13TpchBatch {
  def main(args: Array[String]): Unit =
    println(TpchHarness.batchElapsed(JobUtil.session("fig13"), sf = JobUtil.sfArg(args)))
}

object Fig6GraphQueries {
  def main(args: Array[String]): Unit =
    println(GraphQueryHarness.run())
}

object Fig8DatalogInteractive {
  def main(args: Array[String]): Unit =
    println(DatalogHarness.fig8())
}

object Fig17DatalogBatch {
  def main(args: Array[String]): Unit =
    println(DatalogHarness.fig17())
}

object Fig9GraspanDataflow {
  def main(args: Array[String]): Unit = {
    println(GraspanHarness.fig9Runtime())
    println(GraspanHarness.fig9Removal())
  }
}

object Fig10GraspanPointsTo {
  def main(args: Array[String]): Unit =
    println(GraspanHarness.fig10())
}

object Fig11BatchGraphs {
  def main(args: Array[String]): Unit =
    println(BatchGraphHarness.run())
}
