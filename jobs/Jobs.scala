package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Benchmarks
import repro.workflows.Workflows

/** spark-submit entrypoints, one per evaluation table.
  *
  * {{{
  *   spark-submit --class repro.jobs.TableVIIJob  repro.jar [scale]
  *   spark-submit --class repro.jobs.QueryLatencyJob repro.jar [nRandomWf]
  *   spark-submit --class repro.jobs.TableIXJob   repro.jar [runs]
  *   spark-submit --class repro.jobs.TableXJob    repro.jar [perDataset]
  * }}}
  */
object JobSession {
  def get(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

object TableVIIJob {
  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(1.0)
    val spark = JobSession.get("table-vii")
    try Benchmarks.runTableVII(spark, scale)
    finally spark.stop()
  }
}

object QueryLatencyJob {
  def main(args: Array[String]): Unit = {
    val nRandom = args.headOption.map(_.toInt).getOrElse(2)
    val spark = JobSession.get("query-latency")
    try {
      val formats = Seq("Raw", "Array", "Parquet", "Parquet-GZip", "Turbo-RC")
      val sels = Seq(0.0001, 0.001, 0.01, 0.1)
      val pipelines =
        Seq(
          Workflows.imagePipeline(spark, src = 256, n = 128),
          Workflows.relationalPipeline(spark, nBasics = 6000),
          Workflows.resnetBlock(spark, c = 8, h = 16, w = 16),
        ) ++ (0 until nRandom).map(i =>
          Workflows.randomPipeline(spark, nOps = 5, cells = 100000, seed = 100 + i))
      val rows = pipelines.flatMap { p =>
        val stored = Benchmarks.ingestAndStore(spark, p, formats)
        sels.flatMap(sel => Benchmarks.queryAllMethods(spark, stored, sel, includeNoMerge = true))
      }
      Benchmarks.printLatencyRows("Workflow query latency (Figs 8-9)", rows)
    } finally spark.stop()
  }
}

object TableIXJob {
  def main(args: Array[String]): Unit = {
    val runs = args.headOption.map(_.toInt).getOrElse(20)
    Benchmarks.runTableIX(runs)
  }
}

object TableXJob {
  def main(args: Array[String]): Unit = {
    val per = args.headOption.map(_.toInt).getOrElse(10)
    Benchmarks.runTableX(per)
  }
}
