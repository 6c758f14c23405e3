package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.SynthData
import repro.workloads._

/** Runs every real Spark workload of the test suite (Table 2 analogues) once
  * at a configurable scale factor and prints the measured footprints — the
  * profiling path that grounds the simulator's AppModels.
  *
  * spark-submit --class repro.jobs.WorkloadsJob <jar> [sf]
  */
object WorkloadsJob {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.01)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("repro-workloads")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      def report(name: String)(body: => Unit): Unit = {
        val t0 = System.nanoTime()
        val (_, fp) = MetricsCollector.profile(spark)(body)
        val secs = (System.nanoTime() - t0) / 1e9
        println(f"$name%-10s ${secs}%7.1fs tasks=${fp.tasks}%5d gc=${fp.gcOverhead}%5.3f " +
          f"shufW=${fp.shuffleWriteBytes / 1e6}%8.1fMB spill=${fp.spilledBytes / 1e6}%8.1fMB")
      }

      val scale = (n: Long) => math.max(1L, (n * sf * 100).toLong)
      report("WordCount") {
        WordCountW.wordCounts(SynthData.textLines(spark, scale(50000), 8, 500)).count(); ()
      }
      report("SortByKey") {
        SortByKeyW.sorted(SynthData.uniformKeys(spark, scale(100000), 5000)).count(); ()
      }
      report("K-means") {
        KMeansW.run(spark, SynthData.points(spark, scale(30000), 3), k = 3, iters = 4); ()
      }
      report("SVM") {
        SvmW.train(SynthData.labeledPoints(spark, scale(30000)), epochs = 8); ()
      }
      report("PageRank") {
        PageRankW.run(SynthData.edges(spark, scale(40000), scale(3000)), iters = 5).count(); ()
      }
      report("TPC-H") {
        val t = TpchQueries.Tpch(spark, sf)
        TpchQueries.all(t).foreach(q => { q.spark.count(); () })
      }
    } finally spark.stop()
  }
}
