package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp._

/** Shared spark-submit plumbing for the per-figure entrypoints. */
object JobSession {
  def make(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

/** `spark-submit --class repro.jobs.Fig2KCenterJob` — reproduces Fig. 2. */
object Fig2KCenterJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.make("fig2-kcenter")
    try println(Fig2KCenter.render(Fig2KCenter.run(spark, ExpConfig.bench)))
    finally spark.stop()
  }
}

/** `spark-submit --class repro.jobs.Fig3StreamJob` — reproduces Fig. 3
  * (sequential streaming simulation; Spark only hosts the JVM).
  */
object Fig3StreamJob {
  def main(args: Array[String]): Unit =
    println(Fig3Stream.render(Fig3Stream.run(ExpConfig.bench)))
}

/** `spark-submit --class repro.jobs.Fig4MROutliersJob` — reproduces Fig. 4. */
object Fig4MROutliersJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.make("fig4-mr-outliers")
    try println(Fig4MROutliers.render(Fig4MROutliers.run(spark, ExpConfig.bench)))
    finally spark.stop()
  }
}

/** `spark-submit --class repro.jobs.Fig5StreamOutliersJob` — reproduces Fig. 5. */
object Fig5StreamOutliersJob {
  def main(args: Array[String]): Unit =
    println(Fig5StreamOutliers.render(Fig5StreamOutliers.run(ExpConfig.bench)))
}

/** `spark-submit --class repro.jobs.Fig6ScaleJob` — reproduces Fig. 6. */
object Fig6ScaleJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.make("fig6-scale")
    try println(Fig6Scale.render(Fig6Scale.run(spark, ExpConfig.bench)))
    finally spark.stop()
  }
}

/** `spark-submit --class repro.jobs.Fig7SpeedupJob` — reproduces Fig. 7. */
object Fig7SpeedupJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.make("fig7-speedup")
    try println(Fig7Speedup.render(Fig7Speedup.run(spark, ExpConfig.bench)))
    finally spark.stop()
  }
}

/** `spark-submit --class repro.jobs.Fig8SequentialJob` — reproduces Fig. 8. */
object Fig8SequentialJob {
  def main(args: Array[String]): Unit =
    println(Fig8Sequential.render(Fig8Sequential.run(ExpConfig.bench)))
}
