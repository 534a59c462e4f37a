package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.{Harness, Workloads}

/** spark-submit entrypoints — one object per table of EXPERIMENTS.md.
  *
  * Each main builds (or reuses) a local SparkSession, runs the harness for
  * its table with the default bench parameters, and prints the table to
  * stdout. The `bench/` test suites run the same harness functions and
  * additionally assert the paper-predicted shape.
  *
  * Example: `spark-submit --class repro.jobs.T1SpaceVsN repro.jar`
  */
object Jobs {
  def session(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

object T1SpaceVsN {
  def main(args: Array[String]): Unit = {
    val eps = 0.04
    val rows = Harness.t1SpaceVsN(
      ns = Seq(1L << 14, 1L << 16, 1L << 18, 1L << 20),
      eps = eps, delta = 0.1, seed = 17)
    println(Harness.renderT1(rows, eps))
  }
}

object T2TailAccuracy {
  def main(args: Array[String]): Unit = {
    val (n, eps) = (1 << 20, 0.04)
    val res = Harness.t2TailAccuracy(n, eps, delta = 0.1, seed = 23)
    println(Harness.renderT2(res, n, eps))
  }
}

object T3Mergeability {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("T3Mergeability")
    val eps = 0.04
    val zipf = Workloads.zipf(spark, rows = 1L << 20, nKeys = 100000, seed = 31)
    println(Harness.renderT3(
      Harness.t3Mergeability(spark, zipf, eps, delta = 0.1, seed = 37),
      zipf.length, eps, "zipf keys"))
    val li = Workloads.lineitemPrices(spark, sf = 0.1)
    println(Harness.renderT3(
      Harness.t3Mergeability(spark, li, eps, delta = 0.1, seed = 41),
      li.length, eps, "lineitem l_extendedprice SF=0.1"))
    spark.stop()
  }
}

object T4EpsSweep {
  def main(args: Array[String]): Unit = {
    val n = 1 << 20
    val rows = Harness.t4EpsSweep(n, epss = Seq(0.1, 0.05, 0.025, 0.0125),
      delta = 0.1, seed = 43)
    println(Harness.renderT4(rows, n))
  }
}

object T5Throughput {
  def main(args: Array[String]): Unit = {
    val rows = Harness.t5Throughput(
      ns = Seq(1L << 18, 1L << 19, 1L << 20, 1L << 21),
      epss = Seq(0.1, 0.025), delta = 0.1, seed = 47)
    println(Harness.renderT5(rows))
  }
}

object T6FailureProb {
  def main(args: Array[String]): Unit = {
    val n = 1 << 16
    val rows = Harness.t6FailureProb(n, eps = 0.05,
      deltas = Seq(0.05, 0.2), trials = 400, seed = 53)
    println(Harness.renderT6(rows, n))
  }
}
