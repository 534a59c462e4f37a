package repro.core

import org.apache.spark.sql.functions.{col, count}
import repro.{SparkSpec, SynthData}
import repro.exp.{Harness, Workloads}

/** Spark integration: the sketch as a distributed aggregate — per-partition
  * sketches merged by treeReduce, and the typed Aggregator as a UDAF in
  * DataFrame and SQL group-bys. This is the "fully mergeable ⇒ suitable for
  * parallel and distributed computing environments" claim, executed.
  */
class ReqSparkSpec extends SparkSpec {

  private val eps = 0.05

  test("sketchColumn summarizes every row (n matches count)") {
    val df = SynthData.uniformKeys(spark, rows = 100000, nKeys = 10000, seed = 1)
    val s = ReqSpark.sketchColumn(df, "v", eps, 0.1, Practical, seed = 2)
    assert(s.n == 100000)
  }

  test("sketchColumn keeps relative error on a distributed uniform column") {
    val df = SynthData.uniformKeys(spark, rows = 200000, nKeys = 10000, seed = 3)
      .repartition(32)
    val s = ReqSpark.sketchColumn(df, "v", eps, 0.1, Practical, seed = 4)
    val local = df.select(col("v")).collect().map(_.getDouble(0))
    val p = Harness.errProfile(s.rank, local)
    assert(p.maxRel <= 1.5 * eps, f"maxRel=${p.maxRel}%.4f")
  }

  test("sketchColumn keeps relative error on zipf keys (heavy duplicates)") {
    val df = SynthData.zipfKeys(spark, rows = 200000, nKeys = 100000, seed = 5)
      .repartition(16)
    val s = ReqSpark.sketchColumn(df, "k", eps, 0.1, Practical, seed = 6)
    val local = df.select(col("k").cast("double")).collect().map(_.getDouble(0))
    val p = Harness.errProfile(s.rank, local)
    assert(p.maxRel <= 1.5 * eps, f"maxRel=${p.maxRel}%.4f")
  }

  test("sketchColumn at depth 4 agrees with depth 2 in accuracy") {
    val df = SynthData.uniformKeys(spark, rows = 150000, nKeys = 1000, seed = 7)
      .repartition(64)
    val local = df.select(col("v")).collect().map(_.getDouble(0))
    val d2 = ReqSpark.sketchColumn(df, "v", eps, 0.1, Practical, seed = 8, depth = 2)
    val d4 = ReqSpark.sketchColumn(df, "v", eps, 0.1, Practical, seed = 9, depth = 4)
    assert(d2.n == d4.n)
    assert(Harness.errProfile(d2.rank, local).maxRel <= 1.5 * eps)
    assert(Harness.errProfile(d4.rank, local).maxRel <= 1.5 * eps)
  }

  test("sketchColumn drops nulls and NaNs") {
    import spark.implicits._
    val df = Seq(Some(1.0), None, Some(Double.NaN), Some(2.0), Some(3.0))
      .toDF("x")
    val s = ReqSpark.sketchColumn(df, "x", 0.1, 0.1, Practical, seed = 10)
    assert(s.n == 3)
    assert(s.rank(3.0) == 3)
  }

  test("sketchColumn on an empty frame returns an empty sketch") {
    import spark.implicits._
    val df = Seq.empty[Double].toDF("x")
    val s = ReqSpark.sketchColumn(df, "x", 0.1, 0.1, Practical, seed = 11)
    assert(s.n == 0)
  }

  test("mixSeed never returns 0 and spreads partition ids") {
    val seeds = (0 until 1000).map(ReqSpark.mixSeed(42L, _))
    assert(seeds.forall(_ != 0))
    assert(seeds.distinct.size == seeds.size)
  }

  test("UDAF: whole-column sketch matches the column count") {
    val df = SynthData.uniformKeys(spark, rows = 50000, nKeys = 500, seed = 12)
    val bytes = df.agg(ReqSpark.reqUdaf(eps, 0.1, Practical, seed = 13)(col("v"))
      .alias("sk")).head().getAs[Array[Byte]]("sk")
    val s = ReqSketch.fromBytes(bytes)
    assert(s.n == 50000)
  }

  test("UDAF: per-group sketches answer per-group quantiles within rel. error") {
    val sf = 0.01
    val li = SynthData.lineitem(spark, sf).select(
      col("l_returnflag"), col("l_extendedprice").cast("double").as("p"))
    val grouped = li.groupBy("l_returnflag")
      .agg(ReqSpark.reqUdaf(eps, 0.1, Practical, seed = 14)(col("p")).alias("sk"),
           count(col("p")).alias("cnt"))
      .collect()
    assert(grouped.length >= 2)
    grouped.foreach { row =>
      val flag = row.getString(0)
      val s = ReqSketch.fromBytes(row.getAs[Array[Byte]]("sk"))
      val cnt = row.getLong(2)
      assert(s.n == cnt, s"group $flag: sketch n=${s.n} vs count=$cnt")
      val local = li.filter(col("l_returnflag") === flag)
        .select("p").collect().map(_.getDouble(0))
      val p = Harness.errProfile(s.rank, local)
      assert(p.maxRel <= 1.5 * eps, f"group $flag maxRel=${p.maxRel}%.4f")
    }
  }

  test("UDAF registered in SQL produces a queryable sketch") {
    ReqSpark.register(spark, "req_sketch_t", eps, 0.1, Practical, seed = 15)
    SynthData.uniformKeys(spark, rows = 30000, nKeys = 100, seed = 16)
      .createOrReplaceTempView("uk")
    val bytes = spark.sql("SELECT req_sketch_t(v) AS sk FROM uk")
      .head().getAs[Array[Byte]]("sk")
    assert(ReqSketch.fromBytes(bytes).n == 30000)
  }

  test("quantileUdf and rankUdf work on the UDAF output") {
    import spark.implicits._
    val df = Workloads.uniform(40000, 17).toSeq.toDF("x")
    val skDf = df.agg(ReqSpark.reqUdaf(eps, 0.1, Practical, seed = 18)(col("x")).alias("sk"))
    val med = skDf.select(ReqSpark.quantileUdf(0.5)(col("sk")).alias("m"))
      .head().getDouble(0)
    assert(med > 0.4 && med < 0.6, s"median estimate $med")
    val r = skDf.select(ReqSpark.rankUdf(0.25)(col("sk")).alias("r"))
      .head().getLong(0)
    assert(math.abs(r - 10000) <= 1500, s"rank(0.25)=$r")
  }

  test("treeReduce result serializes through Spark's closure path") {
    val df = SynthData.uniformKeys(spark, rows = 20000, nKeys = 100, seed = 19)
    val s = ReqSpark.sketchColumn(df, "v", eps, 0.1, Practical, seed = 20)
    val rt = ReqSketch.fromBytes(ReqSketch.toBytes(s))
    assert(rt.n == s.n && rt.rank(0.5) == s.rank(0.5))
  }
}
