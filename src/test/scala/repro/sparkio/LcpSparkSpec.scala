package repro.sparkio

import java.nio.file.Files
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestFrames}
import repro.core.Lcp.LcpConfig
import repro.metrics.Metrics

/** End-to-end Spark path: particle rows → per-partition LCP compression →
  * Parquet → partial retrieval → Spark SQL over the decompressed table,
  * cross-checked against DuckDB via the Oracle.
  */
class LcpSparkSpec extends SparkSpec {

  private lazy val frames = TestFrames.copper(800, 8)
  private val cfg         = LcpConfig(eb = 0.02, batchSize = 4)

  test("framesToDf row count equals total particles") {
    val df = LcpSpark.framesToDf(spark, frames)
    assert(df.count() == frames.map(_.n.toLong).sum)
  }

  test("compress produces one group per batchesPerGroup batches") {
    val df = LcpSpark.framesToDf(spark, frames)
    val groups = LcpSpark.compress(df, cfg, batchesPerGroup = 1).collect()
    assert(groups.length == 2) // 8 frames / (4 frames per batch * 1)
    assert(groups.map(_.numFrames).sum == 8)
  }

  test("roundtrip through Spark preserves counts and the error bound per frame") {
    val df     = LcpSpark.framesToDf(spark, frames)
    val groups = LcpSpark.compress(df, cfg, batchesPerGroup = 2)
    val back   = LcpSpark.decompressToDf(groups)

    val counts = back.groupBy("frame").count().collect()
      .map(r => r.getInt(0) -> r.getLong(1)).toMap
    frames.zipWithIndex.foreach { case (f, t) => assert(counts(t) == f.n, s"frame $t") }

    // Bound check via per-frame coordinate span: every decompressed value
    // must lie inside [min-eb, max+eb] of its original frame, and per-frame
    // mean positions agree within eb.
    val stats = back.groupBy("frame")
      .agg(min("x") as "mnx", max("x") as "mxx", avg("x") as "ax",
           avg("y") as "ay", avg("z") as "az")
      .collect().map(r => r.getInt(0) -> r).toMap
    val slack = cfg.eb * (1 + 1e-9)
    frames.zipWithIndex.foreach { case (f, t) =>
      val r = stats(t)
      assert(r.getDouble(1) >= f.x.min - slack && r.getDouble(2) <= f.x.max + slack)
      assert(math.abs(r.getDouble(3) - f.x.sum / f.n) <= slack)
      assert(math.abs(r.getDouble(4) - f.y.sum / f.n) <= slack)
      assert(math.abs(r.getDouble(5) - f.z.sum / f.n) <= slack)
    }
  }

  test("Parquet write + partial retrieval decodes only the requested batch") {
    val dir = Files.createTempDirectory("lcp-parquet").toString + "/store"
    val df  = LcpSpark.framesToDf(spark, frames)
    LcpSpark.writeParquet(LcpSpark.compress(df, cfg, batchesPerGroup = 1), dir)

    val batch = LcpSpark.readFrameBatch(spark, dir, cfg, batchesPerGroup = 1, frameIdx = 5)
    val gotFrames = batch.select("frame").distinct().collect().map(_.getInt(0)).sorted
    assert(gotFrames.sameElements(Array(4, 5, 6, 7)), "second batch holds frames 4..7")
    assert(batch.count() == frames(5).n.toLong * 4)
  }

  test("Oracle: Spark SQL aggregates over the decompressed table match DuckDB") {
    val df     = LcpSpark.framesToDf(spark, frames.take(4))
    val groups = LcpSpark.compress(df, cfg, batchesPerGroup = 1)
    val back   = LcpSpark.decompressToDf(groups)
    back.createOrReplaceTempView("particles")

    val sparkOut = spark.sql(
      """SELECT frame, COUNT(*) AS cnt,
        |       ROUND(AVG(x), 4) AS ax, ROUND(MIN(y), 4) AS mny, ROUND(MAX(z), 4) AS mxz
        |FROM particles GROUP BY frame""".stripMargin)
    Oracle.assertEquivalent(
      sparkOut,
      """SELECT frame, COUNT(*) AS cnt,
        |       ROUND(AVG(CAST(x AS DOUBLE)), 4) AS ax,
        |       ROUND(MIN(CAST(y AS DOUBLE)), 4) AS mny,
        |       ROUND(MAX(CAST(z AS DOUBLE)), 4) AS mxz
        |FROM particles GROUP BY frame""".stripMargin,
      "particles" -> back)
  }

  test("Oracle smoke test on provided TPC-H-lite generator") {
    val li = repro.SynthData.lineitem(spark, sf = 0.001)
    val out = li.groupBy("l_returnflag").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(out,
      "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("distributed compression ratio matches single-node codec within metadata slack") {
    val df     = LcpSpark.framesToDf(spark, frames)
    val groups = LcpSpark.compress(df, cfg, batchesPerGroup = 2).collect()
    val sparkBytes = groups.map(_.blob.length.toLong).sum
    val local = repro.core.Lcp.compress(frames, cfg).archive.compressedSizeBytes
    assert(sparkBytes < local * 1.5, s"spark $sparkBytes vs local $local")
    assert(Metrics.compressionRatio(frames, sparkBytes) > 2.0)
  }
}
