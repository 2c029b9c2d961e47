package repro.jobs

import repro.benchlib._

/** spark-submit entrypoints, one per reproduced table/figure family.
  * The codec itself is CPU-bound Scala, so most jobs run on the driver;
  * [[SparkPipelineJob]] exercises the distributed per-partition path.
  *
  *   spark-submit --class repro.jobs.RatioJob target/scala-2.13/repro_2.13-*.jar
  */
object Table1Job {
  def main(args: Array[String]): Unit = println(DataTables.table1())
}

/** Table 2: entropy / autocorrelation vs blocking. */
object Table2Entropy {
  def main(args: Array[String]): Unit = println(DataTables.table2())
}

/** Table 3: Huffman vs fixed-length section sizes. */
object Table3Coding {
  def main(args: Array[String]): Unit = println(DataTables.table3())
}

/** Fig 8 + Fig 9. */
object AblationJob {
  def main(args: Array[String]): Unit = {
    println(AblationTables.ablation())
    println(AblationTables.errorDistribution())
  }
}

/** Figs 10 + 11. */
object RatioJob {
  def main(args: Array[String]): Unit = {
    val cells = RatioTables.cells()
    println(RatioTables.ratios(cells))
    println(RatioTables.ranking(cells))
    println(RatioTables.improvements(cells))
  }
}

/** Figs 12 + 13. */
object RateDistortionJob {
  def main(args: Array[String]): Unit = {
    println(RateDistortionTables.singleFrame())
    println(RateDistortionTables.psnrAdvantage())
    println(RateDistortionTables.multiFrame())
  }
}

/** Figs 16–18. */
object SpeedJob {
  def main(args: Array[String]): Unit = {
    val single = SpeedTables.singleFrame()
    val batch  = SpeedTables.batchMode()
    println(SpeedTables.table("Fig 16+17: single-frame speed (MB/s)", single))
    println(SpeedTables.decompressionAdvantage(single, "Fig 17 summary"))
    println(SpeedTables.table("Fig 18: batch-mode speed (MB/s)", batch))
    println(SpeedTables.decompressionAdvantage(batch, "Fig 18 summary"))
  }
}

/** Figs 5–7. */
object OptimizationJob {
  def main(args: Array[String]): Unit = {
    println(OptTables.blockSizeSweep())
    println(OptTables.optimizerEffectiveness())
    println(OptTables.ebScaleSweep())
  }
}
