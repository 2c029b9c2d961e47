package repro.benchlib

import repro.metrics.Metrics

/** Figures 10 (CD ranking) and 11 (multi-frame compression ratios). */
object RatioTables {

  final case class Cell(dataset: String, batch: Int, eb: Double, crByCodec: Map[String, Double])

  /** CR of every codec on every (multi-frame dataset, batch, eb) cell. */
  def cells(): Seq[Cell] = {
    val combos = for {
      (ds, frames) <- BenchData.multiFrame
      batch <- Seq(8, 16)
      eb <- BenchData.PaperEbs
      codec <- BenchData.codecs
    } yield (ds, frames, batch, eb, codec)
    val crs = Par.map(combos) { case (ds, frames, batch, eb, codec) =>
      val c = codec.compress(frames, eb, batch)
      (ds, batch, eb) -> (codec.name -> Metrics.compressionRatio(frames, c.payload.length.toLong))
    }
    crs.groupBy(_._1).toSeq
      .sortBy { case ((ds, batch, eb), _) => (BenchData.multiFrame.indexWhere(_._1 == ds), batch, -eb) }
      .map { case ((ds, batch, eb), vs) => Cell(ds, batch, eb, vs.map(_._2).toMap) }
  }

  /** Fig. 11 as a table: CR per codec per setting. */
  def ratios(cs: Seq[Cell]): String = {
    val names = BenchData.codecs.map(_.name)
    val rows = cs.map { c =>
      Seq(c.dataset, c.batch.toString, TableFmt.sci(c.eb)) ++
        names.map(n => TableFmt.f2(c.crByCodec(n)))
    }
    TableFmt.render("Fig 11: compression ratios, multi-frame datasets (higher is better)",
      Seq("Dataset", "Batch", "eb") ++ names, rows)
  }

  /** Fig. 10 analog: mean rank of each codec over all cells (1 = best). */
  def ranking(cs: Seq[Cell]): String = {
    val names = BenchData.codecs.map(_.name)
    val rankSums = scala.collection.mutable.Map(names.map(_ -> 0.0): _*)
    cs.foreach { c =>
      val ordered = names.sortBy(n => -c.crByCodec(n))
      ordered.zipWithIndex.foreach { case (n, i) => rankSums(n) += i + 1 }
    }
    val rows = names.sortBy(rankSums).map { n =>
      Seq(n, TableFmt.f2(rankSums(n) / cs.size))
    }
    TableFmt.render("Fig 10 (CD-diagram analog): mean CR rank over all settings (1 = best)",
      Seq("Compressor", "Mean rank"), rows)
  }

  /** The §8.2.3 quoted numbers: LCP's CR improvement over the second best
    * at batch 16, per dataset (paper: Helium +78%, Copper +26%, LJ +12%,
    * YIIP +104%). */
  def improvements(cs: Seq[Cell]): String = {
    val rows = BenchData.multiFrame.map(_._1).map { ds =>
      val mine = cs.filter(c => c.dataset == ds && c.batch == 16)
      // Aggregate over ebs by mean CR, as a table-level summary.
      val mean = BenchData.codecs.map(_.name)
        .map(n => n -> mine.map(_.crByCodec(n)).sum / mine.size).toMap
      val lcp    = mean("LCP")
      val second = (mean - "LCP").values.max
      val secondName = (mean - "LCP").maxBy(_._2)._1
      Seq(ds, TableFmt.f2(lcp), s"$secondName (${TableFmt.f2(second)})",
        f"${(lcp / second - 1) * 100}%+.0f%%")
    }
    TableFmt.render("Fig 11 summary: LCP vs second best at batch 16 (mean over ebs)",
      Seq("Dataset", "LCP CR", "Second best", "Improvement"), rows)
  }
}
