package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.benchlib._
import repro.core.LcpS

/** Table 3: Huffman vs fixed-length per LCP-S section. The paper's point is
  * that the winner varies by dataset and bound, so LCP must pick per array
  * by expected length. */
class Table3CodingBench extends AnyFunSuite {

  test("Table 3: Huffman vs fixed-length section sizes") {
    println(DataTables.table3())
  }

  test("Table 3 shape: the optimal coding method varies across cells") {
    val winners = for {
      name <- Seq("Helium", "Copper", "3DEP")
      f = BenchData.singleFrame.find(_._1 == name).get._2
      eb <- BenchData.PaperEbs
      c = LcpS.sectionCosts(f, eb, 64)
      (h, fx) <- Seq((c.blockIdHuffman, c.blockIdFixed), (c.relPosHuffman, c.relPosFixed))
    } yield h.exists(_ < fx)
    assert(winners.contains(true), "Huffman should win at least one cell")
    assert(winners.contains(false), "fixed-length should win at least one cell")
  }

  test("Table 3 shape: pick-smaller never loses to either single method") {
    for {
      name <- Seq("Helium", "Copper")
      f = BenchData.singleFrame.find(_._1 == name).get._2
      eb <- Seq(1e-1, 1e-3)
    } {
      val grouped = repro.core.BlockIndex.group(repro.core.Quantizer.quantizeFrame(f, eb), 64)
      val auto  = repro.coding.IntCoder.encode(grouped.blockIds).length
      val fixed = repro.coding.IntCoder.encodeForced(grouped.blockIds, delta = true, useHuffman = false).length
      val huff  = repro.coding.IntCoder.encodeForced(grouped.blockIds, delta = true, useHuffman = true).length
      assert(auto <= math.min(fixed, huff) + 8, s"$name eb=$eb: auto $auto vs fixed $fixed / huff $huff")
    }
  }
}
