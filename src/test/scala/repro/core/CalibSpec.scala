package repro.core

import repro.SparkSpec
import repro.data.Datasets

/** Scratch calibration harness (run via testOnly; not part of shape tests). */
class CalibSpec extends SparkSpec {
  test("full-scale hospital/flights/beers ZeroED metrics") {
    for (name <- Seq("hospital", "flights", "beers")) {
      val ds = Datasets.load(spark, name, 1.0)
      ds.dirty.cache(); ds.mask.cache()
      val t0 = System.nanoTime()
      val r = ZeroED.run(spark, ds, byType = true)
      info(f"$name: ${r.metrics} prop=${r.propagation} " +
           f"in ${(System.nanoTime() - t0) / 1e9}%.1fs " +
           s"byType=${r.byType.map { case (k, v) => s"$k:${f"${v.recall}%.2f"}" }}")
    }
  }
}
