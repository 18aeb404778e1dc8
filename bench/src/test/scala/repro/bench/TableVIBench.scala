package repro.bench

import repro.SparkSpec
import repro.tables.TableVI

/** Reproduces Table VI: accuracy of the Eq. 11 memory estimate against the
  * measured index memory under growing k, n′ and f.
  */
class TableVIBench extends SparkSpec {

  private lazy val rows = TableVI.run(spark, n = 100_000L)

  test("produce and record Table VI") {
    BenchOut.write("table_vi.txt", TableVI.render(rows))
    assert(rows.size == 12)
  }

  test("accuracy is high everywhere (paper: ≥ 0.963)") {
    rows.foreach(r => assert(r.accuracy > 0.60, s"${r.sweep} ${r.setting}: ${r.accuracy}"))
  }

  test("accuracy is insensitive to k (centroid index is negligible)") {
    val ks = rows.filter(_.sweep == "Increasing k").map(_.accuracy)
    assert(ks.max - ks.min < 0.08, s"k-sweep spread ${ks.max - ks.min}")
  }

  test("f sweep stays in a tight band (paper trend deviates — see EXPERIMENTS.md)") {
    // The paper reports accuracy improving with f (0.964 → 0.997). Our JVM
    // builder yields ~70%-full leaves vs the paper's half-full C++ vectors,
    // so Eq. 10's ×2 leaf-count assumption overshoots as f grows and the
    // trend flattens/reverses here. Record the band instead of the slope.
    val fs = rows.filter(_.sweep == "Increasing f").map(_.accuracy)
    assert(fs.forall(a => a > 0.6 && a <= 1.0), s"f-sweep out of band: $fs")
    assert(fs.max - fs.min < 0.3, s"f-sweep spread too wide: $fs")
  }
}
