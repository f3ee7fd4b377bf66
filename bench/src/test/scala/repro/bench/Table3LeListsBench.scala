package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Reproduces Table 3's LE-lists half: edge-revisit (ParlayLib role) vs
  * hash-bag frontiers.
  */
class Table3LeListsBench extends AnyFunSuite {

  private val scale = sys.env.getOrElse("REPRO_BENCH_SCALE", "1.0").toDouble

  test("Table 3 (LE-lists): plain vs hash-bag frontiers") {
    val rows = BenchSuite.runTable3Le(scale = scale, reps = 3)
    println(BenchSuite.formatTable3Le(rows))

    def geo(xs: Seq[Double]): Double = math.exp(xs.map(math.log).sum / xs.length)
    // Paper (§6.4): ours faster on all graphs (4.34x avg). Noise-robust
    // assertion: the hash-bag variant is at least competitive.
    val overall = geo(rows.map(r => r.plainMs / r.baggedMs))
    assert(overall > 0.8, f"bagged should be competitive, got $overall%.2fx")
  }
}
