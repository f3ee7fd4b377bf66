package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Fig. 10's headline statistic as a table: VGC reduces the number of
  * reachability rounds by 3–200x (the paper's core mechanism claim).
  */
class VgcRoundsBench extends AnyFunSuite {

  private val scale = sys.env.getOrElse("REPRO_BENCH_SCALE", "1.0").toDouble

  test("VGC round reduction across the suite (Fig. 10 statistic)") {
    val rows = BenchSuite.runVgcRounds(scale = scale)
    println(BenchSuite.formatVgcRounds(rows))
    rows.foreach { r =>
      assert(r.vgcRounds <= r.plainRounds, s"${r.name}: VGC must not increase rounds")
    }
    // Large-diameter graphs must see a big reduction (paper: 3-200x).
    val lattice = rows.filter(r => Seq("SQR", "REC", "KNN2", "KNN5").contains(r.name))
    lattice.foreach { r =>
      assert(r.plainRounds.toDouble / r.vgcRounds > 3.0,
        s"${r.name}: reduction only ${r.plainRounds}/${r.vgcRounds}")
    }
  }
}
