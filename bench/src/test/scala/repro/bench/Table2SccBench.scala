package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Reproduces Table 2 (SCC running times) at machine scale. Prints the
  * table; asserts the paper's qualitative claims that are robust at this
  * scale (correct outputs are require()d inside the runner).
  */
class Table2SccBench extends AnyFunSuite {

  private val scale = sys.env.getOrElse("REPRO_BENCH_SCALE", "1.0").toDouble

  test("Table 2: SCC running times across the suite") {
    val rows = BenchSuite.runTable2(scale = scale, reps = 3, msTimeoutMs = 20000)
    val table = BenchSuite.formatTable2(rows)
    println(table)

    def geo(xs: Seq[Double]): Double = math.exp(xs.map(math.log).sum / xs.length)
    val big = rows.filter(r => r.family == "knn" || r.family == "lattice")

    // Paper claim (§6.1): on large-diameter graphs, ours beats GBBS clearly
    // (paper: 6x overall; we assert >1.5x geomean to be noise-robust).
    val oursVsGbbs = geo(big.map(r => r.gbbsParMs / r.oursParMs))
    assert(oursVsGbbs > 1.5, f"ours should beat GBBS on large-diameter graphs, got $oursVsGbbs%.2fx")

    // Paper claim: on the giant-SCC large-diameter graphs (OneWay lattices,
    // dense k-NN), ours is the fastest parallel code — GBBS and MultiStep
    // pay O(D) rounds / O(m'D) coloring there (Fig. 1's red cells).
    rows.filter(r => Seq("SQR", "REC", "KNN5", "KNN10").contains(r.name)).foreach { r =>
      assert(r.oursParMs < r.gbbsParMs, s"${r.name}: ours ${r.oursParMs} vs gbbs ${r.gbbsParMs}")
      r.msParMs.foreach(ms => assert(r.oursParMs < ms * 1.5,
        s"${r.name}: ours ${r.oursParMs} vs multistep $ms"))
    }

    // Sanity: ours never falls far behind the other BGSS implementation on
    // any graph. (Absolute comparisons vs SEQ/MultiStep are not asserted:
    // at laptop scale ms-level Tarjan and one FW-BW pass legitimately win
    // small low-diameter graphs — see EXPERIMENTS.md's SEQ note.)
    rows.foreach { r =>
      assert(r.oursParMs < 5 * r.gbbsParMs,
        s"${r.name}: ours ${r.oursParMs} vs gbbs ${r.gbbsParMs}")
    }
  }
}
