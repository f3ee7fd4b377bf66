package repro.bench

import repro.SparkSpec
import repro.core.SparkScc
import repro.graph.{GraphGen, GraphStats}
import repro.seq.Tarjan

/** Supplementary: the Spark DataFrame port of BGSS SCC, plain supersteps vs
  * VGC supersteps, on small graphs (each superstep is a full shuffle, so
  * this is the paper's large-D pathology in its most extreme form).
  */
class SparkSccBench extends SparkSpec {

  test("Spark BGSS SCC: superstep collapse from VGC") {
    val graphs = Seq(
      "cycle-120" -> GraphGen.cycle(120),
      "lattice-10x10" -> GraphGen.lattice(10, 10, GraphGen.OneWay, 7),
      "rmat-64" -> GraphGen.rmat(6, 6, 7),
    )
    println("Spark BGSS SCC (supplementary): supersteps and wall time")
    println(f"${"graph"}%-14s ${"n"}%6s ${"m"}%7s | ${"plain steps"}%11s ${"plain ms"}%9s | ${"vgc steps"}%9s ${"vgc ms"}%9s")
    graphs.foreach { case (name, g) =>
      val expected = GraphStats.sccStats(Tarjan.scc(g))
      val t0 = System.nanoTime()
      val plain = SparkScc.run(spark, g, useVgc = false)
      val plainMs = (System.nanoTime() - t0) / 1e6
      val t1 = System.nanoTime()
      val vgc = SparkScc.run(spark, g, useVgc = true, tau = 64)
      val vgcMs = (System.nanoTime() - t1) / 1e6
      assert(GraphStats.sccStats(plain.labels) == expected, s"$name plain wrong")
      assert(GraphStats.sccStats(vgc.labels) == expected, s"$name vgc wrong")
      println(f"$name%-14s ${g.n}%6d ${g.m}%7d | ${plain.supersteps}%11d $plainMs%9.0f | ${vgc.supersteps}%9d $vgcMs%9.0f")
      assert(vgc.supersteps <= plain.supersteps)
    }
  }
}
