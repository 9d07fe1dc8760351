package repro.bench

import repro.SparkSpec
import repro.core._

/** Temporary calibration probe — removed before finalizing. */
class ProbeBench extends SparkSpec {

  test("probe: per-edge costs and urgency rates on Grab1") {
    val spec = BenchDatasets.grabSpecs.head
    val (init, inc) = BenchDatasets.load(spark, spec)
    println(s"init=${init.length} inc=${inc.length}")

    Suspiciousness.paperMetrics.foreach { m =>
      val sample = inc.take(3000)
      var t0 = System.nanoTime()
      val r = StreamReplay.replayBatched(m, init, sample, 1, detectEvery = 512)
      val wall = (System.nanoTime() - t0) / 1e9
      println(f"${m.name}: batch1 perEdge=${r.perEdgeMicros}%.1f µs  wall=$wall%.1f s  " +
        f"window=${r.stats.emitted.toDouble / sample.length}%.1f  edgesTouched/edge=${r.stats.edgesTouched.toDouble / sample.length}%.0f")

      // urgency rate under grouping
      val spade = new Spade(m)
      spade.loadGraph(init)
      var urgent = 0
      sample.foreach { t => if (!spade.isBenign(t)) urgent += 1; spade.insertGrouped(t) }
      println(f"${m.name}: urgent rate=${urgent.toDouble / sample.length}%.4f  g(SP)=${spade.community.density}%.2f")
    }
  }
}
