package repro.spark

import org.apache.spark.sql.functions._
import repro.{SparkSpec, SynthData}
import repro.SynthData.TxStreamSpec
import repro.core.{Spade, StaticPeeling, Suspiciousness}

/** Distributed static peeling baselines (DataFrame + GraphX) vs the exact
  * driver-side Algorithm 1.
  */
class DistributedPeelingSpec extends SparkSpec {
  import spark.implicits._

  private def cliquePlusPath() = {
    // 4-clique weight 1 + pendant path; exact answer: the clique, g = 1.5
    val edges = Seq((0L, 1L, 1.0), (0L, 2L, 1.0), (0L, 3L, 1.0), (1L, 2L, 1.0),
                    (1L, 3L, 1.0), (2L, 3L, 1.0), (3L, 4L, 1.0), (4L, 5L, 1.0))
      .toDF("src", "dst", "w")
    val vertices = (0L to 5L).map((_, 0.0)).toDF("id", "a")
    (edges, vertices)
  }

  test("DataFrame peeling finds the clique exactly on the toy graph") {
    val (e, v) = cliquePlusPath()
    val r = DistributedPeeling.peelDataFrame(spark, e, v, eps = 0.1)
    assert(r.density >= 1.5 - 1e-9, s"density ${r.density}")
    assert(r.members.toSet.intersect(Set(0L, 1L, 2L, 3L)).size == 4)
  }

  test("GraphX peeling finds the clique exactly on the toy graph") {
    val (e, v) = cliquePlusPath()
    val r = DistributedPeeling.peelGraphX(spark, e, v, eps = 0.1)
    assert(r.density >= 1.5 - 1e-9, s"density ${r.density}")
    assert(r.members.toSet.intersect(Set(0L, 1L, 2L, 3L)).size == 4)
  }

  test("vertex priors contribute to the distributed density") {
    val e = Seq((0L, 1L, 1.0)).toDF("src", "dst", "w")
    val v = Seq((0L, 10.0), (1L, 0.0), (2L, 0.0)).toDF("id", "a")
    val r = DistributedPeeling.peelDataFrame(spark, e, v, eps = 0.1)
    // best is {0} alone: f = 10, g = 10 — or {0,1}: 11/2 = 5.5; approx must
    // be within 2(1+eps) of 10
    assert(r.density >= 10.0 / (2 * 1.1) - 1e-9)
  }

  test("both backends respect the 2(1+eps) bound against the exact peel (synthetic graph)") {
    val spec = TxStreamSpec(name = "dist", nCustomers = 300, nMerchants = 150,
      backgroundEdges = 2500, ratePerSec = 50, initBlocks = 2, incBlocks = 0,
      blockCustomers = 6, blockMerchants = 4, blockMultiplicity = 2, seed = 3)
    val df = SynthData.txStream(spark, spec).cache()
    val txs = TxFrames.collectOrdered(df)

    val spade = new Spade(Suspiciousness.DW)
    spade.loadGraph(txs)
    val exact = StaticPeeling.detect(spade.graph)

    val edges = df.select(col("src").cast("long").as("src"),
                          col("dst").cast("long").as("dst"),
                          col("amount").as("w"))
    val vertices = spark.range(spade.graph.numVertices).select(col("id"), lit(0.0).as("a"))
    val eps = 0.1
    val dfRes = DistributedPeeling.peelDataFrame(spark, edges, vertices, eps)
    val gxRes = DistributedPeeling.peelGraphX(spark, edges, vertices, eps)

    // g* >= g(exact peel), so both must reach at least g(exact)/(2(1+eps));
    // and no subset can beat g*, which is at most 2*g(exact) by Lemma 2.1.
    Seq("DataFrame" -> dfRes, "GraphX" -> gxRes).foreach { case (nm, r) =>
      assert(r.density >= exact.density / (2 * (1 + eps)) - 1e-9,
        s"$nm density ${r.density} below bound vs exact ${exact.density}")
      assert(r.density <= 2 * exact.density + 1e-9,
        s"$nm density ${r.density} impossibly high vs exact ${exact.density}")
      assert(r.rounds >= 1 && r.members.nonEmpty)
    }
  }

  test("the two backends agree with each other (same algorithm, same eps)") {
    val spec = TxStreamSpec(name = "agree", nCustomers = 150, nMerchants = 80,
      backgroundEdges = 1200, ratePerSec = 50, initBlocks = 1, incBlocks = 0,
      blockCustomers = 5, blockMerchants = 3, blockMultiplicity = 2, seed = 9)
    val df = SynthData.txStream(spark, spec)
    val edges = df.select(col("src").cast("long").as("src"),
                          col("dst").cast("long").as("dst"), col("amount").as("w"))
    val n = spec.totalVertices
    val vertices = spark.range(n).select(col("id"), lit(0.0).as("a"))
    val a = DistributedPeeling.peelDataFrame(spark, edges, vertices, eps = 0.2)
    val b = DistributedPeeling.peelGraphX(spark, edges, vertices, eps = 0.2)
    assert(math.abs(a.density - b.density) < 1e-6)
    assert(a.members.toSet == b.members.toSet)
    assert(a.rounds == b.rounds)
  }

  test("empty edge set yields the all-vertices density") {
    val e = Seq.empty[(Long, Long, Double)].toDF("src", "dst", "w")
    val v = Seq((0L, 2.0), (1L, 4.0)).toDF("id", "a")
    val r = DistributedPeeling.peelDataFrame(spark, e, v, eps = 0.1)
    assert(r.density >= 3.0 - 1e-9) // g(S0) = (2+4)/2 = 3; threshold drop may refine to {1}: 4
  }
}
