package repro.spark

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}
import repro.SynthData.TxStreamSpec
import repro.core.{Spade, Suspiciousness}

/** DataFrame ↔ driver-graph bridge: loading, splitting, stats. */
class TxFramesSpec extends SparkSpec {

  private val spec = TxStreamSpec(
    name = "bridge", nCustomers = 200, nMerchants = 100, backgroundEdges = 1500,
    ratePerSec = 50.0, initBlocks = 1, incBlocks = 1,
    blockCustomers = 4, blockMerchants = 3, blockMultiplicity = 6, seed = 11)

  private lazy val df = SynthData.txStream(spark, spec).cache()

  test("collectOrdered returns every row, ordered by ts") {
    val txs = TxFrames.collectOrdered(df)
    assert(txs.length == spec.totalEdges)
    assert(txs.zip(txs.tail).forall { case (a, b) => a.ts <= b.ts })
  }

  test("splitInitialIncrements cuts at 90/10") {
    val txs = TxFrames.collectOrdered(df)
    val (init, inc) = TxFrames.splitInitialIncrements(txs, 0.10)
    assert(init.length + inc.length == txs.length)
    assert(math.abs(init.length - 0.9 * txs.length) <= 1)
    assert(inc.forall(t => t.ts >= init.last.ts))
  }

  test("splitInitialIncrements rejects degenerate fractions") {
    val txs = TxFrames.collectOrdered(df)
    intercept[IllegalArgumentException](TxFrames.splitInitialIncrements(txs, 0.0))
    intercept[IllegalArgumentException](TxFrames.splitInitialIncrements(txs, 1.0))
  }

  test("oracle: graphStats (V, E, avg degree) agrees with DuckDB") {
    val stats = TxFrames.graphStats(spark, df, 0.10)
      .select(col("v").cast("long").as("v"), col("e").cast("long").as("e"),
              col("avg_degree").cast("double").as("avg_degree"),
              col("increments").cast("long").as("increments"))
    Oracle.assertEquivalent(
      stats,
      """SELECT v, e, ROUND(2.0 * e / v, 3) AS avg_degree,
        |       CAST(FLOOR(e * 0.10) AS BIGINT) AS increments
        |FROM (SELECT MAX(GREATEST(CAST(src AS BIGINT), CAST(dst AS BIGINT))) + 1 AS v,
        |             COUNT(*) AS e FROM txs)""".stripMargin,
      "txs" -> df)
  }

  test("oracle: weightedDegrees agrees with DuckDB") {
    val withW = df.select(col("src"), col("dst"), col("amount").as("w"))
    val wd = TxFrames.weightedDegrees(withW)
      .filter(col("v") < 150)
      .select(col("v").cast("long").as("v"), round(col("w0"), 2).as("w0"))
    Oracle.assertEquivalent(
      wd,
      """SELECT CAST(v AS BIGINT) AS v, ROUND(SUM(w), 2) AS w0 FROM (
        |  SELECT src AS v, CAST(amount AS DOUBLE) AS w FROM txs
        |  UNION ALL
        |  SELECT dst AS v, CAST(amount AS DOUBLE) AS w FROM txs
        |) WHERE CAST(v AS INT) < 150 GROUP BY v""".stripMargin,
      "txs" -> df)
  }

  test("weightedDegrees matches DynGraph.incidentWeight vertex by vertex (DW)") {
    val txs = TxFrames.collectOrdered(df)
    val spade = new Spade(Suspiciousness.DW)
    spade.loadGraph(txs)
    val withW = df.select(col("src"), col("dst"), col("amount").as("w"))
    val sql = TxFrames.weightedDegrees(withW).collect()
      .map(r => r.getInt(0) -> r.getDouble(1)).toMap
    sql.foreach { case (v, w0) =>
      assert(math.abs(spade.graph.incidentWeight(v) - w0) < 1e-6, s"vertex $v")
    }
    // vertices absent from the SQL side have no edges
    (0 until spade.graph.numVertices).filterNot(sql.contains).foreach { v =>
      assert(spade.graph.degree(v) == 0)
    }
  }

  test("driver replay of the collected stream detects the planted increment block") {
    val txs = TxFrames.collectOrdered(df)
    val (init, inc) = TxFrames.splitInitialIncrements(txs, spec.incrementFraction)
    val spade = new Spade(Suspiciousness.DW)
    spade.loadGraph(init)
    spade.insertBatchEdges(inc)
    // Fig.-14 spotting: equally dense instances are all reported — the
    // increment block must sit inside the threshold community even if the
    // initial block is marginally denser.
    val suspects = spade.detectSuspects(0.6)
    val blockVertices = txs.filter(_.fraudId == 1).flatMap(t => Seq(t.src, t.dst)).toSet
    assert(blockVertices.subsetOf(suspects.memberSet),
      s"increment block $blockVertices invisible in ${suspects.memberSet.take(30)}")
  }
}
