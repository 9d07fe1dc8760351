package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.graphx.{Edge, Graph => XGraph}

/** Distributed static dense-subgraph baselines — the "periodic batch
  * detection" stage of Grab's pipeline (Fig. 1), which Spade's incremental
  * maintenance replaces.
  *
  * Both implementations are the Bahmani-et-al. batched peeling: repeatedly
  * drop every vertex whose peeling weight `w_u(S) <= 2(1+eps) * g(S)` and
  * keep the densest intermediate `S`. Since
  * `Σ_u w_u(S) = f_V(S) + 2 f_E(S) <= 2 f(S)`, each round removes at least
  * an `eps/(1+eps)` fraction of S, so there are O(log|V| / eps) rounds, and
  * the surviving best `S` satisfies `g(S) >= g(S*) / (2(1+eps))`.
  *
  *  - [[peelDataFrame]] uses the Catalyst path (aggregations + semi-joins),
  *  - [[peelGraphX]] uses the RDD layer via `aggregateMessages` + `subgraph`
  *    (the calibration brief asks for a GraphX peeling variant).
  */
object DistributedPeeling {

  /** Result of a distributed peel: best density and its member vertices. */
  final case class DistResult(density: Double, members: Array[Long], rounds: Int)

  /** DataFrame-based batched peeling.
    *
    * @param edges    (src BIGINT, dst BIGINT, w DOUBLE) — materialized edge
    *                 suspiciousness, parallel edges allowed
    * @param vertices (id BIGINT, a DOUBLE) — vertex priors; every edge
    *                 endpoint must appear
    */
  def peelDataFrame(spark: SparkSession, edges: DataFrame, vertices: DataFrame,
                    eps: Double = 0.1, maxRounds: Int = 100): DistResult = {
    require(eps > 0, "eps must be positive")
    // localCheckpoint (eager) each round: the iteration would otherwise grow
    // the logical plan, and Catalyst analysis goes super-linear in plan depth.
    var vs = vertices.select(col("id").cast("long").as("id"), col("a").cast("double").as("a"))
      .localCheckpoint()
    var es = edges.select(col("src").cast("long").as("src"), col("dst").cast("long").as("dst"),
                          col("w").cast("double").as("w"))
      .localCheckpoint()

    var bestDensity = Double.NegativeInfinity
    var bestMembers: Array[Long] = Array.empty
    var rounds = 0
    var done = false
    while (!done && rounds < maxRounds) {
      val agg = vs.agg(sum("a").as("sa"), count(lit(1)).as("nv"))
        .crossJoin(es.agg(coalesce(sum("w"), lit(0.0)).as("sc")))
        .select(col("sa"), col("nv"), col("sc")).collect()(0)
      val nv = agg.getLong(1)
      if (nv == 0) done = true
      else {
        val f = agg.getDouble(0) + agg.getDouble(2)
        val g = f / nv
        if (g > bestDensity) {
          bestDensity = g
          bestMembers = vs.select("id").collect().map(_.getLong(0))
        }
        val thresh = 2.0 * (1.0 + eps) * g
        // w_u(S) = a_u + Σ out + Σ in
        val deg = es.select(col("src").as("id"), col("w"))
          .unionByName(es.select(col("dst").as("id"), col("w")))
          .groupBy("id").agg(sum("w").as("dw"))
        val withW = vs.join(deg, Seq("id"), "left")
          .select(col("id"), col("a"), (col("a") + coalesce(col("dw"), lit(0.0))).as("wu"))
        val surv = withW.filter(col("wu") > thresh).select("id", "a").localCheckpoint()
        val nSurv = surv.count()
        if (nSurv == nv || nSurv == 0) {
          // No progress (all tied at the threshold) or everything dropped —
          // either way the best recorded S is the answer.
          done = true
        } else {
          val newEs = es
            .join(surv.select(col("id").as("src")), Seq("src"), "left_semi")
            .join(surv.select(col("id").as("dst")), Seq("dst"), "left_semi")
            .localCheckpoint()
          vs = surv; es = newEs
        }
        rounds += 1
      }
    }
    DistResult(bestDensity, bestMembers, rounds)
  }

  /** GraphX-based batched peeling (same algorithm on the RDD layer). */
  def peelGraphX(spark: SparkSession, edges: DataFrame, vertices: DataFrame,
                 eps: Double = 0.1, maxRounds: Int = 100): DistResult = {
    require(eps > 0, "eps must be positive")
    val sc = spark.sparkContext
    val vrdd = vertices.select(col("id").cast("long"), col("a").cast("double"))
      .rdd.map(r => (r.getLong(0), r.getDouble(1)))
    val erdd = edges.select(col("src").cast("long"), col("dst").cast("long"), col("w").cast("double"))
      .rdd.map(r => Edge(r.getLong(0), r.getLong(1), r.getDouble(2)))
    // GraphX assigns a default storage level at construction; cache() keeps
    // it (persist with a different level throws).
    var g = XGraph(vrdd, erdd).cache()

    var bestDensity = Double.NegativeInfinity
    var bestMembers: Array[Long] = Array.empty
    var rounds = 0
    var done = false
    while (!done && rounds < maxRounds) {
      val nv = g.vertices.count()
      if (nv == 0) done = true
      else {
        val sa = g.vertices.map(_._2).sum()
        val scw = g.edges.map(_.attr).sum()
        val dens = (sa + scw) / nv
        if (dens > bestDensity) {
          bestDensity = dens
          bestMembers = g.vertices.keys.collect()
        }
        val thresh = 2.0 * (1.0 + eps) * dens
        val degs = g.aggregateMessages[Double](
          ctx => { ctx.sendToSrc(ctx.attr); ctx.sendToDst(ctx.attr) },
          _ + _)
        val withW = g.outerJoinVertices(degs) { (_, a, dw) => (a, a + dw.getOrElse(0.0)) }
        val surv = withW.subgraph(vpred = (_, attr) => attr._2 > thresh)
          .mapVertices((_, attr) => attr._1)
          .cache()
        // materialize both sides before dropping the parent, or the lineage
        // chain is recomputed from scratch every round
        val nSurv = surv.vertices.count()
        surv.edges.count()
        if (nSurv == nv || nSurv == 0) {
          surv.unpersist(false)
          done = true
        } else {
          g.unpersist(false)
          g = surv
        }
        rounds += 1
      }
    }
    g.unpersist(false)
    DistResult(bestDensity, bestMembers, rounds)
  }
}
