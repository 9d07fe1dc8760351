package repro.bench

import repro.SparkSpec

/** Reproduces Table 3: statistics of the seven datasets (synthetic
  * stand-ins — see DESIGN.md §3 for the substitution).
  *
  * Paper (real data):            ours (stand-ins):
  *   Grab1  3.991M V / 10M  E      ~100K V / 250K E   (1/40 scale)
  *   Grab4  6.023M V / 25M  E      ~150K V / 625K E
  *   Amazon   28K  V / 28K  E      ~28K  V / 28K  E   (true size)
  *   Wiki-vote 16K V / 103K E      ~16K  V / 102K E
  *   Epinion  264K V / 841K E      ~264K V / 840K E
  */
class Table3DatasetStatsBench extends SparkSpec {

  test("Table 3: dataset statistics") {
    val stats = TableRunners.table3(spark, BenchDatasets.allSpecs)
    TableRunners.printTable3(stats)

    val byName = stats.map(s => s.name -> s).toMap

    // scale targets hold (±10%)
    assert(math.abs(byName("Grab1").v - 100000.0) / 100000.0 < 0.1)
    assert(math.abs(byName("Grab1").e - 250000.0) / 250000.0 < 0.1)
    assert(math.abs(byName("Grab4").e - 625000.0) / 625000.0 < 0.1)
    assert(math.abs(byName("Amazon").e - 28000.0) / 28000.0 < 0.1)
    assert(math.abs(byName("Wiki-vote").e - 103000.0) / 103000.0 < 0.1)
    assert(math.abs(byName("Epinion").e - 841000.0) / 841000.0 < 0.1)

    // the paper's avg-degree progression: Grab1 (5.011) < ... < Grab4 (8.302)
    val grabDegrees = Seq("Grab1", "Grab2", "Grab3", "Grab4").map(byName(_).avgDegree)
    assert(grabDegrees.zip(grabDegrees.tail).forall { case (a, b) => a < b },
      s"avg-degree progression broken: $grabDegrees")
    assert(grabDegrees.head > 4.0 && grabDegrees.last < 10.0)

    // increments are the 10% tail
    stats.foreach { s =>
      assert(math.abs(s.increments - 0.1 * s.e) / s.e < 0.01, s"${s.name} increments")
    }
  }
}
