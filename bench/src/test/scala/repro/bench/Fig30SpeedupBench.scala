package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.cluster._

/** Figure 30 — speed-up of 24 vs 6 nodes for all seven evaluation UDFs at
  * batch sizes 1X/4X/16X (simulation; the multi-node cluster is the
  * substituted substrate, DESIGN.md §4).
  */
class Fig30SpeedupBench extends AnyFunSuite {

  private val udfs = Seq(
    UdfModels.safetyRating, UdfModels.religiousPopulation, UdfModels.largestReligions,
    UdfModels.fuzzySuspects, UdfModels.nearbyMonuments, UdfModels.suspiciousNames,
    UdfModels.tweetContext, UdfModels.worrisomeTweets)

  private def speedup(u: UdfModel, b: Long): Double =
    ClusterSim.dynamicThroughput(24, 1, b, Some(u)) /
      ClusterSim.dynamicThroughput(6, 1, b, Some(u))

  test("Fig 30 (sim): 24-vs-6-node speed-up per UDF and batch size") {
    BenchUtil.banner("Fig 30 (sim): speed-up, 24 vs 6 nodes")
    BenchUtil.row("udf", "1X", "4X", "16X")
    for (u <- udfs) {
      val sp = Seq(420L, 1680L, 6720L).map(b => f"${speedup(u, b)}%.2f")
      BenchUtil.row((u.name +: sp): _*)
    }
    // Paper shapes: simple hash-join UDFs speed up worst; Tweet Context
    // exceeds the ideal 4x; the index join trails the compute-heavy UDFs.
    val b = 6720L
    assert(speedup(UdfModels.tweetContext, b) > 4.0)
    assert(speedup(UdfModels.safetyRating, b) < speedup(UdfModels.fuzzySuspects, b))
    assert(speedup(UdfModels.nearbyMonuments, b) < speedup(UdfModels.suspiciousNames, b))
  }
}
