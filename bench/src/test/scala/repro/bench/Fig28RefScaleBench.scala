package repro.bench

import repro.SparkSpec
import repro.cluster._
import repro.core._

/** Figure 28 — reference-data scale-out: the paper grows the reference
  * datasets 1X→4X while growing the cluster 6→24 nodes and observes only a
  * slight throughput drop. Here: (a) the simulator reproduces the
  * compensated (nodes grow with data) sweep, and (b) a real local run shows
  * the uncompensated cost of bigger references at fixed resources — the
  * effect the added nodes pay for.
  */
class Fig28RefScaleBench extends SparkSpec {

  test("Fig 28 (sim): ref scale 1X-4X with proportional cluster growth") {
    BenchUtil.banner("Fig 28 (sim): throughput (rec/s), batch 6720, refs and nodes grow together")
    val udfs = Seq(UdfModels.safetyRating, UdfModels.religiousPopulation,
      UdfModels.largestReligions, UdfModels.fuzzySuspects, UdfModels.nearbyMonuments)
    BenchUtil.row(("refScale" +: "nodes" +: udfs.map(_.name)): _*)
    val table = for ((sc, n) <- Seq((1.0, 6), (2.0, 12), (3.0, 18), (4.0, 24))) yield {
      val ts = udfs.map(u => ClusterSim.dynamicThroughput(n, 1, 6720, Some(u), refScale = sc))
      BenchUtil.row((sc.toString +: n.toString +: ts.map(t => f"$t%.0f")): _*)
      ts
    }
    // "Scaled well": no UDF loses more than ~40% across the compensated sweep.
    for (i <- table.head.indices)
      assert(table.last(i) > table.head(i) * 0.6,
        s"${udfs(i).name} degraded too much: ${table.map(_(i))}")
  }

  test("Fig 28 (local): reference size 1X-4X at fixed resources") {
    BenchUtil.banner("Fig 28 (local): throughput (rec/s) vs reference scale, batch 6720, fixed resources")
    BenchUtil.row("refScale", "safety_rating", "nearby_monuments")
    val n = 6720
    // Unmeasured warm-up so the 1X row doesn't pay JIT/codegen.
    BenchUtil.run(spark, n / 4, 1680, SqlEnrichment("safety_rating"), Dynamic, RefStoreSet.create(spark))
    val rows = for (sc <- Seq(1.0, 2.0, 3.0, 4.0)) yield {
      val stores = RefStoreSet.create(spark, scale = sc)
      val hash = BenchUtil.run(spark, n, 6720, SqlEnrichment("safety_rating"), Dynamic, stores)
      val idx = BenchUtil.run(spark, n, 6720, SqlEnrichment("nearby_monuments"), Dynamic, stores)
      BenchUtil.row(sc, hash.throughputRecSec, idx.throughputRecSec)
      (hash.throughputRecSec, idx.throughputRecSec)
    }
    // Bigger references cannot make a fixed-resource pipeline faster
    // (generous noise bound).
    assert(rows.last._1 < rows.head._1 * 1.3)
  }
}
