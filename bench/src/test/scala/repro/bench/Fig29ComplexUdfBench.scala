package repro.bench

import scala.collection.mutable

import repro.SparkSpec
import repro.core._

/** Figure 29 — UDF complexity comparison: the three §7.4.2 complex use
  * cases (Suspicious Names, Tweet Context, Worrisome Tweets) against Nearby
  * Monuments, across batch sizes (paper: 100 K tweets, 6 nodes). The paper
  * observes that Tweet Context benefits most from larger batches (its
  * ref×ref join cost amortizes) while the sequential-join cases improve
  * little.
  */
class Fig29ComplexUdfBench extends SparkSpec {

  private val n = 2520
  private val rows = mutable.ArrayBuffer.empty[(String, String, Double)]

  for (udf <- BenchUtil.complexUdfs) {
    test(s"Fig 29: $udf across batch sizes") {
      val stores = RefStoreSet.create(spark)
      // Unmeasured warm-up so the 1X config doesn't pay JIT/codegen.
      BenchUtil.run(spark, n / 4, 840, SqlEnrichment(udf), Dynamic, stores)
      for (b <- BenchUtil.batchSizes) {
        val r = BenchUtil.run(spark, n, b, SqlEnrichment(udf), Dynamic, stores)
        rows += ((udf, BenchUtil.batchLabel(b), r.throughputRecSec))
        assert(r.records == n)
      }
    }
  }

  test("Fig 29: print table and check shapes") {
    BenchUtil.banner(s"Fig 29 (local): complex-UDF throughput (rec/s), $n tweets")
    BenchUtil.row("udf", "1X", "4X", "16X")
    for (udf <- BenchUtil.complexUdfs) {
      val t = BenchUtil.batchSizes.map(b =>
        rows.find(r => r._1 == udf && r._2 == BenchUtil.batchLabel(b)).get._3)
      BenchUtil.row(udf, t(0), t(1), t(2))
    }
    // Tweet Context pays a large per-batch ref-join cost: bigger batches
    // must help it substantially (paper's headline observation).
    val tc = BenchUtil.batchSizes.map(b =>
      rows.find(r => r._1 == "tweet_context" && r._2 == BenchUtil.batchLabel(b)).get._3)
    assert(tc(2) > tc(0) * 1.5, s"tweet_context should gain from batching: $tc")
  }
}
