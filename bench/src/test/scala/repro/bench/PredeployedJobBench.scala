package repro.bench

import repro.SparkSpec
import repro.core._
import repro.data.TweetData

/** §5.1 — predeployed (compile-once) vs ad-hoc (re-parse per invocation)
  * computing jobs: the per-invocation overhead the predeployed-job
  * technique removes.
  */
class PredeployedJobBench extends SparkSpec {

  test("predeployed vs ad-hoc invocation cost over 40 batches") {
    val stores = RefStoreSet.create(spark)
    val batches = (0 until 40).map(i => TweetData.tweets(spark, 420, seed = i))

    def timeAll(job: PredeployedJob.ComputingJob): Double = {
      val t0 = System.nanoTime()
      batches.foreach(b => job.invoke(b).collect())
      (System.nanoTime() - t0) / 1e6 / batches.size
    }

    // Warm both paths once so JIT/codegen caches don't bias the comparison.
    PredeployedJob.predeployed(Enrichments.safetyRating, () => stores.snapshot)
      .invoke(batches.head).collect()
    PredeployedJob.adhoc(spark, "safety_rating", () => stores.snapshot)
      .invoke(batches.head).collect()

    val adhocMs = timeAll(PredeployedJob.adhoc(spark, "safety_rating", () => stores.snapshot))
    val preMs = timeAll(PredeployedJob.predeployed(Enrichments.safetyRating, () => stores.snapshot))

    BenchUtil.banner("Predeployed vs ad-hoc computing jobs (ms per invocation, 420-record batches)")
    BenchUtil.row("path", "ms/invocation")
    BenchUtil.row("predeployed", preMs)
    BenchUtil.row("ad-hoc (re-parse SQL)", adhocMs)
    println(f"per-invocation overhead removed: ${adhocMs - preMs}%.1f ms")

    // The predeployed path must not be slower beyond noise.
    assert(preMs < adhocMs * 1.25, s"predeployed=$preMs adhoc=$adhocMs")
  }
}
