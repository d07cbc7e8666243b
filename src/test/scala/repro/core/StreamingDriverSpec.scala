package repro.core

import repro.{SparkSpec, TestRefs}
import repro.data.{SafetyRating, TweetData}

/** The Structured Streaming (`foreachBatch`) face of the framework must
  * match the explicit three-job pipeline.
  */
class StreamingDriverSpec extends SparkSpec {

  test("streaming ingestion stores every record") {
    val sink = StreamingDriver.run(spark, TweetData.localTweets(80), 20,
      NoEnrichment, Dynamic, TestRefs.small(spark))
    assert(sink.count == 80)
  }

  test("streaming enrichment equals the explicit framework on frozen references") {
    val tweets = TweetData.localTweets(90)
    val a = StreamingDriver.run(spark, tweets, 30, SqlEnrichment("safety_rating"),
      Dynamic, TestRefs.small(spark))
      .toDf(spark).select("id", "safety_rating").orderBy("id").collect().map(_.toString).toSeq
    val b = IngestionFramework.run(spark, tweets, 30, SqlEnrichment("safety_rating"),
      Dynamic, TestRefs.small(spark))
      .sink.toDf(spark).select("id", "safety_rating").orderBy("id").collect().map(_.toString).toSeq
    assert(a == b)
  }

  test("foreachBatch DYNAMIC sees upserts between micro-batches") {
    val tweets = TweetData.localTweets(90)
    val stores = TestRefs.small(spark)
    val sink = StreamingDriver.run(spark, tweets, 30, SqlEnrichment("safety_rating"), Dynamic, stores,
      onBatchDone = n => if (n == 1)
        stores.safetyRatings.upsertProducts(TweetData.countries.map(SafetyRating(_, "STREAMED"))))
    val byId = sink.toDf(spark).select("id", "safety_rating").collect()
      .map(r => r.getLong(0) -> r.getString(1)).toMap
    assert((0L until 30L).forall(id => byId(id) != "STREAMED"))
    assert((30L until 90L).forall(id => byId(id) == "STREAMED"))
  }

  test("foreachBatch STATIC stays stale") {
    val tweets = TweetData.localTweets(60)
    val stores = TestRefs.small(spark)
    val sink = StreamingDriver.run(spark, tweets, 30, SqlEnrichment("safety_rating"), Static, stores,
      onBatchDone = n => if (n == 1)
        stores.safetyRatings.upsertProducts(TweetData.countries.map(SafetyRating(_, "STREAMED"))))
    assert(sink.toDf(spark).select("safety_rating").collect().forall(_.getString(0) != "STREAMED"))
  }

  test("streaming Java enrichment works and respects Dynamic mode") {
    val tweets = TweetData.localTweets(60)
    val stores = TestRefs.small(spark)
    val sink = StreamingDriver.run(spark, tweets, 20, JavaEnrichment("safety_rating"), Dynamic, stores,
      onBatchDone = n => if (n == 1)
        stores.safetyRatings.upsertProducts(TweetData.countries.map(SafetyRating(_, "JSTREAM"))))
    val byId = sink.toDf(spark).select("id", "safety_rating").collect()
      .map(r => r.getLong(0) -> r.getString(1)).toMap
    assert((20L until 60L).forall(id => byId(id) == "JSTREAM"))
  }
}
