package repro.core

import java.sql.Timestamp

import org.apache.spark.sql.DataFrame

import repro.{SparkSpec, TestRefs}
import repro.data._

/** Semantics of each enrichment on hand-built mini datasets with known
  * expected outputs (the DuckDB oracle spec provides independent full-query
  * validation; this spec pins the business rules).
  */
class EnrichmentsBehaviorSpec extends SparkSpec {

  private lazy val baseRefs: Refs = TestRefs.small(spark).snapshot

  private def tweet(id: Long, text: String = "hello world", country: String = "US",
                    lat: Double = 50, lon: Double = 50,
                    at: String = "2019-05-15 12:00:00", user: String = "name0001",
                    screen: String = "@name0001!"): Tweet =
    Tweet(id, text, country, lat, lon, Timestamp.valueOf(at), user, screen)

  private def df(ts: Tweet*): DataFrame = spark.createDataFrame(ts)

  private def enrichedValue(out: DataFrame, id: Long, column: String): Any = {
    val rows = out.where(s"id = $id").select(column).collect()
    assert(rows.length == 1, s"expected exactly one output row for id=$id")
    rows.head.get(0)
  }

  // --- UDF 1: usTweetSafetyCheck -----------------------------------------

  test("UDF1: US tweet containing 'bomb' is Red") {
    val out = Enrichments.usTweetSafetyCheck(df(tweet(1, text = "a bomb here")))
    assert(enrichedValue(out, 1, "safety_check_flag") == "Red")
  }

  test("UDF1: US tweet without 'bomb' is Green") {
    val out = Enrichments.usTweetSafetyCheck(df(tweet(1, text = "peaceful")))
    assert(enrichedValue(out, 1, "safety_check_flag") == "Green")
  }

  test("UDF1: non-US tweet containing 'bomb' is Green") {
    val out = Enrichments.usTweetSafetyCheck(df(tweet(1, text = "a bomb", country = "C001")))
    assert(enrichedValue(out, 1, "safety_check_flag") == "Green")
  }

  // --- UDF 2: tweetSafetyCheck -------------------------------------------

  private def wordsRefs(words: (String, String, String)*): Refs = {
    import spark.implicits._
    baseRefs.copy(sensitiveWords = words.map(w => SensitiveWord(w._1, w._2, w._3)).toDF())
  }

  test("UDF2: flag depends on the country's own keywords") {
    val refs = wordsRefs(("sw1", "US", "bomb"), ("sw2", "C001", "riot"))
    val out = Enrichments.tweetSafetyCheck(df(
      tweet(1, text = "a bomb here", country = "US"),
      tweet(2, text = "a riot here", country = "US"),
      tweet(3, text = "a riot here", country = "C001"),
      tweet(4, text = "calm", country = "C001")), refs)
    assert(enrichedValue(out, 1, "safety_check_flag") == "Red")
    assert(enrichedValue(out, 2, "safety_check_flag") == "Green") // riot not a US keyword
    assert(enrichedValue(out, 3, "safety_check_flag") == "Red")
    assert(enrichedValue(out, 4, "safety_check_flag") == "Green")
  }

  test("UDF2: multiple matching keywords still yield one output row") {
    val refs = wordsRefs(("sw1", "US", "bomb"), ("sw2", "US", "riot"))
    val out = Enrichments.tweetSafetyCheck(df(tweet(1, text = "bomb riot")), refs)
    assert(out.count() == 1)
    assert(enrichedValue(out, 1, "safety_check_flag") == "Red")
  }

  test("UDF2: keyword matching is substring containment") {
    val refs = wordsRefs(("sw1", "US", "bomb"))
    val out = Enrichments.tweetSafetyCheck(df(tweet(1, text = "bombastic rhetoric")), refs)
    assert(enrichedValue(out, 1, "safety_check_flag") == "Red")
  }

  // --- highRiskTweetCheck -------------------------------------------------

  test("highRisk: only top-10 keyword countries are Red") {
    // Countries C001..C012 with descending keyword counts 12..1.
    val words = for {
      c <- 1 to 12
      k <- 1 to (13 - c)
    } yield (f"sw$c%02d$k%02d", f"C$c%03d", "bomb")
    val refs = wordsRefs(words: _*)
    val out = Enrichments.highRiskTweetCheck(df(
      tweet(1, country = "C001"), tweet(2, country = "C010"),
      tweet(3, country = "C011"), tweet(4, country = "C012")), refs)
    assert(enrichedValue(out, 1, "high_risk_flag") == "Red")
    assert(enrichedValue(out, 2, "high_risk_flag") == "Red")
    assert(enrichedValue(out, 3, "high_risk_flag") == "Green")
    assert(enrichedValue(out, 4, "high_risk_flag") == "Green")
  }

  test("highRisk: ties at the cut are broken by country code") {
    // 11 countries, all with exactly one keyword: top-10 = first 10 by code.
    val words = (1 to 11).map(c => (f"sw$c%02d", f"C$c%03d", "bomb"))
    val refs = wordsRefs(words: _*)
    val out = Enrichments.highRiskTweetCheck(df(
      tweet(1, country = "C010"), tweet(2, country = "C011")), refs)
    assert(enrichedValue(out, 1, "high_risk_flag") == "Red")
    assert(enrichedValue(out, 2, "high_risk_flag") == "Green")
  }

  // --- Q1: safetyRating ---------------------------------------------------

  test("Q1: joins the country's rating; unknown country gets null") {
    import spark.implicits._
    val refs = baseRefs.copy(safetyRatings = Seq(SafetyRating("US", "A")).toDF())
    val out = Enrichments.safetyRating(df(tweet(1, country = "US"), tweet(2, country = "C001")), refs)
    assert(enrichedValue(out, 1, "safety_rating") == "A")
    assert(enrichedValue(out, 2, "safety_rating") == null)
    assert(!out.columns.contains("country_code"))
  }

  // --- Q2: religiousPopulation -------------------------------------------

  test("Q2: sums populations per country") {
    import spark.implicits._
    val refs = baseRefs.copy(religiousPopulations = Seq(
      ReligiousPopulation("r1", "US", "alpha", 100),
      ReligiousPopulation("r2", "US", "beta", 250),
      ReligiousPopulation("r3", "C001", "alpha", 7)).toDF())
    val out = Enrichments.religiousPopulation(df(tweet(1, country = "US"), tweet(2, country = "C002")), refs)
    assert(enrichedValue(out, 1, "religious_population") == 350L)
    assert(enrichedValue(out, 2, "religious_population") == null)
  }

  // --- Q3: largestReligions ----------------------------------------------

  test("Q3: top-3 religions ordered by population desc") {
    import spark.implicits._
    val refs = baseRefs.copy(religiousPopulations = Seq(
      ReligiousPopulation("r1", "US", "alpha", 10),
      ReligiousPopulation("r2", "US", "beta", 40),
      ReligiousPopulation("r3", "US", "gamma", 30),
      ReligiousPopulation("r4", "US", "delta", 20)).toDF())
    val out = Enrichments.largestReligions(df(tweet(1, country = "US")), refs)
    assert(enrichedValue(out, 1, "largest_religions") == "beta,gamma,delta")
  }

  test("Q3: population ties broken by religion name; missing country yields empty string") {
    import spark.implicits._
    val refs = baseRefs.copy(religiousPopulations = Seq(
      ReligiousPopulation("r1", "US", "zeta", 10),
      ReligiousPopulation("r2", "US", "alpha", 10)).toDF())
    val out = Enrichments.largestReligions(df(tweet(1, country = "US"), tweet(2, country = "C001")), refs)
    assert(enrichedValue(out, 1, "largest_religions") == "alpha,zeta")
    assert(enrichedValue(out, 2, "largest_religions") == "")
  }

  // --- Q4: fuzzySuspects --------------------------------------------------

  test("Q4: matches suspects within edit distance < 5 of cleaned screen name") {
    import spark.implicits._
    val refs = baseRefs.copy(suspects = Seq(
      SuspectName("s1", "name0001", "alpha", 3),   // distance 0 after cleaning
      SuspectName("s2", "name0999", "beta", 2),    // distance 3
      SuspectName("s3", "zzzzzzzzzzzz", "gamma", 1)).toDF()) // far
    val out = Enrichments.fuzzySuspects(df(tweet(1, screen = "@name0001!")), refs)
    assert(enrichedValue(out, 1, "related_suspects") == "name0001:alpha,name0999:beta")
  }

  test("Q4: no match yields empty string") {
    import spark.implicits._
    val refs = baseRefs.copy(suspects = Seq(SuspectName("s1", "qqqqqqqqqqqq", "alpha", 3)).toDF())
    val out = Enrichments.fuzzySuspects(df(tweet(1, screen = "@name0001!")), refs)
    assert(enrichedValue(out, 1, "related_suspects") == "")
  }

  // --- Q5: nearbyMonuments ------------------------------------------------

  test("Q5: monuments within 1.5 degrees, sorted by id; far ones excluded") {
    import spark.implicits._
    val refs = baseRefs.copy(monuments = Seq(
      Monument("m2", 50.0, 51.0),   // dist 1.0
      Monument("m1", 51.0, 50.0),   // dist 1.0
      Monument("m3", 52.0, 50.0),   // dist 2.0 — out
      Monument("m4", 50.9, 50.9)).toDF()) // dist ~1.27
    val out = Enrichments.nearbyMonuments(df(tweet(1, lat = 50, lon = 50)), refs)
    assert(enrichedValue(out, 1, "nearby_monuments") == "m1,m2,m4")
  }

  test("Q5: indexed and naive variants agree") {
    val tweets = TweetData.tweets(spark, 150)
    val idx = Enrichments.nearbyMonuments(tweets, baseRefs, indexed = true)
      .select("id", "nearby_monuments").collect().map(r => r.getLong(0) -> r.getString(1)).toMap
    val naive = Enrichments.nearbyMonuments(tweets, baseRefs, indexed = false)
      .select("id", "nearby_monuments").collect().map(r => r.getLong(0) -> r.getString(1)).toMap
    assert(idx == naive)
    assert(idx.values.exists(_.nonEmpty), "degenerate test: nobody near a monument")
  }

  // --- Q6: suspiciousNames ------------------------------------------------

  test("Q6: facility counts by type, 3 closest buildings, and name matches") {
    import spark.implicits._
    val refs = baseRefs.copy(
      facilities = Seq(
        Facility("f1", 50.5, 50.0, "school"),
        Facility("f2", 50.0, 50.5, "school"),
        Facility("f3", 51.0, 51.0, "mall"),
        Facility("f4", 90.0, 90.0, "school")).toDF(), // far
      religiousBuildings = Seq(
        ReligiousBuilding("b1", "alpha", 50.0, 50.5, 10),  // dist 0.5
        ReligiousBuilding("b2", "beta", 50.0, 51.0, 10),   // dist 1.0
        ReligiousBuilding("b3", "gamma", 51.5, 50.0, 10),  // dist 1.5
        ReligiousBuilding("b4", "delta", 52.0, 50.0, 10),  // dist 2.0 — 4th closest
        ReligiousBuilding("b5", "zeta", 90.0, 90.0, 10)).toDF(), // out of range
      sensitiveNames = Seq(
        SuspectName("s1", "name0001", "alpha", 4),
        SuspectName("s2", "other", "beta", 1)).toDF())
    val out = Enrichments.suspiciousNames(df(tweet(1, lat = 50, lon = 50, user = "name0001")), refs)
    assert(enrichedValue(out, 1, "nearby_facilities") == "mall:1,school:2")
    assert(enrichedValue(out, 1, "nearby_religious_buildings") == "b1:alpha,b2:beta,b3:gamma")
    assert(enrichedValue(out, 1, "suspicious_users_info") == "s1:alpha:4")
  }

  test("Q6: empty neighborhoods yield empty strings") {
    import spark.implicits._
    val refs = baseRefs.copy(
      facilities = Seq(Facility("f1", 90.0, 90.0, "school")).toDF(),
      religiousBuildings = Seq(ReligiousBuilding("b1", "alpha", 90.0, 90.0, 10)).toDF(),
      sensitiveNames = Seq(SuspectName("s1", "other", "beta", 1)).toDF())
    val out = Enrichments.suspiciousNames(df(tweet(1, lat = 10, lon = 10, user = "name0001")), refs)
    assert(enrichedValue(out, 1, "nearby_facilities") == "")
    assert(enrichedValue(out, 1, "nearby_religious_buildings") == "")
    assert(enrichedValue(out, 1, "suspicious_users_info") == "")
  }

  // --- Q7: tweetContext ---------------------------------------------------

  test("Q7: district income, facility counts, and ethnicity distribution") {
    import spark.implicits._
    // 4 districts tiling the world in a 2x2 grid; tweet in district d00000
    // ([0,50) x [0,50)).
    val dists = TweetData.localDistricts(4)
    val refs = baseRefs.copy(
      districts = dists.toDF(),
      averageIncomes = Seq(
        AverageIncome("d00000", 1111.0), AverageIncome("d00001", 2222.0),
        AverageIncome("d00002", 3333.0), AverageIncome("d00003", 4444.0)).toDF(),
      facilities = Seq(
        Facility("f1", 10.0, 10.0, "school"),
        Facility("f2", 20.0, 20.0, "school"),
        Facility("f3", 30.0, 30.0, "mall"),
        Facility("f4", 80.0, 80.0, "mall")).toDF(), // other district
      residents = Seq(
        Resident("p1", "eth_a", 5.0, 5.0),
        Resident("p2", "eth_a", 6.0, 6.0),
        Resident("p3", "eth_b", 7.0, 7.0),
        Resident("p4", "eth_b", 80.0, 80.0)).toDF()) // other district
    val out = Enrichments.tweetContext(df(tweet(1, lat = 25, lon = 25)), refs)
    assert(enrichedValue(out, 1, "area_avg_income") == 1111.0)
    assert(enrichedValue(out, 1, "area_facilities") == "mall:1,school:2")
    assert(enrichedValue(out, 1, "ethnicity_dist") == "eth_a:2,eth_b:1")
  }

  test("Q7: every generated tweet lands in exactly one district (no row blowup)") {
    val tweets = TweetData.tweets(spark, 200)
    val out = Enrichments.tweetContext(tweets, baseRefs)
    assert(out.count() == 200)
    assert(out.where("area_avg_income IS NULL").count() == 0)
  }

  // --- Q8: worrisomeTweets ------------------------------------------------

  test("Q8: counts attacks on nearby religions within the prior two months") {
    import spark.implicits._
    val refs = baseRefs.copy(
      religiousBuildings = Seq(
        ReligiousBuilding("b1", "alpha", 50.0, 51.0, 10),
        ReligiousBuilding("b2", "beta", 90.0, 90.0, 10)).toDF(), // far
      attackEvents = Seq(
        AttackEvent("a1", Timestamp.valueOf("2019-04-20 00:00:00"), 1, 1, "alpha"), // within 2 months
        AttackEvent("a2", Timestamp.valueOf("2019-02-20 00:00:00"), 1, 1, "alpha"), // too old
        AttackEvent("a3", Timestamp.valueOf("2019-05-20 00:00:00"), 1, 1, "alpha"), // after the tweet
        AttackEvent("a4", Timestamp.valueOf("2019-05-01 00:00:00"), 1, 1, "beta")).toDF()) // religion not nearby
    val out = Enrichments.worrisomeTweets(df(tweet(1, lat = 50, lon = 50, at = "2019-05-15 12:00:00")), refs)
    assert(enrichedValue(out, 1, "nearby_religious_attacks") == "alpha:1")
  }

  test("Q8: duplicate nearby buildings of one religion multiply the count (paper SQL++ semantics)") {
    import spark.implicits._
    val refs = baseRefs.copy(
      religiousBuildings = Seq(
        ReligiousBuilding("b1", "alpha", 50.0, 51.0, 10),
        ReligiousBuilding("b2", "alpha", 51.0, 50.0, 10)).toDF(),
      attackEvents = Seq(
        AttackEvent("a1", Timestamp.valueOf("2019-04-20 00:00:00"), 1, 1, "alpha")).toDF())
    val out = Enrichments.worrisomeTweets(df(tweet(1, lat = 50, lon = 50)), refs)
    assert(enrichedValue(out, 1, "nearby_religious_attacks") == "alpha:2")
  }

  test("Q8: no nearby buildings yields empty string") {
    import spark.implicits._
    val refs = baseRefs.copy(
      religiousBuildings = Seq(ReligiousBuilding("b1", "alpha", 90.0, 90.0, 10)).toDF())
    val out = Enrichments.worrisomeTweets(df(tweet(1, lat = 10, lon = 10)), refs)
    assert(enrichedValue(out, 1, "nearby_religious_attacks") == "")
  }

  // --- structural properties over all enrichments -------------------------

  for ((name, f) <- Enrichments.byName.toSeq.sortBy(_._1)) {
    test(s"enrichment '$name' preserves row count and tweet columns") {
      val tweets = TweetData.tweets(spark, 120)
      val out = f(tweets, baseRefs)
      assert(out.count() == 120)
      tweets.columns.foreach(c => assert(out.columns.contains(c), s"lost column $c"))
      assert(out.columns.length > tweets.columns.length, "no enrichment column added")
    }

    test(s"enrichment '$name' is deterministic") {
      val tweets = TweetData.tweets(spark, 60)
      val a = f(tweets, baseRefs).orderBy("id").collect().map(_.toString).toSeq
      val b = f(tweets, baseRefs).orderBy("id").collect().map(_.toString).toSeq
      assert(a == b)
    }
  }
}
