package repro.core

import org.apache.spark.sql.DataFrame

import repro.{Oracle, SparkSpec, TestRefs}
import repro.data.TweetData

/** Every enrichment validated against an independent DuckDB evaluation of
  * the same query over the same inputs (paper Appendix queries). Spark
  * outputs are projected to (id, enrichment columns); list-valued outputs
  * are deterministic concat strings on both sides.
  */
class EnrichmentsOracleSpec extends SparkSpec {

  private lazy val refs: Refs = TestRefs.small(spark).snapshot
  private lazy val tweets: DataFrame = TweetData.tweets(spark, 150)

  private val distTB =
    """sqrt(pow(CAST(t2.latitude AS DOUBLE) - CAST(b.building_x AS DOUBLE), 2) +
      |     pow(CAST(t2.longitude AS DOUBLE) - CAST(b.building_y AS DOUBLE), 2))""".stripMargin

  test("oracle: UDF1 usTweetSafetyCheck") {
    val out = Enrichments.usTweetSafetyCheck(tweets).select("id", "safety_check_flag")
    Oracle.assertEquivalent(out,
      """SELECT t.id AS id,
        |  CASE WHEN t.country = 'US' AND contains(t.text, 'bomb')
        |       THEN 'Red' ELSE 'Green' END AS safety_check_flag
        |FROM tweets t""".stripMargin,
      "tweets" -> tweets)
  }

  test("oracle: UDF2 tweetSafetyCheck") {
    val out = Enrichments.tweetSafetyCheck(tweets, refs).select("id", "safety_check_flag")
    Oracle.assertEquivalent(out,
      """SELECT t.id AS id,
        |  CASE WHEN EXISTS (SELECT 1 FROM words w
        |                    WHERE w.country = t.country AND contains(t.text, w.word))
        |       THEN 'Red' ELSE 'Green' END AS safety_check_flag
        |FROM tweets t""".stripMargin,
      "tweets" -> tweets, "words" -> refs.sensitiveWords)
  }

  test("oracle: highRiskTweetCheck (nested subquery of Figure 18)") {
    val out = Enrichments.highRiskTweetCheck(tweets, refs).select("id", "high_risk_flag")
    Oracle.assertEquivalent(out,
      """SELECT t.id AS id,
        |  CASE WHEN t.country IN (SELECT country FROM words
        |                          GROUP BY country
        |                          ORDER BY count(*) DESC, country LIMIT 10)
        |       THEN 'Red' ELSE 'Green' END AS high_risk_flag
        |FROM tweets t""".stripMargin,
      "tweets" -> tweets, "words" -> refs.sensitiveWords)
  }

  test("oracle: Q1 safetyRating") {
    val out = Enrichments.safetyRating(tweets, refs).select("id", "safety_rating")
    Oracle.assertEquivalent(out,
      """SELECT t.id AS id, s.safety_rating AS safety_rating
        |FROM tweets t LEFT JOIN ratings s ON t.country = s.country_code""".stripMargin,
      "tweets" -> tweets, "ratings" -> refs.safetyRatings)
  }

  test("oracle: Q2 religiousPopulation") {
    val out = Enrichments.religiousPopulation(tweets, refs).select("id", "religious_population")
    Oracle.assertEquivalent(out,
      """SELECT t.id AS id, p.religious_population AS religious_population
        |FROM tweets t LEFT JOIN (
        |  SELECT country_name, SUM(CAST(population AS BIGINT)) AS religious_population
        |  FROM pops GROUP BY country_name) p ON t.country = p.country_name""".stripMargin,
      "tweets" -> tweets, "pops" -> refs.religiousPopulations)
  }

  test("oracle: Q3 largestReligions") {
    val out = Enrichments.largestReligions(tweets, refs).select("id", "largest_religions")
    Oracle.assertEquivalent(out,
      """SELECT t.id AS id, COALESCE(lr.largest_religions, '') AS largest_religions
        |FROM tweets t LEFT JOIN (
        |  SELECT country_name,
        |         string_agg(religion_name, ',' ORDER BY rnk) AS largest_religions
        |  FROM (SELECT country_name, religion_name,
        |               row_number() OVER (PARTITION BY country_name
        |                 ORDER BY CAST(population AS BIGINT) DESC, religion_name) AS rnk
        |        FROM pops) x
        |  WHERE rnk <= 3 GROUP BY country_name) lr
        |ON t.country = lr.country_name""".stripMargin,
      "tweets" -> tweets, "pops" -> refs.religiousPopulations)
  }

  test("oracle: Q4 fuzzySuspects") {
    val out = Enrichments.fuzzySuspects(tweets, refs).select("id", "related_suspects")
    Oracle.assertEquivalent(out,
      """SELECT t.id AS id, COALESCE(m.related_suspects, '') AS related_suspects
        |FROM tweets t LEFT JOIN (
        |  SELECT t2.id AS id,
        |         string_agg(s.sensitive_name || ':' || s.religion_name, ','
        |           ORDER BY s.sensitive_name || ':' || s.religion_name) AS related_suspects
        |  FROM tweets t2, suspects s
        |  WHERE levenshtein(regexp_replace(t2.screen_name, '[^A-Za-z0-9]', '', 'g'),
        |                    s.sensitive_name) < 5
        |  GROUP BY t2.id) m ON m.id = t.id""".stripMargin,
      "tweets" -> tweets, "suspects" -> refs.suspects)
  }

  test("oracle: Q5 nearbyMonuments (indexed)") {
    val out = Enrichments.nearbyMonuments(tweets, refs, indexed = true).select("id", "nearby_monuments")
    Oracle.assertEquivalent(out, nearbyMonumentsSql, "tweets" -> tweets, "monuments" -> refs.monuments)
  }

  test("oracle: Q5 nearbyMonuments (naive)") {
    val out = Enrichments.nearbyMonuments(tweets, refs, indexed = false).select("id", "nearby_monuments")
    Oracle.assertEquivalent(out, nearbyMonumentsSql, "tweets" -> tweets, "monuments" -> refs.monuments)
  }

  private val nearbyMonumentsSql =
    """SELECT t.id AS id, COALESCE(m.nearby_monuments, '') AS nearby_monuments
      |FROM tweets t LEFT JOIN (
      |  SELECT t2.id AS id, string_agg(mm.monument_id, ',' ORDER BY mm.monument_id) AS nearby_monuments
      |  FROM tweets t2, monuments mm
      |  WHERE sqrt(pow(CAST(t2.latitude AS DOUBLE) - CAST(mm.monument_x AS DOUBLE), 2) +
      |             pow(CAST(t2.longitude AS DOUBLE) - CAST(mm.monument_y AS DOUBLE), 2)) <= 1.5
      |  GROUP BY t2.id) m ON m.id = t.id""".stripMargin

  test("oracle: Q6 suspiciousNames") {
    val out = Enrichments.suspiciousNames(tweets, refs)
      .select("id", "nearby_facilities", "nearby_religious_buildings", "suspicious_users_info")
    Oracle.assertEquivalent(out,
      s"""SELECT t.id AS id,
         |  COALESCE(fa.v, '') AS nearby_facilities,
         |  COALESCE(rb.v, '') AS nearby_religious_buildings,
         |  COALESCE(su.v, '') AS suspicious_users_info
         |FROM tweets t
         |LEFT JOIN (
         |  SELECT id, string_agg(s, ',' ORDER BY s) AS v FROM (
         |    SELECT t2.id AS id, f.facility_type || ':' || CAST(count(*) AS VARCHAR) AS s
         |    FROM tweets t2, facilities f
         |    WHERE sqrt(pow(CAST(t2.latitude AS DOUBLE) - CAST(f.facility_x AS DOUBLE), 2) +
         |               pow(CAST(t2.longitude AS DOUBLE) - CAST(f.facility_y AS DOUBLE), 2)) <= 3.0
         |    GROUP BY t2.id, f.facility_type) x
         |  GROUP BY id) fa ON fa.id = t.id
         |LEFT JOIN (
         |  SELECT id, string_agg(s, ',' ORDER BY rnk) AS v FROM (
         |    SELECT t2.id AS id,
         |           b.religious_building_id || ':' || b.religion_name AS s,
         |           row_number() OVER (PARTITION BY t2.id
         |             ORDER BY $distTB, b.religious_building_id) AS rnk
         |    FROM tweets t2, buildings b
         |    WHERE $distTB <= 3.0) x
         |  WHERE rnk <= 3 GROUP BY id) rb ON rb.id = t.id
         |LEFT JOIN (
         |  SELECT t2.id AS id,
         |         string_agg(s.suspect_id || ':' || s.religion_name || ':' || s.threat_level, ','
         |           ORDER BY s.suspect_id || ':' || s.religion_name || ':' || s.threat_level) AS v
         |  FROM tweets t2, names s
         |  WHERE s.sensitive_name = t2.user_name
         |  GROUP BY t2.id) su ON su.id = t.id""".stripMargin,
      "tweets" -> tweets, "facilities" -> refs.facilities,
      "buildings" -> refs.religiousBuildings, "names" -> refs.sensitiveNames)
  }

  test("oracle: Q7 tweetContext") {
    val out = Enrichments.tweetContext(tweets, refs)
      .select("id", "area_avg_income", "area_facilities", "ethnicity_dist")
    Oracle.assertEquivalent(out,
      """WITH td AS (
        |  SELECT t.id AS id, d.district_area_id AS did
        |  FROM tweets t JOIN districts d
        |    ON CAST(t.latitude AS DOUBLE) >= CAST(d.x_min AS DOUBLE)
        |   AND CAST(t.latitude AS DOUBLE) <  CAST(d.x_max AS DOUBLE)
        |   AND CAST(t.longitude AS DOUBLE) >= CAST(d.y_min AS DOUBLE)
        |   AND CAST(t.longitude AS DOUBLE) <  CAST(d.y_max AS DOUBLE)),
        |fd AS (
        |  SELECT did, string_agg(s, ',' ORDER BY s) AS v FROM (
        |    SELECT d.district_area_id AS did,
        |           f.facility_type || ':' || CAST(count(*) AS VARCHAR) AS s
        |    FROM facilities f JOIN districts d
        |      ON CAST(f.facility_x AS DOUBLE) >= CAST(d.x_min AS DOUBLE)
        |     AND CAST(f.facility_x AS DOUBLE) <  CAST(d.x_max AS DOUBLE)
        |     AND CAST(f.facility_y AS DOUBLE) >= CAST(d.y_min AS DOUBLE)
        |     AND CAST(f.facility_y AS DOUBLE) <  CAST(d.y_max AS DOUBLE)
        |    GROUP BY d.district_area_id, f.facility_type) x
        |  GROUP BY did),
        |ed AS (
        |  SELECT did, string_agg(s, ',' ORDER BY s) AS v FROM (
        |    SELECT d.district_area_id AS did,
        |           p.ethnicity || ':' || CAST(count(*) AS VARCHAR) AS s
        |    FROM residents p JOIN districts d
        |      ON CAST(p.x AS DOUBLE) >= CAST(d.x_min AS DOUBLE)
        |     AND CAST(p.x AS DOUBLE) <  CAST(d.x_max AS DOUBLE)
        |     AND CAST(p.y AS DOUBLE) >= CAST(d.y_min AS DOUBLE)
        |     AND CAST(p.y AS DOUBLE) <  CAST(d.y_max AS DOUBLE)
        |    GROUP BY d.district_area_id, p.ethnicity) x
        |  GROUP BY did)
        |SELECT t.id AS id,
        |  CAST(i.average_income AS DOUBLE) AS area_avg_income,
        |  COALESCE(fd.v, '') AS area_facilities,
        |  COALESCE(ed.v, '') AS ethnicity_dist
        |FROM tweets t
        |LEFT JOIN td ON td.id = t.id
        |LEFT JOIN incomes i ON i.district_area_id = td.did
        |LEFT JOIN fd ON fd.did = td.did
        |LEFT JOIN ed ON ed.did = td.did""".stripMargin,
      "tweets" -> tweets, "districts" -> refs.districts, "incomes" -> refs.averageIncomes,
      "facilities" -> refs.facilities, "residents" -> refs.residents)
  }

  test("oracle: Q8 worrisomeTweets") {
    val out = Enrichments.worrisomeTweets(tweets, refs).select("id", "nearby_religious_attacks")
    Oracle.assertEquivalent(out,
      s"""SELECT t.id AS id, COALESCE(g.v, '') AS nearby_religious_attacks
         |FROM tweets t LEFT JOIN (
         |  SELECT id, string_agg(s, ',' ORDER BY s) AS v FROM (
         |    SELECT t2.id AS id,
         |           b.religion_name || ':' || CAST(count(a.attack_record_id) AS VARCHAR) AS s
         |    FROM tweets t2, buildings b, attacks a
         |    WHERE $distTB <= 3.0
         |      AND b.religion_name = a.related_religion
         |      AND CAST(t2.created_at AS TIMESTAMP) > CAST(a.attack_datetime AS TIMESTAMP)
         |      AND CAST(t2.created_at AS TIMESTAMP) <
         |          CAST(a.attack_datetime AS TIMESTAMP) + INTERVAL 2 MONTH
         |    GROUP BY t2.id, b.religion_name) x
         |  GROUP BY id) g ON g.id = t.id""".stripMargin,
      "tweets" -> tweets, "buildings" -> refs.religiousBuildings, "attacks" -> refs.attackEvents)
  }
}
