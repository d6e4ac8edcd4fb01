package repro.query

import org.scalatest.funsuite.AnyFunSuite
import repro.core.AggFunc

class QueryParserSpec extends AnyFunSuite {

  private val trafficQuery =
    """SELECT AVG(count(car)) FROM video
      |TUMBLE(frame_idx, INTERVAL '108,000' FRAMES)
      |ORACLE LIMIT 1,000
      |USING proxy_count_cars(frame)""".stripMargin

  private val twitterQuery =
    """SELECT COUNT(positive(tweet)) FROM twitter
      |TUMBLE(tweet_timestamp, INTERVAL '30' MINUTES)
      |WHERE mentions_candidate(tweet)
      |ORACLE LIMIT 5,000
      |DURATION INTERVAL '4' HOURS
      |USING proxy_mentions_candidate_pos(tweet)""".stripMargin

  test("parses the paper's traffic-analysis example") {
    val q = QueryParser.parse(trafficQuery)
    assert(q.agg == AggFunc.Avg)
    assert(q.statistic == "count(car)")
    assert(q.dataset == "video")
    assert(q.predicate.isEmpty)
    assert(q.windowColumn == "frame_idx")
    assert(q.window == Interval(108000, "FRAMES"))
    assert(q.oracleLimit == 1000)
    assert(q.duration.isEmpty)
    assert(q.proxy == "proxy_count_cars(frame)")
  }

  test("parses the paper's Twitter-sentiment example (WHERE before TUMBLE)") {
    // Figure 2 allows the predicate between FROM and TUMBLE
    val q = QueryParser.parse(
      """SELECT COUNT(positive(tweet)) FROM twitter
        |WHERE mentions_candidate(tweet)
        |TUMBLE(tweet_timestamp, INTERVAL '30' MINUTES)
        |ORACLE LIMIT 5,000
        |DURATION INTERVAL '4' HOURS
        |USING proxy_mentions_candidate_pos(tweet)""".stripMargin)
    assert(q.agg == AggFunc.Count)
    assert(q.predicate.contains("mentions_candidate(tweet)"))
    assert(q.window == Interval(30, "MINUTES"))
    assert(q.oracleLimit == 5000)
    assert(q.duration.contains(Interval(4, "HOURS")))
  }

  test("parses SUM aggregation and RECORDS unit") {
    val q = QueryParser.parse(
      "SELECT SUM(sentiment(t)) FROM s TUMBLE(idx, INTERVAL 100000 RECORDS) ORACLE LIMIT 500 USING p")
    assert(q.agg == AggFunc.Sum)
    assert(q.window == Interval(100000, "RECORDS"))
  }

  test("is case-insensitive on keywords") {
    val q = QueryParser.parse(
      "select avg(f(x)) from d tumble(idx, interval '10' frames) oracle limit 5 using p")
    assert(q.agg == AggFunc.Avg && q.oracleLimit == 5)
  }

  test("numbers may carry thousands separators everywhere") {
    val q = QueryParser.parse(
      "SELECT AVG(f(x)) FROM d TUMBLE(i, INTERVAL '1,000,000' RECORDS) ORACLE LIMIT 10,000 USING p")
    assert(q.window.value == 1000000L && q.oracleLimit == 10000)
  }

  test("toQueryConfig converts a record-based window directly") {
    val cfg = QueryParser.parse(trafficQuery).toQueryConfig()
    assert(cfg.segmentLength == 108000)
    assert(cfg.budgetPerSegment == 1000)
    assert(!cfg.usePredicate)
    assert(cfg.agg == AggFunc.Avg)
  }

  test("toQueryConfig converts time-based windows given a stream rate") {
    val q = QueryParser.parse(twitterQuery)
    // 30 minutes at 100 tweets/sec = 180,000 records
    assert(q.toQueryConfig(recordsPerSecond = 100).segmentLength == 180000)
    assert(q.toQueryConfig(recordsPerSecond = 100).usePredicate)
  }

  test("time-based interval without a rate is rejected") {
    val q = QueryParser.parse(twitterQuery)
    assertThrows[IllegalArgumentException](q.toQueryConfig())
  }

  test("Interval unit conversions") {
    assert(Interval(2, "HOURS").toRecords(30) == 216000)
    assert(Interval(90, "SECONDS").toRecords(2) == 180)
    assert(Interval(500, "TWEETS").toRecords() == 500)
    assert(Interval(500, "RECORDS").isRecordBased)
    assert(!Interval(1, "HOURS").isRecordBased)
  }

  test("unknown interval units are rejected at conversion") {
    assertThrows[IllegalArgumentException](Interval(5, "FORTNIGHTS").toRecords(1.0))
  }

  test("non-positive intervals are rejected") {
    assertThrows[IllegalArgumentException](Interval(0, "RECORDS"))
  }

  test("malformed queries are rejected with a helpful error") {
    val e = intercept[IllegalArgumentException](QueryParser.parse("SELECT * FROM x"))
    assert(e.getMessage.contains("Figure 2"))
  }

  test("missing ORACLE LIMIT is rejected") {
    assertThrows[IllegalArgumentException](QueryParser.parse(
      "SELECT AVG(f(x)) FROM d TUMBLE(i, INTERVAL '10' RECORDS) USING p"))
  }

  test("oracle limit of zero is rejected") {
    assertThrows[IllegalArgumentException](QueryParser.parse(
      "SELECT AVG(f(x)) FROM d TUMBLE(i, INTERVAL '10' RECORDS) ORACLE LIMIT 0 USING p"))
  }

  test("trailing semicolons and extra whitespace are tolerated") {
    val q = QueryParser.parse(
      "  SELECT AVG( f(x) )  FROM  d   TUMBLE(i, INTERVAL '10' RECORDS) ORACLE LIMIT 5 USING p ;  ")
    assert(q.statistic == "f(x)")
  }
}
