package repro.query

import repro.core.{AggFunc, QueryConfig}

/** A tumbling-window or duration interval from the Figure 2 syntax.
  * `unit` is either record-based (RECORDS / FRAMES / TWEETS) or
  * time-based (SECONDS / MINUTES / HOURS); time-based intervals convert
  * to record counts given a stream rate.
  */
final case class Interval(value: Long, unit: String) {
  require(value > 0, s"interval must be positive, got $value")

  def isRecordBased: Boolean = Interval.RecordUnits.contains(unit)

  /** Number of stream records this interval spans. `recordsPerSecond`
    * is required only for time-based units (e.g. 30 fps video).
    */
  def toRecords(recordsPerSecond: Double = Double.NaN): Long =
    unit match {
      case u if Interval.RecordUnits.contains(u) => value
      case "SECOND" | "SECONDS" => time(1, recordsPerSecond)
      case "MINUTE" | "MINUTES" => time(60, recordsPerSecond)
      case "HOUR" | "HOURS"     => time(3600, recordsPerSecond)
      case other => throw new IllegalArgumentException(s"unknown interval unit '$other'")
    }

  private def time(secondsPerUnit: Long, rps: Double): Long = {
    require(!rps.isNaN && rps > 0,
      s"time-based interval '$value $unit' needs a records-per-second rate")
    math.round(value * secondsPerUnit * rps)
  }
}

object Interval {
  val RecordUnits: Set[String] = Set("RECORD", "RECORDS", "FRAME", "FRAMES", "TWEET", "TWEETS")
}

/** Parsed form of an InQuest query (paper Figure 2). */
final case class ParsedQuery(
    agg: AggFunc,
    statistic: String,
    dataset: String,
    predicate: Option[String],
    windowColumn: String,
    window: Interval,
    oracleLimit: Int,
    duration: Option[Interval],
    proxy: String,
) {
  /** Compile to the engine configuration. */
  def toQueryConfig(recordsPerSecond: Double = Double.NaN): QueryConfig =
    QueryConfig(
      agg = agg,
      usePredicate = predicate.isDefined,
      segmentLength = window.toRecords(recordsPerSecond).toInt,
      budgetPerSegment = oracleLimit,
    )
}

/** Recursive-regex-free parser for the Flink-SQL-like InQuest syntax:
  *
  * {{{
  * SELECT AGG(expr) FROM dataset
  * [WHERE predicate]
  * TUMBLE(column, INTERVAL 'n' UNIT)
  * ORACLE LIMIT n
  * [DURATION INTERVAL 'n' UNIT]
  * USING proxy
  * }}}
  *
  * Numbers may contain thousands-separator commas and be quoted, exactly
  * as in the paper's examples (`INTERVAL '108,000' FRAMES`,
  * `ORACLE LIMIT 1,000`).
  */
object QueryParser {

  // The paper's examples place WHERE either between FROM and TUMBLE
  // (Figure 2) or between TUMBLE and ORACLE LIMIT (§2.3); accept both.
  private val QueryRe =
    ("""(?is)\s*SELECT\s+(AVG|SUM|COUNT)\s*\((.+?)\)\s+FROM\s+(\w+)""" +
      """(?:\s+WHERE\s+(.+?))?""" +
      """\s+TUMBLE\s*\(\s*(\w+)\s*,\s*INTERVAL\s+'?([\d,]+)'?\s+(\w+)\s*\)""" +
      """(?:\s+WHERE\s+(.+?))?""" +
      """\s+ORACLE\s+LIMIT\s+'?([\d,]+)'?""" +
      """(?:\s+DURATION\s+INTERVAL\s+'?([\d,]+)'?\s+(\w+))?""" +
      """\s+USING\s+(\S+)\s*;?\s*""").r

  private def num(s: String): Long = s.replace(",", "").toLong

  def parse(sql: String): ParsedQuery = sql match {
    case QueryRe(agg, expr, dataset, where1, winCol, winVal, winUnit, where2,
                 limit, durVal, durUnit, proxy) =>
      val where = Option(where1).orElse(Option(where2))
      ParsedQuery(
        agg = agg.toUpperCase match {
          case "AVG" => AggFunc.Avg
          case "SUM" => AggFunc.Sum
          case "COUNT" => AggFunc.Count
        },
        statistic = expr.trim,
        dataset = dataset,
        predicate = where.map(_.trim).filter(_.nonEmpty),
        windowColumn = winCol,
        window = Interval(num(winVal), winUnit.toUpperCase),
        oracleLimit = {
          val n = num(limit)
          require(n > 0 && n <= Int.MaxValue, s"oracle limit out of range: $n")
          n.toInt
        },
        duration = Option(durVal).map(v => Interval(num(v), durUnit.toUpperCase)),
        proxy = proxy.trim,
      )
    case _ =>
      throw new IllegalArgumentException(
        s"cannot parse InQuest query (expected Figure 2 syntax):\n$sql")
  }
}
