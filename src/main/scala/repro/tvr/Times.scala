package repro.tvr

import java.sql.Timestamp

/** Time helpers shared by the whole reproduction.
  *
  * Internally every instant (processing time, event time, watermark value)
  * is a `Long` of epoch milliseconds in UTC. Event-time *columns* in
  * DataFrames are `TimestampType`; these helpers convert between the two
  * and render the paper's `H:MM` clock notation (the Section 4 example
  * lives on 1970-01-01, so "8:07" is just 8h07m past the epoch).
  */
object Times {
  val MinuteMs: Long = 60L * 1000
  val HourMs: Long   = 60 * MinuteMs
  val DayMs: Long    = 24 * HourMs

  /** Parse `"8:07"` (or `"14:30"`) to epoch millis on day zero. */
  def hm(s: String): Long = {
    val parts = s.split(":")
    require(parts.length == 2, s"expected H:MM, got '$s'")
    parts(0).trim.toLong * HourMs + parts(1).trim.toLong * MinuteMs
  }

  /** Render epoch millis as the paper's `H:MM` clock notation. */
  def fmt(ms: Long): String = {
    val totalMin = ms / MinuteMs
    f"${totalMin / 60}%d:${totalMin % 60}%02d"
  }

  /** Epoch millis -> java.sql.Timestamp (UTC session zone assumed). */
  def ts(ms: Long): Timestamp = new Timestamp(ms)

  /** java.sql.Timestamp -> epoch millis. */
  def ms(t: Timestamp): Long = t.getTime
}
