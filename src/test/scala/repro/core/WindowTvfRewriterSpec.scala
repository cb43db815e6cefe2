package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.tvr.Times

class WindowTvfRewriterSpec extends AnyFunSuite {

  test("Tumble lowers to a projection with wstart/wend") {
    val r = WindowTvfRewriter.rewrite(
      "SELECT * FROM Tumble(data => TABLE(Bid), timecol => DESCRIPTOR(bidtime), " +
        "dur => INTERVAL '10' MINUTE)")
    assert(r.sql.contains("tumble_wstart(__src.bidtime, 600000L, 0L) AS wstart"))
    assert(r.sql.contains("tumble_wend(__src.bidtime, 600000L, 0L) AS wend"))
    assert(r.sql.contains("FROM Bid __src"))
    assert(!r.sql.toLowerCase.contains("tumble("))
    assert(r.windows == Seq(
      WindowTvfRewriter.AppliedWindow("tumble", "Bid", "bidtime", 10 * Times.MinuteMs, None, 0L)))
  }

  test("Tumble honors the optional offset") {
    val r = WindowTvfRewriter.rewrite(
      "SELECT * FROM Tumble(data => TABLE(T), timecol => DESCRIPTOR(ts), " +
        "dur => INTERVAL '1' HOUR, offset => INTERVAL '15' MINUTE)")
    assert(r.windows.head.offsetMs == 15 * Times.MinuteMs)
    assert(r.sql.contains(s"tumble_wstart(__src.ts, ${Times.HourMs}L, ${15 * Times.MinuteMs}L)"))
  }

  test("Hop lowers to a LATERAL VIEW explode over hop_wstarts") {
    val r = WindowTvfRewriter.rewrite(
      "SELECT * FROM Hop(data => TABLE(Bid), timecol => DESCRIPTOR(bidtime), " +
        "dur => INTERVAL '10' MINUTE, hopsize => INTERVAL '5' MINUTE)")
    assert(r.sql.contains("LATERAL VIEW explode(hop_wstarts(__src.bidtime, 600000L, 300000L, 0L))"))
    assert(r.sql.contains("event_time_plus(__ws, 600000L) AS wend"))
    assert(r.windows.head == WindowTvfRewriter.AppliedWindow(
      "hop", "Bid", "bidtime", 10 * Times.MinuteMs, Some(5 * Times.MinuteMs), 0L))
  }

  test("Hop accepts 'slide' as an alias for hopsize") {
    val r = WindowTvfRewriter.rewrite(
      "SELECT * FROM Hop(data => TABLE(B), timecol => DESCRIPTOR(t), " +
        "dur => INTERVAL '4' MINUTE, slide => INTERVAL '2' MINUTE)")
    assert(r.windows.head.hopMs.contains(2 * Times.MinuteMs))
  }

  test("a following table alias is preserved") {
    val r = WindowTvfRewriter.rewrite(
      "SELECT TB.wend FROM Tumble(data => TABLE(Bid), timecol => DESCRIPTOR(bidtime), " +
        "dur => INTERVAL '10' MINUTE) TB GROUP BY TB.wend")
    assert(r.sql.matches("(?s).*\\) TB GROUP BY TB\\.wend.*"))
  }

  test("multiple TVF calls in one query are all lowered") {
    val r = WindowTvfRewriter.rewrite(
      "SELECT * FROM Tumble(data => TABLE(A), timecol => DESCRIPTOR(t), dur => INTERVAL '1' MINUTE) x, " +
        "Tumble(data => TABLE(B), timecol => DESCRIPTOR(u), dur => INTERVAL '2' MINUTE) y")
    assert(r.windows.map(_.table) == Seq("A", "B"))
    assert(!r.sql.toLowerCase.contains("tumble(data"))
  }

  test("argument order does not matter") {
    val r = WindowTvfRewriter.rewrite(
      "SELECT * FROM Tumble(dur => INTERVAL '10' MINUTE, data => TABLE(Bid), " +
        "timecol => DESCRIPTOR(bidtime))")
    assert(r.windows.head.table == "Bid")
  }

  test("SQL without TVF calls passes through untouched") {
    val sql = "SELECT a, tumbler FROM t WHERE hopper = 1"
    val r   = WindowTvfRewriter.rewrite(sql)
    assert(r.sql == sql)
    assert(r.windows.isEmpty)
  }

  test("missing required arguments are reported") {
    intercept[IllegalArgumentException] {
      WindowTvfRewriter.rewrite("SELECT * FROM Tumble(data => TABLE(Bid))")
    }
    intercept[IllegalArgumentException] {
      WindowTvfRewriter.rewrite(
        "SELECT * FROM Hop(data => TABLE(B), timecol => DESCRIPTOR(t), dur => INTERVAL '4' MINUTE)")
    }
  }

  test("positional arguments are rejected with a clear error") {
    val e = intercept[IllegalArgumentException] {
      WindowTvfRewriter.rewrite("SELECT * FROM Tumble(TABLE(Bid), DESCRIPTOR(x), INTERVAL '1' MINUTE)")
    }
    assert(e.getMessage.contains("named"))
  }

  test("data must be a TABLE(...) reference") {
    intercept[IllegalArgumentException] {
      WindowTvfRewriter.rewrite(
        "SELECT * FROM Tumble(data => Bid, timecol => DESCRIPTOR(x), dur => INTERVAL '1' MINUTE)")
    }
  }
}
