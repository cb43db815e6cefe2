package repro.tvr

import org.scalacheck.Prop.forAll
import org.scalatest.funsuite.AnyFunSuite

import repro.PropSupport

class TimesSpec extends AnyFunSuite with PropSupport {

  test("hm parses the paper's clock notation") {
    assert(Times.hm("8:07") == 8 * Times.HourMs + 7 * Times.MinuteMs)
    assert(Times.hm("0:00") == 0L)
    assert(Times.hm("23:59") == 23 * Times.HourMs + 59 * Times.MinuteMs)
  }

  test("fmt renders minutes with zero padding") {
    assert(Times.fmt(Times.hm("8:07")) == "8:07")
    assert(Times.fmt(Times.hm("8:00")) == "8:00")
    assert(Times.fmt(Times.hm("12:30")) == "12:30")
  }

  test("fmt/hm round-trip on whole minutes") {
    checkProp(forAll { (h: Int, m: Int) =>
      val hh = math.abs(h % 24); val mm = math.abs(m % 60)
      val s  = s"$hh:${f"$mm%02d"}"
      Times.fmt(Times.hm(s)) == s
    })
  }

  test("ts/ms round-trip") {
    checkProp(forAll { (x: Long) =>
      val v = math.abs(x % (1000L * Times.DayMs))
      Times.ms(Times.ts(v)) == v
    })
  }

  test("hm rejects malformed input") {
    intercept[IllegalArgumentException](Times.hm("807"))
  }

  test("constants are consistent") {
    assert(Times.HourMs == 60 * Times.MinuteMs)
    assert(Times.DayMs == 24 * Times.HourMs)
  }
}
