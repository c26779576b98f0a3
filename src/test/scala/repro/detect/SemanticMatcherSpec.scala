package repro.detect

import org.scalatest.funsuite.AnyFunSuite

class SemanticMatcherSpec extends AnyFunSuite {

  private val templates = Map(
    1 -> Seq("Sending", "<*>", "bytes", "src:", "<*>", "dest:", "<*>"),
    2 -> Seq("Connection", "opened", "src:", "<*>", "port:", "<*>"),
    3 -> Seq("Volume", "<*>", "attached", "successfully", "in", "<*>", "ms"),
  )
  private val m = new SemanticMatcher(templates)

  test("identical template maps to itself") {
    assert(m.mapTemplate(templates(1)).contains(1))
  }

  test("synonym twist maps back to the origin template") {
    assert(m.mapTemplate(Seq("Transmitting", "42", "bytes", "src:", "a", "dest:", "b")).contains(1))
  }

  test("_v2 rename maps back to the origin template") {
    assert(m.mapTemplate(Seq("Sending_v2", "42", "bytes", "src:", "a", "dest:", "b")).contains(1))
  }

  test("inserted token still maps back") {
    assert(m.mapTemplate(Seq("Connection", "now", "opened", "src:", "a", "port:", "9")).contains(2))
  }

  test("a genuinely novel statement maps to none") {
    assert(m.mapTemplate(Seq("Completely", "unrelated", "words", "here")).isEmpty)
  }

  test("tau=1 demands full static-token overlap") {
    val strict = new SemanticMatcher(templates, tau = 1.0)
    assert(strict.mapTemplate(Seq("Sending", "9", "bytes", "src:", "x", "dest:", "y")).contains(1))
    assert(strict.mapTemplate(Seq("Transmitting", "9", "bytes", "src:", "x", "dest:", "y")).isEmpty)
  }

  test("similarity is symmetric and in [0,1]") {
    val a = templates(1); val b = templates(3)
    val s1 = m.similarity(a, b); val s2 = m.similarity(b, a)
    assert(s1 == s2)
    assert(s1 >= 0.0 && s1 <= 1.0)
  }

  test("similarity of identical static sets is 1") {
    assert(m.similarity(templates(2), templates(2)) == 1.0)
  }

  test("wildcards are ignored in comparison") {
    assert(m.similarity(Seq("a", "<*>", "b"), Seq("a", "b")) == 1.0)
  }

  test("mapMessage tokenizes then maps") {
    assert(m.mapMessage("Volume vol-7 attached successfully in 912 ms").contains(3))
  }

  test("all-variable candidate maps to none") {
    assert(m.mapTemplate(Seq("<*>", "<*>")).isEmpty)
  }

  test("best match wins among several candidates") {
    val tight = Map(
      10 -> Seq("job", "start", "on", "node"),
      11 -> Seq("job", "start", "on", "host", "with", "retry"),
    )
    val mm = new SemanticMatcher(tight, tau = 0.3)
    assert(mm.mapTemplate(Seq("job", "start", "on", "node")).contains(10))
  }
}
