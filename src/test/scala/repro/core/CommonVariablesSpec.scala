package repro.core

import org.scalatest.funsuite.AnyFunSuite

class CommonVariablesSpec extends AnyFunSuite {
  private val W = CommonVariables.Wildcard

  test("iso timestamp is replaced") {
    assert(CommonVariables.replace("at 2024-03-01 10:12:33 done") == s"at $W done")
  }

  test("iso timestamp with millis and T separator is replaced") {
    assert(CommonVariables.replace("ts=2024-03-01T10:12:33.123Z end") == s"ts=$W end")
  }

  test("uuid is replaced") {
    assert(CommonVariables.replace("id 123e4567-e89b-12d3-a456-426614174000 ok") == s"id $W ok")
  }

  test("md5 hash is replaced") {
    assert(CommonVariables.replace("sum d41d8cd98f00b204e9800998ecf8427e ok") == s"sum $W ok")
  }

  test("ipv4 is replaced") {
    assert(CommonVariables.replace("from 192.168.0.1 port") == s"from $W port")
  }

  test("ipv4 with port is replaced as one unit") {
    assert(CommonVariables.replace("peer 10.0.0.2:8080 up") == s"peer $W up")
  }

  test("mac address is replaced") {
    assert(CommonVariables.replace("nic aa:bb:cc:dd:ee:ff up") == s"nic $W up")
  }

  test("0x hex literal is replaced") {
    assert(CommonVariables.replace("addr 0xdeadBEEF ok") == s"addr $W ok")
  }

  test("plain words and small numbers survive") {
    val s = "request 404 served in 12 ms"
    assert(CommonVariables.replace(s) == s)
  }

  test("short hex-looking words survive (not 32 chars, no 0x)") {
    val s = "color a3f2b1 set"
    assert(CommonVariables.replace(s) == s)
  }

  test("multiple occurrences all replaced") {
    assert(CommonVariables.replace("a 1.2.3.4 b 5.6.7.8 c") == s"a $W b $W c")
  }

  test("custom pattern list is honoured") {
    val out = CommonVariables.replace("user u123 in", Seq("user-id" -> raw"\bu\d+\b"))
    assert(out == s"user $W in")
  }

  test("empty pattern list leaves message untouched") {
    val s = "x 1.2.3.4 y"
    assert(CommonVariables.replace(s, Seq.empty) == s)
  }

  test("wildcard token survives tokenization as a stable token") {
    val toks = Tokenizer.default.tokenize(CommonVariables.replace("from 10.1.1.1 stop"))
    assert(toks.length == 3)
    // "<*>" loses its delimiter characters under the default tokenizer, but
    // deterministically so — every replaced variable becomes the same token
    assert(toks(1) == "*")
  }
}
