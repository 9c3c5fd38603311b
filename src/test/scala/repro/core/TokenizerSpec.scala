package repro.core

import org.scalatest.funsuite.AnyFunSuite

class TokenizerSpec extends AnyFunSuite {
  private val tok = Tokenizer.default

  private def randomStrings(n: Int): Seq[String] = {
    val rng = new scala.util.Random(42)
    val chars = "abcXYZ019 ;=()[]{}<>:.,\"'\\\n\t/-_"
    Seq.fill(n)(Seq.fill(rng.nextInt(40))(chars(rng.nextInt(chars.length))).mkString)
  }

  test("splits on whitespace") {
    assert(tok.tokenize("a b  c").toSeq == Seq("a", "b", "c"))
  }

  test("splits on common delimiters from the paper's regex") {
    assert(tok.tokenize("k=v;x,y(z)[w]{u}").toSeq == Seq("k", "v", "x", "y", "z", "w", "u"))
  }

  test("splits on quotes and angle brackets") {
    assert(tok.tokenize("""say "hi" <tag>""").toSeq == Seq("say", "hi", "tag"))
  }

  test("URL protocol separator is a delimiter") {
    assert(tok.tokenize("http://example.com/x").toSeq == Seq("http", "example.com/x"))
  }

  test("colon is a delimiter") {
    assert(tok.tokenize("time:12").toSeq == Seq("time", "12"))
  }

  test("period inside a number survives") {
    assert(tok.tokenize("pi is 3.14 ok").toSeq == Seq("pi", "is", "3.14", "ok"))
  }

  test("sentence-ending period is stripped") {
    assert(tok.tokenize("done. next").toSeq == Seq("done", "next"))
  }

  test("trailing period at end of record is stripped") {
    assert(tok.tokenize("all done.").toSeq == Seq("all", "done"))
  }

  test("escaped quotes are delimiters") {
    assert(tok.tokenize("""a \"quoted\" b""").toSeq == Seq("a", "quoted", "b"))
  }

  test("period inside a domain name survives (no whitespace after)") {
    assert(tok.tokenize("host example.com up").toSeq == Seq("host", "example.com", "up"))
  }

  test("slashes and dashes are not delimiters") {
    assert(tok.tokenize("/var/log/app-1.log ok").toSeq == Seq("/var/log/app-1.log", "ok"))
  }

  test("empty string yields no tokens") {
    assert(tok.tokenize("").isEmpty)
  }

  test("whitespace-only string yields no tokens") {
    assert(tok.tokenize(" \t\n ").isEmpty)
  }

  test("consecutive delimiters collapse (no empty tokens)") {
    assert(tok.tokenize("a;;;=b").toSeq == Seq("a", "b"))
  }

  test("user-defined tokenizer regex is honoured") {
    val custom = new Tokenizer("""[|]+""")
    assert(custom.tokenize("a|b c|d").toSeq == Seq("a", "b c", "d"))
  }

  test("look-ahead is rejected in user tokenizers") {
    assertThrows[IllegalArgumentException](new Tokenizer("""a(?=b)"""))
  }

  test("look-behind is rejected in user tokenizers") {
    assertThrows[IllegalArgumentException](new Tokenizer("""(?<=a)b"""))
  }

  test("negative look-around is rejected in user tokenizers") {
    assertThrows[IllegalArgumentException](new Tokenizer("""a(?!b)"""))
    assertThrows[IllegalArgumentException](new Tokenizer("""(?<!a)b"""))
  }

  test("backreferences are rejected in user tokenizers") {
    assert(Tokenizer.hasForbiddenConstruct("""(a)\1"""))
  }

  test("tokenization is deterministic over random inputs") {
    randomStrings(300).foreach { s =>
      assert(tok.tokenize(s).toSeq == tok.tokenize(s).toSeq)
    }
  }

  test("no token contains a plain-space delimiter or is empty, over random inputs") {
    randomStrings(300).foreach { s =>
      assert(tok.tokenize(s).forall(t => !t.contains(' ') && t.nonEmpty))
    }
  }
}
