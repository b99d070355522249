package repro.names

import org.scalatest.funsuite.AnyFunSuite

import repro.core.{TokenDistances, Tokenizer}

/** Tests for the synthetic name-corpus generator. */
class NameGenSpec extends AnyFunSuite {

  test("vocabulary tokens are distinct, non-empty, and letter-only") {
    val v = NameGen.vocabulary(500, 1L)
    assert(v.size == 500)
    assert(v.distinct.size == 500)
    assert(v.forall(t => t.nonEmpty && t.forall(_.isLetter)))
  }

  test("vocabulary is deterministic in the seed") {
    assert(NameGen.vocabulary(100, 5L) == NameGen.vocabulary(100, 5L))
    assert(NameGen.vocabulary(100, 5L) != NameGen.vocabulary(100, 6L))
  }

  test("corpus has the requested size and sequential ids") {
    val c = NameGen.corpus(1000, 2L)
    assert(c.size == 1000)
    assert(c.map(_.id) == (0L until 1000L))
  }

  test("corpus is deterministic in the seed") {
    assert(NameGen.corpus(300, 3L) == NameGen.corpus(300, 3L))
    assert(NameGen.corpus(300, 3L) != NameGen.corpus(300, 4L))
  }

  test("every name tokenizes to at least one token") {
    assert(NameGen.corpus(2000, 5L).forall(a => Tokenizer.tokenize(a.name).nonEmpty))
  }

  test("token popularity is skewed (Zipf): the top token dwarfs the median") {
    val c = NameGen.corpus(3000, 6L)
    val freq = c.flatMap(a => Tokenizer.tokenize(a.name).distinct)
      .groupBy(identity).view.mapValues(_.size).values.toSeq.sorted(Ordering[Int].reverse)
    assert(freq.head >= 20 * freq(freq.size / 2),
      s"top=${freq.head} median=${freq(freq.size / 2)}")
  }

  test("rings create near-duplicate names under NSLD") {
    // With heavy rings, a substantial number of account pairs must sit
    // within a moderate NSLD of each other.
    val c = NameGen.corpus(200, 7L, ringFraction = 1.0, meanRingSize = 6)
    val toks = c.map(a => Tokenizer.tokenize(a.name))
    val close = (for {
      i <- toks.indices; j <- (i + 1) until toks.size
      if TokenDistances.nsld(toks(i), toks(j)) <= 0.3
    } yield 1).sum
    assert(close > 50, s"only $close close pairs in a pure-ring corpus")
  }

  test("background-only corpus has few near-duplicates") {
    val c = NameGen.corpus(200, 8L, ringFraction = 0.0)
    val toks = c.map(a => Tokenizer.tokenize(a.name))
    val close = (for {
      i <- toks.indices; j <- (i + 1) until toks.size
      if TokenDistances.nsld(toks(i), toks(j)) <= 0.1
    } yield 1).sum
    assert(close < 50, s"$close close pairs in a background-only corpus")
  }

  test("nameChangePairs: half legit, half fraud, deterministic") {
    val p = NameGen.nameChangePairs(1000, 9L)
    assert(p.size == 1000)
    assert(p.count(_.fraud) == 500)
    assert(p == NameGen.nameChangePairs(1000, 9L))
  }

  test("fraud name changes are more drastic than legit ones on average") {
    val p = NameGen.nameChangePairs(2000, 10L)
    def avg(sel: NameChange => Boolean): Double = {
      val xs = p.filter(sel).map(c =>
        TokenDistances.nsld(Tokenizer.tokenize(c.oldName), Tokenizer.tokenize(c.newName)))
      xs.sum / xs.size
    }
    val legit = avg(!_.fraud)
    val fraud = avg(_.fraud)
    assert(fraud > legit + 0.2, s"legit=$legit fraud=$fraud")
  }

  test("corpusDf round-trips through Spark-free generation") {
    // Generation itself is driver-side; just check shape invariants here.
    val c = NameGen.corpus(100, 11L)
    assert(c.forall(_.name.nonEmpty))
  }
}
