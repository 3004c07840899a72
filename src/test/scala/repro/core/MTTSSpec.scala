package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.data.PaperExample
import repro.baselines.Celf

/** MTTS-specific behaviour: threshold bookkeeping, early termination,
  * parameter edges, determinism.
  */
class MTTSSpec extends AnyFunSuite {

  private val eng = PaperExample.engineAt(8)
  private val q = QueryVector(0 -> 0.5, 1 -> 0.5)

  test("MTTS is deterministic") {
    val a = MTTS.query(eng, q, 2, 0.2)
    val b = MTTS.query(eng, q, 2, 0.2)
    assert(a.elements == b.elements && a.score == b.score && a.evaluated == b.evaluated)
  }

  test("k larger than the active count returns every useful element") {
    val res = MTTS.query(eng, q, 100, 0.1)
    assert(res.elements.size <= eng.activeCount)
    assert(res.score > 0)
  }

  test("tiny ε (many candidates) still terminates and meets the bound") {
    val res = MTTS.query(eng, q, 2, 0.01)
    val opt = 0.6487 // brute-force OPT for this query (PaperExampleSpec)
    assert(res.score >= (0.5 - 0.01) * opt - 1e-9)
  }

  test("large ε (few candidates) still returns a non-empty result") {
    val res = MTTS.query(eng, q, 2, 0.9999999)
    assert(res.elements.nonEmpty)
  }

  test("retrieved count never exceeds total ranked-list entries") {
    val res = MTTS.query(eng, q, 2, 0.3)
    val totalEntries = (0 until 2).map(eng.rankedListSize).sum
    assert(res.retrieved <= totalEntries)
  }

  test("single-topic query traverses only that topic's list") {
    val res = MTTS.query(eng, QueryVector(0 -> 1.0), 2, 0.1)
    // every retrieved element must have p_1 > 0
    res.elements.foreach { id =>
      assert(eng.activeElement(id).get.elem.pTopic(0) > 0)
    }
  }

  test("score equals a from-scratch evaluation of the returned set") {
    val res = MTTS.query(eng, q, 3, 0.2)
    assert(math.abs(res.score - eng.evaluate(res.elements, q)) < 1e-9)
  }

  test("monotone in k: larger k never decreases the score") {
    val s1 = MTTS.query(eng, q, 1, 0.1).score
    val s2 = MTTS.query(eng, q, 2, 0.1).score
    val s3 = MTTS.query(eng, q, 5, 0.1).score
    assert(s1 <= s2 + 1e-9 && s2 <= s3 + 1e-9)
  }

  test("bound holds across many synthetic engines and ks") {
    for (seed <- 0L to 4L; k <- 1 to 4; q <- PropStreams.queries(seed)) {
      val e = PropStreams.engine(seed)
      val celf = Celf.query(e, q, k).score
      val res = MTTS.query(e, q, k, 0.1)
      // OPT >= celf, and MTTS >= (1/2-ε)OPT >= (1/2-ε)·celf must hold too.
      assert(res.score >= (0.5 - 0.1) * celf - 1e-9,
        s"seed=$seed k=$k: mtts=${res.score} celf=$celf")
    }
  }

  test("evaluated count is reported consistently with pruning") {
    for (seed <- 0L to 4L) {
      val e = PropStreams.engine(seed)
      val q = PropStreams.queries(seed).head
      val res = MTTS.query(e, q, 3, 0.1)
      assert(res.evaluated <= res.retrieved)
      assert(res.retrieved <= e.activeCount)
    }
  }
}
