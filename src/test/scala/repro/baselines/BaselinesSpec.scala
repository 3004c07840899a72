package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.data.{PaperExample, SocialStreamGen, StreamConfig}

/** Effectiveness baselines of §5.1: TF-IDF top-k, DIV, REL, Sumblr-lite. */
class BaselinesSpec extends AnyFunSuite {

  private val eng = PaperExample.engineAt(8)

  test("TfIdfIndex: document frequencies over the active window") {
    val idx = new TfIdfIndex(eng)
    assert(idx.nDocs == 7)
    // w10 appears in e3, e6, e8 (e4 expired): df = 3.
    assert(idx.docFreq(10L) == 3)
    // w4 appears in e2 and e7.
    assert(idx.docFreq(4L) == 2)
  }

  test("TfIdfIndex: idf of an absent word is 0") {
    val idx = new TfIdfIndex(eng)
    assert(idx.idf(999) == 0.0)
  }

  test("TfIdfIndex: idf decreases with document frequency") {
    val idx = new TfIdfIndex(eng)
    assert(idx.idf(9) > idx.idf(4)) // w9 in 1 doc, w4 in 2
    assert(idx.idf(4) > idx.idf(10)) // w4 in 2, w10 in 3
  }

  test("TF-IDF query returns documents containing the keyword first") {
    // w9 (manutd) appears only in e2.
    val res = TfIdf.query(eng, Seq(9), 3)
    assert(res.headOption.contains(2L))
  }

  test("TF-IDF query with out-of-corpus keywords is empty") {
    assert(TfIdf.query(eng, Seq(999), 3).isEmpty)
  }

  test("TF-IDF query caps at k results") {
    assert(TfIdf.query(eng, Seq(10, 11), 2).size <= 2)
  }

  test("DIV returns relevant but diverse results") {
    val res = DivQuery.query(eng, Seq(10, 11), 3)
    assert(res.nonEmpty && res.size <= 3)
    // All results must contain at least one query word (positive relevance).
    res.foreach { id =>
      val words = eng.activeElement(id).get.elem.words.toSet
      assert(words.contains(10) || words.contains(11), s"e$id irrelevant")
    }
  }

  test("DIV is deterministic") {
    assert(DivQuery.query(eng, Seq(10, 11), 3) == DivQuery.query(eng, Seq(10, 11), 3))
  }

  test("REL returns elements ordered by cosine similarity to the query vector") {
    val q = QueryVector(0 -> 1.0)
    val res = TopKRelevance.query(eng, q, 3)
    val sims = res.map(id => VectorOps.cosineSparse(eng.activeElement(id).get.elem.topics, q.entries))
    assert(sims == sims.sorted(Ordering[Double].reverse))
    // e3 (0.89 on θ1) beats e1 (0.2 on θ1) for a pure-θ1 query.
    assert(res.indexOf(3L) >= 0)
    assert(res.indexOf(3L) < math.max(res.indexOf(1L), res.size))
  }

  test("REL respects k") {
    assert(TopKRelevance.query(eng, QueryVector(1 -> 1.0), 2).size == 2)
  }

  test("Sumblr returns only elements containing a keyword") {
    val res = Sumblr.query(eng, Seq(10), 2)
    res.foreach(id => assert(eng.activeElement(id).get.elem.words.contains(10)))
  }

  test("Sumblr returns all candidates when fewer than k") {
    val res = Sumblr.query(eng, Seq(9), 5) // only e2 contains w9
    assert(res == Seq(2L))
  }

  test("Sumblr with no matching candidates is empty") {
    assert(Sumblr.query(eng, Seq(999), 3).isEmpty)
  }

  test("Sumblr is deterministic for a fixed seed") {
    val g = SocialStreamGen.generate(StreamConfig("s", 200, 300, 8, 8, 1.0, 1000, 1000, seed = 3L))
    val e2 = new KSirEngine(g.model, 800, 0.5, 5.0)
    Bucket.bucketize(g.elements, 100, 1000).foreach(e2.advance)
    val kw = g.elements.head.words.take(2).toSeq
    assert(Sumblr.query(e2, kw, 5) == Sumblr.query(e2, kw, 5))
  }

  test("Sumblr covers multiple clusters on a larger stream") {
    val g = SocialStreamGen.generate(StreamConfig("s", 300, 300, 8, 10, 1.0, 1000, 1000, seed = 4L))
    val e2 = new KSirEngine(g.model, 800, 0.5, 5.0)
    Bucket.bucketize(g.elements, 100, 1000).foreach(e2.advance)
    // Frequent words → many candidates → should fill k slots.
    val allWords = g.elements.flatMap(_.words)
    val frequent = allWords.groupBy(identity).toSeq.sortBy(-_._2.size).take(3).map(_._1)
    val res = Sumblr.query(e2, frequent, 4)
    assert(res.size == 4)
    assert(res.distinct.size == 4)
  }
}
