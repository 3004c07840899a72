package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.data.PaperExample

/** The ranked-list traversal operations of §4.1: ordered pops, cross-list
  * visited marking, and the UB(x) upper-bound invariant.
  */
class RankedListCursorSpec extends AnyFunSuite {

  private val eng = PaperExample.engineAt(8)

  test("pops arrive in non-increasing x-weighted score order per list") {
    val q = QueryVector(0 -> 1.0)
    val cursor = new RankedListCursor(eng, q)
    var last = Double.MaxValue
    var ae = cursor.popMax()
    while (ae != null) {
      val s = ae.delta(0)
      assert(s <= last + 1e-12)
      last = s
      ae = cursor.popMax()
    }
  }

  test("every active element on queried topics is retrieved exactly once") {
    val q = QueryVector(0 -> 0.5, 1 -> 0.5)
    val cursor = new RankedListCursor(eng, q)
    val seen = scala.collection.mutable.ArrayBuffer.empty[Long]
    var ae = cursor.popMax()
    while (ae != null) { seen += ae.elem.id; ae = cursor.popMax() }
    assert(seen.distinct.size == seen.size, "no duplicates across lists")
    assert(seen.toSet == eng.activeElements.map(_.elem.id).toSet)
  }

  test("upperBound never increases as elements are popped") {
    val q = QueryVector(0 -> 0.5, 1 -> 0.5)
    val cursor = new RankedListCursor(eng, q)
    var prev = cursor.upperBound
    var ae = cursor.popMax()
    while (ae != null) {
      val ub = cursor.upperBound
      assert(ub <= prev + 1e-12, s"UB rose from $prev to $ub")
      prev = ub
      ae = cursor.popMax()
    }
    assert(cursor.exhausted && cursor.upperBound == 0.0)
  }

  test("upperBound dominates every later-popped element's δ(e,x)") {
    val q = QueryVector(0 -> 0.3, 1 -> 0.7)
    val cursor = new RankedListCursor(eng, q)
    var ub = cursor.upperBound
    var ae = cursor.popMax()
    while (ae != null) {
      assert(eng.deltaScore(ae, q) <= ub + 1e-9)
      ub = cursor.upperBound
      ae = cursor.popMax()
    }
  }

  test("retrievedCount tracks pops") {
    val q = QueryVector(1 -> 1.0)
    val cursor = new RankedListCursor(eng, q)
    assert(cursor.retrievedCount == 0)
    cursor.popMax(); cursor.popMax()
    assert(cursor.retrievedCount == 2)
  }

  test("a query on an empty topic is exhausted immediately") {
    val model = new TopicModel(2, 4, Array(Array(0.5, 0.5, 0, 0), Array(0, 0, 0.5, 0.5)))
    val e = new KSirEngine(model, 10, 0.5, 1.0)
    e.advance(Bucket(1, Seq(Element(1, 1, Array(0), Array.empty, Array((0, 1.0))))))
    val cursor = new RankedListCursor(e, QueryVector(1 -> 1.0))
    assert(cursor.exhausted && cursor.popMax() == null && cursor.upperBound == 0.0)
  }

  test("popMax follows the argmax_i x_i·δ_i rule on the paper example") {
    // Figure 5: first e3 (x1·δ1 = 0.33), then e1 (x2·δ2 = 0.28).
    val cursor = new RankedListCursor(eng, QueryVector(0 -> 0.5, 1 -> 0.5))
    assert(cursor.popMax().elem.id == 3L)
    assert(cursor.popMax().elem.id == 1L)
  }

  test("on the synthetic engines the full traversal matches the union of lists") {
    for (seed <- 0L to 3L) {
      val e = PropStreams.engine(seed)
      val q = QueryVector(0 -> 0.4, 3 -> 0.6)
      val cursor = new RankedListCursor(e, q)
      val seen = scala.collection.mutable.Set.empty[Long]
      var ae = cursor.popMax()
      while (ae != null) { seen += ae.elem.id; ae = cursor.popMax() }
      val expected = (e.rankedList(0).map(_._2) ++ e.rankedList(3).map(_._2)).toSet
      assert(seen == expected, s"seed=$seed")
    }
  }
}
