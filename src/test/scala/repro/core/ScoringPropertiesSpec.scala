package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.data.SocialStreamGen

/** Property tests for the scoring layer: the paper's Lemmas 1–2 (monotone,
  * submodular) and the consistency of the incremental CandidateState with a
  * from-scratch evaluation. Deterministic sweep over seeds and random
  * queries (see also [[ScoringCheckProps]] for the ScalaCheck variants).
  */
class ScoringPropertiesSpec extends AnyFunSuite {

  private def mkEngine(seed: Long): KSirEngine = PropStreams.engine(seed)

  private def queries(seed: Long): Seq[QueryVector] = PropStreams.queries(seed)

  test("f is monotone: f(S ∪ {e}) >= f(S) (Lemmas 1+2)") {
    for (seed <- 0L to 6L; q <- queries(seed)) {
      val eng = mkEngine(seed)
      val ids = eng.activeElements.map(_.elem.id).toSeq.sorted
      val rnd = new scala.util.Random(seed)
      (0 until 5).foreach { _ =>
        val s = rnd.shuffle(ids).take(rnd.nextInt(ids.size))
        val e = ids(rnd.nextInt(ids.size))
        assert(eng.evaluate(s :+ e, q) >= eng.evaluate(s, q) - 1e-9)
      }
    }
  }

  test("f is submodular: gain into S >= gain into T ⊇ S (Lemmas 1+2)") {
    for (seed <- 0L to 6L; q <- queries(seed)) {
      val eng = mkEngine(seed)
      val ids = eng.activeElements.map(_.elem.id).toSeq.sorted
      val rnd = new scala.util.Random(seed + 1)
      (0 until 5).foreach { _ =>
        val e = ids(rnd.nextInt(ids.size))
        val rest = rnd.shuffle(ids.filterNot(_ == e))
        val s = rest.take(rest.size / 3)
        val t = rest.take(2 * rest.size / 3) // S ⊆ T
        val gS = eng.evaluate(s :+ e, q) - eng.evaluate(s, q)
        val gT = eng.evaluate(t :+ e, q) - eng.evaluate(t, q)
        assert(gS >= gT - 1e-9, s"gain($e|S)=$gS < gain($e|T)=$gT")
      }
    }
  }

  test("f is nonnegative and f(∅) = 0") {
    for (seed <- 0L to 6L; q <- queries(seed)) {
      val eng = mkEngine(seed)
      assert(eng.evaluate(Seq.empty, q) == 0.0)
      val ids = eng.activeElements.map(_.elem.id).toSeq.take(5)
      assert(eng.evaluate(ids, q) >= 0.0)
    }
  }

  test("CandidateState.gain equals from-scratch marginal f difference") {
    for (seed <- 0L to 6L; q <- queries(seed)) {
      val eng = mkEngine(seed)
      val ids = eng.activeElements.map(_.elem.id).toSeq.sorted
      val s = ids.take(3)
      val cs = new CandidateState(eng, q)
      s.foreach(id => cs.add(eng.activeElement(id).get))
      ids.drop(3).take(8).foreach { e =>
        val expected = eng.evaluate(s :+ e, q) - eng.evaluate(s, q)
        assert(math.abs(cs.gain(eng.activeElement(e).get) - expected) < 1e-9)
      }
    }
  }

  test("CandidateState.score equals from-scratch f after incremental adds") {
    for (seed <- 0L to 6L; q <- queries(seed)) {
      val eng = mkEngine(seed)
      val ids = eng.activeElements.map(_.elem.id).toSeq.sorted.take(8)
      val cs = new CandidateState(eng, q)
      ids.foreach(id => cs.add(eng.activeElement(id).get))
      assert(math.abs(cs.score - eng.evaluate(ids, q)) < 1e-9)
    }
  }

  test("gain does not mutate state: two consecutive gains agree") {
    for (seed <- 0L to 4L; q <- queries(seed)) {
      val eng = mkEngine(seed)
      val ids = eng.activeElements.map(_.elem.id).toSeq.sorted
      val cs = new CandidateState(eng, q)
      cs.add(eng.activeElement(ids.head).get)
      val e = eng.activeElement(ids.last).get
      assert(cs.gain(e) == cs.gain(e))
    }
  }

  test("duplicate add contributes zero additional score") {
    for (seed <- 0L to 4L; q <- queries(seed)) {
      val eng = mkEngine(seed)
      val ids = eng.activeElements.map(_.elem.id).toSeq.sorted
      val cs = new CandidateState(eng, q)
      val e = eng.activeElement(ids.head).get
      cs.add(e)
      val s1 = cs.score
      cs.add(e)
      assert(math.abs(cs.score - s1) < 1e-12)
    }
  }

  test("singleton f equals δ(e, x)") {
    for (seed <- 0L to 4L; q <- queries(seed)) {
      val eng = mkEngine(seed)
      eng.activeElements.take(10).foreach { ae =>
        assert(math.abs(eng.evaluate(Seq(ae.elem.id), q) - eng.deltaScore(ae, q)) < 1e-9)
      }
    }
  }

  test("λ=1 engine scores are pure semantic sums (no influence term)") {
    val g = SocialStreamGen.generate(
      repro.data.StreamConfig("s", 40, 100, 4, 5, 1.5, 400, 400, seed = 5L))
    val sem = new KSirEngine(g.model, 400, lambda = 1.0, eta = 7.0)
    Bucket.bucketize(g.elements, 100, 400).foreach(sem.advance)
    sem.activeElements.foreach { ae =>
      (0 until 4).foreach(t => assert(math.abs(ae.delta(t) - ae.semantic(t)) < 1e-12))
    }
  }

  test("λ=0 engine scores are pure influence terms") {
    val g = SocialStreamGen.generate(
      repro.data.StreamConfig("s", 40, 100, 4, 5, 1.5, 400, 400, seed = 5L))
    val inf = new KSirEngine(g.model, 400, lambda = 0.0, eta = 2.0)
    Bucket.bucketize(g.elements, 100, 400).foreach(inf.advance)
    inf.activeElements.foreach { ae =>
      (0 until 4).foreach(t => assert(math.abs(ae.delta(t) - ae.influence(t) / 2.0) < 1e-12))
    }
  }
}

/** Shared small random streams for the property suites. */
object PropStreams {
  def engine(seed: Long): KSirEngine = {
    val cfg = repro.data.StreamConfig(
      name = "prop", nElements = 60, vocabSize = 120, z = 8, avgLen = 6,
      avgRefs = 1.2, spanSeconds = 600, refLookback = 600, seed = seed)
    val g = SocialStreamGen.generate(cfg)
    val engine = new KSirEngine(g.model, window = 400, lambda = 0.5, eta = 5.0)
    Bucket.bucketize(g.elements, 100, 600).foreach(engine.advance)
    engine
  }

  def queries(seed: Long): Seq[QueryVector] = {
    val rnd = new scala.util.Random(seed * 131 + 7)
    (0 until 3).map { _ =>
      val t1 = rnd.nextInt(8); val t2 = rnd.nextInt(8)
      val w = 0.1 + 0.8 * rnd.nextDouble()
      if (t1 == t2) QueryVector(t1 -> 1.0) else QueryVector(t1 -> w, t2 -> (1.0 - w))
    }
  }
}
