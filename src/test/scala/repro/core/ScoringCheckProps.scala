package repro.core

import org.scalacheck.{Gen, Prop, Properties}

/** ScalaCheck formulations of the core invariants, run by sbt's ScalaCheck
  * framework (engines are cached per seed — generation dominates otherwise).
  */
object ScoringCheckProps extends Properties("Scoring") {

  private val cache = scala.collection.mutable.Map.empty[Long, KSirEngine]
  private def eng(seed: Long): KSirEngine = cache.getOrElseUpdate(seed % 5, PropStreams.engine(seed % 5))

  private val seedGen = Gen.choose(0L, 4L)
  private val qGen = for {
    t1 <- Gen.choose(0, 7); t2 <- Gen.choose(0, 7); w <- Gen.choose(0.1, 0.9)
  } yield if (t1 == t2) QueryVector(t1 -> 1.0) else QueryVector(t1 -> w, t2 -> (1.0 - w))

  property("monotone") = Prop.forAll(seedGen, qGen, Gen.choose(0, 1000)) { (seed, q, r) =>
    val e = eng(seed)
    val ids = e.activeElements.map(_.elem.id).toSeq.sorted
    val s = ids.take(r % ids.size)
    val x = ids(r % ids.size)
    e.evaluate(s :+ x, q) >= e.evaluate(s, q) - 1e-9
  }

  property("submodular") = Prop.forAll(seedGen, qGen, Gen.choose(0, 1000)) { (seed, q, r) =>
    val e = eng(seed)
    val ids = e.activeElements.map(_.elem.id).toSeq.sorted
    val x = ids(r % ids.size)
    val rest = ids.filterNot(_ == x)
    val s = rest.take(rest.size / 3)
    val t = rest.take(2 * rest.size / 3)
    val gS = e.evaluate(s :+ x, q) - e.evaluate(s, q)
    val gT = e.evaluate(t :+ x, q) - e.evaluate(t, q)
    gS >= gT - 1e-9
  }

  property("order-independent evaluation") = Prop.forAll(seedGen, qGen, Gen.choose(0, 1000)) { (seed, q, r) =>
    val e = eng(seed)
    val ids = e.activeElements.map(_.elem.id).toSeq.sorted.take(6)
    val shuffled = new scala.util.Random(r).shuffle(ids)
    math.abs(e.evaluate(ids, q) - e.evaluate(shuffled, q)) < 1e-9
  }

  property("MTTS bound: f >= (1/2 - ε)·OPT-greedy lower bound") =
    Prop.forAll(seedGen, qGen, Gen.choose(2, 5)) { (seed, q, k) =>
      val e = eng(seed)
      // CELF score is a (1-1/e)-approximation, so OPT <= celf/(1-1/e).
      val celf = repro.baselines.Celf.query(e, q, k).score
      val optUb = celf / (1 - 1 / math.E)
      val mtts = MTTS.query(e, q, k, 0.1).score
      mtts >= (0.5 - 0.1) * (celf / 1.0) - 1e-9 || mtts >= (0.5 - 0.1) * optUb - 1e-9 || celf == 0.0
    }

  property("MTTD bound: f >= (1 - 1/e - ε)·f_celf") =
    Prop.forAll(seedGen, qGen, Gen.choose(2, 5)) { (seed, q, k) =>
      val e = eng(seed)
      val celf = repro.baselines.Celf.query(e, q, k).score
      val mttd = MTTD.query(e, q, k, 0.1).score
      // celf <= OPT, so this is weaker than the theorem but must still hold.
      mttd >= (1 - 1 / math.E - 0.1) * celf - 1e-9
    }
}
