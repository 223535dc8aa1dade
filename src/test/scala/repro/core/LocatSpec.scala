package repro.core

import org.scalatest.funsuite.AnyFunSuite

class LocatSpec extends AnyFunSuite {

  private def freshObjective(seed: Long) = TestObjectives.synthetic(seed)

  test("LOCAT on the synthetic objective finds a near-optimal config") {
    val obj = freshObjective(1)
    val r = new Locat(nQcsa = 15, nIicp = 12, minIter = 6, maxIter = 15)
      .tune(obj, obj.space, datasizeGB = 100.0, seed = 1)
    // optimum: knob.one=100 (u=1), knob.two=0 (u=0) → expected total = (5+5+10)*1.1 = 22
    val exp = obj.expected(r.bestConf, 100.0).values.sum
    assert(exp < 26.0, s"expected-time at best conf = $exp (optimum 22)")
  }

  test("LOCAT removes the insensitive query from the RQA") {
    val obj = freshObjective(2)
    val session = new LocatSession(obj, obj.space, seed = 2, nQcsa = 15, nIicp = 12,
      minIter = 5, maxIter = 10)
    session.tuneInitial(100.0)
    assert(!session.qcsa.rqa.contains("insens"))
    assert(session.qcsa.rqa.toSet.subsetOf(Set("sens1", "sens2")))
  }

  test("LOCAT's IICP keeps the two real knobs") {
    val obj = freshObjective(3)
    val session = new LocatSession(obj, obj.space, seed = 3, nQcsa = 15, nIicp = 15,
      minIter = 5, maxIter = 10)
    session.tuneInitial(100.0)
    assert(session.iicp.keptParams.contains("knob.one"))
    assert(session.iicp.keptParams.contains("knob.two"))
  }

  test("phase-2 trials execute only the RQA (cheaper than full runs)") {
    val obj = freshObjective(4)
    val session = new LocatSession(obj, obj.space, seed = 4, nQcsa = 15, nIicp = 12,
      minIter = 5, maxIter = 10)
    val r = session.tuneInitial(100.0)
    val phase2 = r.trials.filter(t => !t.fullApp)
    assert(phase2.nonEmpty)
    // full app runs all 3 queries; RQA runs at most 2
    assert(phase2.forall(_.result.perQuerySeconds.size < 3))
  }

  test("optimizationSeconds equals the sum of trial costs") {
    val obj = freshObjective(5)
    val r = new Locat(nQcsa = 15, nIicp = 12, minIter = 5, maxIter = 10)
      .tune(obj, obj.space, 100.0, seed = 5)
    assert(math.abs(r.optimizationSeconds - r.trials.map(_.costSeconds).sum) < 1e-9)
  }

  test("stop condition: phase 2 runs at least minIter and at most maxIter RQA iterations") {
    val obj = freshObjective(6)
    val session = new LocatSession(obj, obj.space, seed = 6, nQcsa = 15, nIicp = 12,
      minIter = 6, maxIter = 12)
    val r = session.tuneInitial(100.0)
    val nPhase2 = r.trials.count(t => !t.fullApp)
    assert(nPhase2 >= 6 && nPhase2 <= 12, s"phase-2 iterations: $nPhase2")
  }

  test("tuneNext at a new datasize is cheaper than the initial tuning") {
    val obj = freshObjective(7)
    val session = new LocatSession(obj, obj.space, seed = 7, nQcsa = 15, nIicp = 12,
      minIter = 6, maxIter = 12, nextMinIter = 3, nextMaxIter = 8)
    val first = session.tuneInitial(100.0)
    val next = session.tuneNext(400.0)
    assert(next.optimizationSeconds < first.optimizationSeconds * 0.5,
      s"next=${next.optimizationSeconds} first=${first.optimizationSeconds}")
    // and the result at the new size is still good
    val exp = obj.expected(next.bestConf, 400.0).values.sum
    assert(exp < 31.0, s"expected at 400GB: $exp (optimum 28)")
  }

  test("tuneInitial can only run once; tuneNext requires tuneInitial") {
    val obj = freshObjective(8)
    val s1 = new LocatSession(obj, obj.space, seed = 8, nQcsa = 15, nIicp = 12, minIter = 3, maxIter = 5)
    intercept[IllegalStateException] { s1.tuneNext(100.0) }
    s1.tuneInitial(100.0)
    intercept[IllegalStateException] { s1.tuneInitial(200.0) }
  }

  test("LOCAT beats random search with the same execution budget") {
    val objL = freshObjective(9)
    val rL = new Locat(nQcsa = 15, nIicp = 12, minIter = 6, maxIter = 15)
      .tune(objL, objL.space, 100.0, seed = 9)
    val budget = rL.trials.size
    val objR = freshObjective(9)
    val rR = new repro.baselines.RandomSearch(budget).tune(objR, objR.space, 100.0, seed = 9)
    val expL = objL.expected(rL.bestConf, 100.0).values.sum
    val expR = objR.expected(rR.bestConf, 100.0).values.sum
    assert(expL <= expR + 0.5, s"locat=$expL random=$expR")
  }
}
