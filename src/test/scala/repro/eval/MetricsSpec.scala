package repro.eval

import repro.{Oracle, SparkSpec}
import repro.eval.Metrics.{PrPoint, Prf}

class MetricsSpec extends SparkSpec {

  // ---- Prf arithmetic -------------------------------------------------------

  test("precision/recall/f1 on a known confusion") {
    val p = Prf(tp = 8, fp = 2, fn = 8)
    assert(math.abs(p.precision - 0.8) < 1e-12)
    assert(math.abs(p.recall - 0.5) < 1e-12)
    assert(math.abs(p.f1 - 2 * 0.8 * 0.5 / 1.3) < 1e-12)
  }

  test("empty detection has zero precision and f1") {
    val p = Prf(0, 0, 5)
    assert(p.precision == 0.0 && p.recall == 0.0 && p.f1 == 0.0)
  }

  test("perfect detection") {
    val p = Prf(5, 0, 0)
    assert(p.precision == 1.0 && p.recall == 1.0 && p.f1 == 1.0)
  }

  test("prfLocal counts correctly") {
    val p = Metrics.prfLocal(Set(1L, 2L, 3L), Set(2L, 3L, 4L, 5L))
    assert(p == Prf(2, 1, 2))
  }

  // ---- DataFrame path + DuckDB oracle --------------------------------------

  test("DataFrame prf equals local prf and the DuckDB oracle") {
    import spark.implicits._
    val detected = Seq(1L, 2L, 3L, 3L).toDF("u") // duplicate must not double-count
    val blacklist = Seq(2L, 3L, 4L, 5L).toDF("u")
    val p = Metrics.prf(detected, blacklist)
    assert(p == Prf(2, 1, 2))

    val counts = Seq((p.tp, p.fp, p.fn)).toDF("tp", "fp", "fn")
    Oracle.assertEquivalent(
      counts,
      """WITH d AS (SELECT DISTINCT u FROM detected),
        |     b AS (SELECT DISTINCT u FROM blacklist),
        |     i AS (SELECT count(*) AS tp FROM d JOIN b USING (u))
        |SELECT i.tp AS tp,
        |       (SELECT count(*) FROM d) - i.tp AS fp,
        |       (SELECT count(*) FROM b) - i.tp AS fn
        |FROM i""".stripMargin,
      "detected" -> detected,
      "blacklist" -> blacklist)
  }

  for (seed <- Seq(7, 8, 9)) {
    test(s"DataFrame prf matches prfLocal on random sets (seed=$seed)") {
      import spark.implicits._
      val rnd = new scala.util.Random(seed)
      val det = (1L to 200L).filter(_ => rnd.nextDouble() < 0.3)
      val bl = (1L to 200L).filter(_ => rnd.nextDouble() < 0.2)
      val fromDf = Metrics.prf(det.toDF("u"), bl.toDF("u"))
      assert(fromDf == Metrics.prfLocal(det.toSet, bl.toSet))
    }
  }

  // ---- sweeps ---------------------------------------------------------------

  test("voteSweep produces one point per reachable threshold") {
    val votes = Seq((1L, 3L), (2L, 2L), (3L, 1L), (4L, 1L))
    val sweep = Metrics.voteSweep(votes, Set(1L, 2L))
    assert(sweep.map(_.threshold) == Seq(1.0, 2.0, 3.0))
    assert(sweep.head.prf == Prf(2, 2, 0))  // t=1: all detected
    assert(sweep.last.prf == Prf(1, 0, 1))  // t=3: only node 1
  }

  test("voteSweep precision rises and detected count falls with T on nested sets") {
    val votes = (1L to 10L).map(i => (i, i)) // node i has i votes; fraud = 6..10
    val sweep = Metrics.voteSweep(votes, (6L to 10L).toSet)
    sweep.sliding(2).foreach {
      case Seq(a, b) =>
        assert(b.prf.detected <= a.prf.detected)
        assert(b.prf.recall <= a.prf.recall)
        assert(b.prf.precision >= a.prf.precision - 1e-12)
      case _ =>
    }
  }

  test("voteSweep of empty votes is empty") {
    assert(Metrics.voteSweep(Seq.empty, Set(1L)).isEmpty)
  }

  test("scoreSweep detects by descending score and skips zero scores") {
    val scores = Seq((1L, 0.9), (2L, 0.5), (3L, 0.0), (4L, 0.5))
    val sweep = Metrics.scoreSweep(scores, Set(1L))
    assert(sweep.map(_.threshold) == Seq(0.9, 0.5))
    assert(sweep.head.prf == Prf(1, 0, 0))
    assert(sweep.last.prf == Prf(1, 2, 0))
  }

  test("scoreSweep caps the number of points") {
    val scores = (1L to 500L).map(i => (i, i / 500.0))
    assert(Metrics.scoreSweep(scores, Set(1L), maxPoints = 50).length <= 50)
  }

  test("bestF1 picks the max-F1 point") {
    val pts = Seq(
      PrPoint(1, Prf(5, 5, 0)),
      PrPoint(2, Prf(4, 0, 1)),
      PrPoint(3, Prf(1, 0, 4)))
    assert(Metrics.bestF1(pts).threshold == 2)
  }

  test("bestF1 of an empty curve is a zero point") {
    assert(Metrics.bestF1(Seq.empty).prf.f1 == 0.0)
  }

  test("collectUserVotes filters to the user side") {
    import spark.implicits._
    val votes = Seq(("u", 1L, 3L), ("v", 9L, 5L), ("u", 2L, 1L)).toDF("side", "id", "votes")
    assert(Metrics.collectUserVotes(votes).toSet == Set((1L, 3L), (2L, 1L)))
  }
}
