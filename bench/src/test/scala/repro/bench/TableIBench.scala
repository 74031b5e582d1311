package repro.bench

import repro.SparkSpec
import repro.data.FraudGraphGen
import repro.eval.Experiments

/** Table I: statistics of the datasets (paper: proprietary JD.com snapshots;
  * ours: the 1/100-scale synthetic substitutes — DESIGN.md §3).
  *
  * Paper's Table I:
  *   #1:   454,925 PINs /  24,247 fraud / 226,585 merchants / 1,023,846 edges
  *   #2: 2,194,325 PINs /  16,035 fraud / 120,867 merchants / 2,790,517 edges
  *   #3: 4,332,696 PINs / 101,702 fraud / 556,634 merchants / 7,997,696 edges
  */
class TableIBench extends SparkSpec {

  private val paper = Map(
    "jd1" -> (454925L, 24247L, 226585L, 1023846L),
    "jd2" -> (2194325L, 16035L, 120867L, 2790517L),
    "jd3" -> (4332696L, 101702L, 556634L, 7997696L))

  private lazy val rows = Experiments.tableI(spark)

  test("Table I: generate and report dataset statistics") {
    println("\n=== Table I (ours, sf=1 = 1/100 of paper) ===")
    println(Experiments.renderTableI(rows))
    println("=== Table I (paper) ===")
    println(Experiments.renderTableI(paper.toSeq.sortBy(_._1).map {
      case (n, (p, f, m, e)) => Experiments.DatasetStats(n, p, f, m, e)
    }))
    assert(rows.size == 3)
  }

  for (spec <- FraudGraphGen.all) {
    test(s"Table I: ${spec.name} edge count lands within 10% of paper/100") {
      val r = rows.find(_.name == spec.name).get
      val target = paper(spec.name)._4 / 100.0
      assert(math.abs(r.edges - target) < 0.10 * target,
        s"${r.edges} vs target $target")
    }

    test(s"Table I: ${spec.name} fraud PIN count is paper/100 (rounded to block shape)") {
      val r = rows.find(_.name == spec.name).get
      val target = paper(spec.name)._2 / 100.0
      assert(math.abs(r.fraudPins - target) < 0.05 * target,
        s"${r.fraudPins} vs target $target")
    }

    test(s"Table I: ${spec.name} merchant count within 40% of paper/100") {
      // not every spec merchant receives an edge at this scale
      val r = rows.find(_.name == spec.name).get
      val target = paper(spec.name)._3 / 100.0
      assert(r.merchants > 0.6 * target && r.merchants < 1.1 * target,
        s"${r.merchants} vs target $target")
    }
  }
}
