package repro.bench

import repro.SparkSpec
import repro.bench.tables.Table6

/** Regenerates Table 6 (per-iteration latency vs database size). */
class Table6Bench extends SparkSpec {

  private lazy val result = Table6.compute(spark)

  test("render and persist Table 6") {
    val text = Table6.Paper + "\n" + result.render
    println(text)
    BenchOutput.write("table6.txt", text)
    assert(result.rows.map(_.label) == Seq("ObjNet-", "BDD-", "COCO-", "BDD", "COCO"))
  }

  test("multiscale rows index an order of magnitude more vectors") {
    val coarse = result.rows.take(3).map(_.nVectors).max
    val multi = result.rows.drop(3).map(_.nVectors).min
    assert(multi > 5 * coarse, s"multi $multi vs coarse $coarse")
  }

  test("ENS is not implemented for multiscale (NA), as in the paper") {
    result.rows.take(3).foreach(r => assert(r.ens.isDefined, r.label))
    result.rows.drop(3).foreach(r => assert(r.ens.isEmpty, r.label))
  }

  test("label propagation is the slowest method on every row (paper shape)") {
    result.rows.foreach { r =>
      assert(r.prop > r.seesaw, s"${r.label}: prop ${r.prop} vs seesaw ${r.seesaw}")
      assert(r.prop > r.clip, s"${r.label}: prop ${r.prop} vs clip ${r.clip}")
    }
  }

  test("propagation latency grows with database size; SeeSaw stays flat-ish") {
    val coarseProp = result.rows.take(3).map(_.prop).max
    val multiProp = result.rows.drop(3).map(_.prop).max
    assert(multiProp > 1.5 * coarseProp,
      s"prop should grow with N: coarse max $coarseProp, multi max $multiProp")
    val coarseSeesaw = result.rows.take(3).map(_.seesaw).max
    val multiSeesaw = result.rows.drop(3).map(_.seesaw).max
    // SeeSaw's aligner cost is independent of N; only the store scan grows
    // mildly. Allow generous slack but demand clearly sub-propagation growth.
    assert(multiSeesaw < coarseSeesaw * 6 + 0.5,
      s"seesaw grew too fast: coarse $coarseSeesaw multi $multiSeesaw")
  }

  test("SeeSaw latency stays interactive (sub-second per iteration)") {
    result.rows.foreach(r => assert(r.seesaw < 1.5, s"${r.label}: ${r.seesaw}"))
  }

  test("all latencies are positive") {
    result.rows.foreach { r =>
      assert(r.clip > 0 && r.rocchio > 0 && r.seesaw > 0 && r.prop > 0)
      r.ens.foreach(e => assert(e > 0))
    }
  }
}
