package repro.data

import repro.SparkSpec
import repro.planner.{ModLtPred, RangePred}

/** The 13-query workload definitions (paper §9.1). */
class WorkloadSpec extends SparkSpec {

  test("Q1..Q5 selectivities step from ≈5% to ≈80%") {
    assert(Workload.SpSelectivities == Seq(0.05, 0.20, 0.35, 0.50, 0.80))
  }

  test("sp() builds ranges over the dataset's year attribute") {
    val p = Workload.sp("ppl2000", 1)
    assert(p.isInstanceOf[RangePred])
    assert(p.asInstanceOf[RangePred].attr == "byear")
  }

  test("sp() rejects out-of-range query ids") {
    intercept[IllegalArgumentException](Workload.sp("ppl", 6))
    intercept[IllegalArgumentException](Workload.sp("ppl", 0))
  }

  test("unknown dataset families are rejected") {
    intercept[IllegalArgumentException](Workload.sp("unknown", 1))
  }

  test("measured selectivity of Q1 and Q5 on people tracks the targets") {
    val ds = Datasets.ppl(spark, 2000)
    val n  = ds.df.count().toDouble
    val s1 = ds.df.where(Workload.sp("ppl", 1).toColumn).count() / n
    val s5 = ds.df.where(Workload.sp("ppl", 5).toColumn).count() / n
    info(f"S(Q1)=$s1%.3f S(Q5)=$s5%.3f")
    // wide ranges lose ~10% of nominal selectivity to nulled/corrupted
    // duplicate years — expected febrl-style generator behaviour
    assert(math.abs(s1 - 0.05) < 0.03)
    assert(math.abs(s5 - 0.80) < 0.12)
  }

  test("measured selectivity on papers tracks the targets") {
    val ds = Datasets.oagp(spark, 2000)
    val n  = ds.df.count().toDouble
    val s3 = ds.df.where(Workload.sp("oagp", 3).toColumn).count() / n
    assert(math.abs(s3 - 0.35) < 0.05)
  }

  test("Q9 selects ≈10% via MOD on the entity id") {
    assert(Workload.q9 == ModLtPred(10, 1))
    val ds = Datasets.ppl(spark, 2000)
    val s  = ds.df.where(Workload.q9.toColumn).count() / 2000.0
    assert(math.abs(s - 0.10) < 0.02)
  }

  test("Q10..Q13 are strictly widening overlapping ranges") {
    val ranges = (10 to 13).map(Workload.li("oagp", _).asInstanceOf[RangePred])
    assert(ranges.map(_.lo).distinct.size == 1) // common start → overlapping
    assert(ranges.map(_.hi) == ranges.map(_.hi).sorted)
    assert(ranges.map(_.hi).distinct.size == 4)
  }

  test("li() rejects non-LI query ids") {
    intercept[IllegalArgumentException](Workload.li("oagp", 9))
  }
}
