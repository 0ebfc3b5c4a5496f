package repro.planner

import repro.{Fixtures, SparkSpec}
import repro.core._
import repro.data.Datasets

/** ER planner statistics (paper §7.2.1.i). */
class StatisticsSpec extends SparkSpec {

  private def pCtx = TableContext("pStat", Fixtures.publications(spark))
  private def vCtx = TableContext("vStat", Fixtures.venues(spark))

  test("selectedSet from an equality literal uses the literal's blocking keys") {
    val s = Statistics.selectedSet(pCtx, EqPred("venue", "EDBT"))
    assert(s == Set(1L, 6L, 8L)) // token block 'edbt'
  }
  test("selectedSet intersects the token blocks of a multi-token literal") {
    val s = Statistics.selectedSet(pCtx, EqPred("title", "consumer data"))
    assert(s == Set(6L, 7L, 8L)) // entities blocked under both 'consumer' and 'data'
  }
  test("selectedSet of IN unions per-value sets") {
    val s = Statistics.selectedSet(pCtx, InPred("venue", Seq("EDBT", "Sigmod")))
    assert(Set(1L, 6L, 8L).subsetOf(s) && s.contains(2L) == false)
  }
  test("selectedSet of AND intersects") {
    val s = Statistics.selectedSet(pCtx, AndPred(EqPred("venue", "EDBT"), EqPred("year", "2015")))
    assert(s == Set(6L, 8L))
  }
  test("selectedSet of OR unions") {
    val s = Statistics.selectedSet(pCtx, OrPred(EqPred("venue", "EDBT"), EqPred("year", "2017")))
    assert(s == Set(1L, 3L, 5L, 6L, 8L))
  }
  test("selectedSet of TruePred selects everything") {
    assert(Statistics.selectedSet(pCtx, TruePred).size == 8)
  }
  test("selectedSet falls back to filter evaluation for ranges") {
    val s = Statistics.selectedSet(pCtx, RangePred("year", 2015, 2017))
    assert(s == Set(3L, 5L, 6L, 8L))
  }

  test("estimateComparisons is zero for an empty selection") {
    assert(Statistics.estimateComparisons(pCtx, EqPred("venue", "nonexistentvenuename")) == 0L)
  }
  test("estimateComparisons grows with selectivity") {
    val ds  = Datasets.ppl(spark, 1000)
    val ctx = ds.toContext
    val small = Statistics.estimateComparisons(ctx, RangePred("byear", 1900, 1904))
    val large = Statistics.estimateComparisons(ctx, RangePred("byear", 1900, 1979))
    assert(small < large)
  }
  test("estimateComparisons tracks the executed comparisons' branch ordering") {
    // the estimator's purpose: decide which branch yields fewer comparisons
    val ppl = Datasets.ppl(spark, 1000).toContext
    val oao = Datasets.oao(spark, 300).toContext
    val cPpl = Statistics.estimateComparisons(ppl, TruePred)
    val cOao = Statistics.estimateComparisons(oao, TruePred)
    assert(cOao < cPpl) // the small clean-ish table is cheaper to clean first
  }
  test("estimateComparisons excludes already-resolved entities") {
    val ctx = pCtx
    val before = Statistics.estimateComparisons(ctx, EqPred("venue", "EDBT"))
    ctx.li.markResolved(Seq(1L, 6L, 8L))
    val after = Statistics.estimateComparisons(ctx, EqPred("venue", "EDBT"))
    assert(before > 0 && after == 0)
  }

  test("duplicationFactor is ≥ 1 and memoised") {
    val ctx = Datasets.ppl(spark, 500).toContext
    val df1 = Statistics.duplicationFactor(ctx)
    val df2 = Statistics.duplicationFactor(ctx)
    assert(df1 >= 1.0 && df1 == df2)
  }
  test("duplicationFactor reflects the people table's duplicate clusters") {
    // 40% duplicate records with ≤3 dups/record ⇒ the expected cluster
    // size of a random entity is ≈2.6, so |DR|/|QE| lands well above 1.
    val ctx = Datasets.ppl(spark, 1000).toContext
    val df  = Statistics.duplicationFactor(ctx)
    info(f"ppl duplication factor: $df%.3f")
    assert(df > 1.3 && df < 3.0)
  }

  test("joinPercent computes both sides' participation and is memoised") {
    val ppl = Datasets.ppl(spark, 500).toContext
    val oao = Datasets.oao(spark, 300).toContext
    val (l, r) = Statistics.joinPercent(ppl, "org", oao, "orgname")
    assert(l > 0.0 && l <= 1.0 && r > 0.0 && r <= 1.0)
    assert(Statistics.joinPercent(ppl, "org", oao, "orgname") == ((l, r)))
  }
  test("joinPercent of unjoinable attributes is zero") {
    val ppl = Datasets.ppl(spark, 500).toContext
    val oao = Datasets.oao(spark, 300).toContext
    assert(Statistics.joinPercent(ppl, "phone", oao, "country") == ((0.0, 0.0)))
  }

  test("estimateDrSize extrapolates with the duplication factor") {
    val ctx = Datasets.ppl(spark, 500).toContext
    val df  = Statistics.duplicationFactor(ctx)
    assert(Statistics.estimateDrSize(ctx, 100) == 100 * df)
  }
}
