package repro.integration

import repro.SparkSpec
import repro.core._
import repro.data.{Datasets, Workload}
import repro.planner._

/** The paper's Problem Statement condition (2), DQ Correctness: the
  * entities returned by a Dedupe query over the dirty collection equal
  * the entities a Batch Approach query returns over the batch-cleaned
  * collection — for every dataset/query combination, compared group by
  * group on the member sets that intersect the query's QE.
  */
class CorrectnessSpec extends SparkSpec {

  private val cfg = DedupConfig(useLinkIndex = false)

  private def groupsOf(df: org.apache.spark.sql.DataFrame): Set[String] =
    df.select("members").collect().map(_.getString(0)).toSet

  /** Exact group-set equality (minAgreement = 1.0) or a lower bound on
    * the Jaccard agreement of the two group sets. Exactness can only be
    * demanded where the resolution function is perfect on the data: a
    * comparison that only the batch scope executes (both endpoints
    * outside QE) can add a link DQ never sees — the same effect behind
    * the paper's PC < 1 — so for the noisier generators we bound the
    * divergence instead.
    */
  private def checkSelect(name: String, ctx: TableContext, pred: Pred,
                          minAgreement: Double = 1.0): Unit = {
    val (dq, _) = Executor.runSelect(ctx, SelectSpec(name, pred), cfg)
    val (ba, _) = Executor.runBatchSelect(ctx, SelectSpec(name, pred), cfg)
    val g1 = groupsOf(dq); val g2 = groupsOf(ba)
    if (minAgreement >= 1.0)
      assert(g1 == g2, s"DQ ≠ BA for $name / $pred")
    else {
      val agreement = g1.intersect(g2).size.toDouble / g1.union(g2).size.max(1)
      assert(agreement >= minAgreement,
        s"DQ/BA agreement $agreement < $minAgreement for $name / $pred: " +
          s"dq-only=${g1.diff(g2).take(3)} ba-only=${g2.diff(g1).take(3)}")
    }
  }

  test("DQ ≡ BA on dsd for the full selectivity sweep") {
    val ctx = Datasets.dsd(spark, 800).toContext
    for (q <- 1 to 5) checkSelect("dsd", ctx, Workload.sp("dsd", q))
  }

  test("DQ ≈ BA on people (≥97% group agreement)") {
    val ctx = Datasets.ppl(spark, 600).toContext
    for (q <- Seq(1, 3, 5)) checkSelect("ppl", ctx, Workload.sp("ppl", q), minAgreement = 0.97)
  }

  test("DQ ≈ BA on projects (≥97% group agreement)") {
    val ctx = Datasets.oap(spark, 800).toContext
    for (q <- Seq(1, 5)) checkSelect("oap", ctx, Workload.sp("oap", q), minAgreement = 0.97)
  }

  test("DQ ≡ BA on venues (full table)") {
    val ctx = Datasets.oagv(spark, 260).toContext
    checkSelect("oagv", ctx, TruePred)
  }

  test("DQ ≈ BA with the MOD selection (Q9, ≥97% group agreement)") {
    val ctx = Datasets.ppl(spark, 600).toContext
    checkSelect("ppl", ctx, Workload.q9, minAgreement = 0.97)
  }

  test("DQ with the Link Index equals DQ without it (progressive ≡ one-shot)") {
    val ds = Datasets.dsd(spark, 800)
    val withLi    = ds.toContext
    val withoutLi = ds.toContext
    for (q <- Seq(2, 4)) {
      val pred = Workload.sp("dsd", q)
      val (a, _) = Executor.runSelect(withLi, SelectSpec("dsd", pred), DedupConfig(useLinkIndex = true))
      val (b, _) = Executor.runSelect(withoutLi, SelectSpec("dsd", pred), cfg)
      assert(groupsOf(a) == groupsOf(b), s"LI changed the answer for Q$q")
    }
  }

  test("DQ ≡ BA for the SPJ join ppl ⋈ oao under both planners") {
    val ppl = Datasets.ppl(spark, 600).toContext
    val oao = Datasets.oao(spark, 300).toContext
    val spec = JoinSpec(
      SelectSpec("ppl", Workload.sp("ppl", 2)), SelectSpec("oao", TruePred), "org", "orgname")
    def key(df: org.apache.spark.sql.DataFrame) =
      df.select(s"${ppl.name}_members", s"${oao.name}_members").collect()
        .map(r => (r.getString(0), r.getString(1))).toSet
    val (adv, _) = Executor.runJoin(ppl, oao, spec, AdvancedPlanner, cfg)
    val (nai, _) = Executor.runJoin(ppl, oao, spec, NaivePlanner, cfg)
    val (ba, _)  = Executor.runBatchJoin(ppl, oao, spec, cfg)
    assert(key(adv) == key(ba), "AES ≠ BA")
    assert(key(nai) == key(ba), "NES ≠ BA")
  }
}
