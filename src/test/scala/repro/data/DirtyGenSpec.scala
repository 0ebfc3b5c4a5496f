package repro.data

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.{PropSupport, SparkSpec}
import scala.util.Random

/** The corruption engine — pure-function behaviour. */
class CorruptionSpec extends AnyFunSuite with PropSupport {
  import DirtyGen._

  test("typoSwap exchanges adjacent characters") {
    assert(typoSwap("ab", new Random(1)) == "ba")
  }
  test("typoDelete shortens by one") {
    checkProp(Prop.forAll(Gen.alphaStr.suchThat(_.length >= 2), Gen.long) { (s, seed) =>
      typoDelete(s, new Random(seed)).length == s.length - 1
    }, minTests = 50)
  }
  test("typoInsert lengthens by one") {
    checkProp(Prop.forAll(Gen.alphaStr.suchThat(_.nonEmpty), Gen.long) { (s, seed) =>
      typoInsert(s, new Random(seed)).length == s.length + 1
    }, minTests = 50)
  }
  test("typoReplace preserves length") {
    checkProp(Prop.forAll(Gen.alphaStr.suchThat(_.nonEmpty), Gen.long) { (s, seed) =>
      typoReplace(s, new Random(seed)).length == s.length
    }, minTests = 50)
  }
  test("abbreviateToken turns a word into its initial") {
    val out = abbreviateToken("entity resolution", new Random(3))
    assert(out == "e. resolution" || out == "entity r.")
  }
  test("abbreviateToken leaves short tokens alone") {
    assert(abbreviateToken("a bc", new Random(1)) == "a bc")
  }
  test("dropToken requires at least three tokens") {
    assert(dropToken("one two", new Random(1)) == "one two")
    assert(dropToken("one two three", new Random(1)).split(" ").length == 2)
  }
  test("corrupt is deterministic in the rng seed") {
    val a = corrupt("international conference on databases", new Random(7))
    val b = corrupt("international conference on databases", new Random(7))
    assert(a == b)
  }
  test("corrupt keeps nulls and empties untouched") {
    assert(corrupt(null, new Random(1)) == null)
    assert(corrupt("", new Random(1)) == "")
  }
  test("property: corrupted value stays similar to the original") {
    import repro.core.Similarity
    checkProp(Prop.forAll(Gen.choose(0L, 10000L)) { seed =>
      val v = "margaret thompson"
      Similarity.attrSim(v, corrupt(v, new Random(seed), 2)) > 0.6
    }, minTests = 50)
  }
  test("acronym takes initials of non-stopword tokens") {
    assert(acronym("international conference on extending database technology") == "icedt")
  }
}

/** The generated dataset family (paper §9.1 / Table 7 equivalents). */
class DirtyGenSpec extends SparkSpec {

  test("people: size, schema width and duplicate share") {
    val ds = Datasets.ppl(spark, 500)
    assert(ds.df.count() == 500)
    assert(ds.df.columns.length == 13) // eid + 12 attributes (Table 7 |A|=12)
    val dups = ds.truth.where("eid != cluster").count()
    assert(math.abs(dups / 500.0 - 0.40) < 0.02)
  }
  test("people: at most 3 duplicates per original") {
    val ds  = Datasets.ppl(spark, 500)
    val max = ds.truth.where("eid != cluster").groupBy("cluster").count()
      .agg(org.apache.spark.sql.functions.max("count")).collect()(0).getLong(0)
    assert(max <= 3)
  }
  test("people: generation is deterministic") {
    val a = DirtyGen.people(spark, 200, Array("org a", "org b")).df.collect().map(_.toString).sorted
    val b = DirtyGen.people(spark, 200, Array("org a", "org b")).df.collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }
  test("people: byear is uniform enough for the selectivity sweep") {
    val ds = Datasets.ppl(spark, 2000)
    val n  = ds.df.where("TRY_CAST(byear AS INT) BETWEEN 1900 AND 1949").count()
    assert(math.abs(n / 2000.0 - 0.5) < 0.1)
  }
  test("people: org values come from the OAO surface forms") {
    val forms = Datasets.orgForms(spark).toSet
    val ds = Datasets.ppl(spark, 500)
    val orig = ds.df.where("eid < 300").select("org").collect().map(_.getString(0))
    assert(orig.forall(forms.contains))
  }

  test("projects: |A| = 8 and ~11.6% duplicates") {
    val ds = Datasets.oap(spark, 1000)
    assert(ds.df.columns.length == 9)
    val dups = ds.truth.where("eid != cluster").count()
    assert(math.abs(dups / 1000.0 - 0.116) < 0.02)
  }

  test("papers: |A| = 18 and per-variant duplicate share") {
    val ds = Datasets.oagp(spark, 2000)
    assert(ds.df.columns.length == 19)
    val dups = ds.truth.where("eid != cluster").count()
    assert(math.abs(dups / 2000.0 - Datasets.OagpDupShare("200K")) < 0.02)
  }
  test("papers: only a small share references known venues (low join-percentage)") {
    val forms = Datasets.venueForms(spark).toSet
    val ds    = Datasets.oagp(spark, 2000)
    val known = ds.df.collect().count(r => forms.contains(r.getString(r.fieldIndex("venue"))))
    assert(known > 0 && known < 2000 * 0.25)
  }

  test("biblio: |A| = 4 and ~8% duplicates") {
    val ds = Datasets.dsd(spark, 1000)
    assert(ds.df.columns.length == 5)
    val dups = ds.truth.where("eid != cluster").count()
    assert(math.abs(dups / 1000.0 - 0.08) < 0.02)
  }

  test("orgs: |A| = 3, 10% duplicates, variants keep the parent's city") {
    val ds = Datasets.oao(spark, 300)
    assert(ds.df.columns.length == 4)
    assert(ds.truth.where("eid != cluster").count() == 30)
  }

  test("venues: |A| = 5 (Table 2 schema) and ~23% duplicates") {
    val ds = Datasets.oagv(spark, 200)
    assert(ds.df.columns.toSeq == Seq("eid", "title", "description", "rank", "frequency", "est"))
    val dups = ds.truth.where("eid != cluster").count()
    assert(math.abs(dups / 200.0 - 0.23) < 0.03)
  }
  test("venues: a duplicate swaps the surface form of its parent") {
    val ds = Datasets.oagv(spark, 200)
    val rows  = ds.df.collect().map(r => r.getLong(0) -> (r.getString(1), Option(r.getString(2)))).toMap
    val pairs = ds.truth.where("eid != cluster").collect().map(r => (r.getLong(0), r.getLong(1)))
    val swapped = pairs.count { case (dup, parent) =>
      rows(dup)._1 == rows(parent)._2.orNull || rows(dup)._2.contains(rows(parent)._1)
    }
    assert(swapped > pairs.length / 2)
  }

  test("truthPairs counts intra-cluster pairs") {
    val ds = Datasets.ppl(spark, 500)
    val expected = ds.truth.collect().map(r => (r.getLong(0), r.getLong(1)))
      .groupBy(_._2).values.map(g => g.size.toLong * (g.size - 1) / 2).sum
    assert(ds.truthPairs == expected)
  }

  test("every duplicate's eid is distinct from all originals") {
    val ds = Datasets.ppl(spark, 500)
    assert(ds.df.select("eid").distinct().count() == 500)
  }
}
