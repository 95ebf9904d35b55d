package repro.datagen

import repro.SparkSpec
import Artifacts._
import EmDatasets._

class EmDatasetsSpec extends SparkSpec {

  private val p = GenParams.synthetic(nGroups = 300, seed = 7L)
  private lazy val data = {
    val d = EmDatasets.generate(spark, p)
    EmData(d.companies.cache(), d.securities.cache())
  }
  private lazy val companies  = data.companies.collect().toSeq
  private lazy val securities = data.securities.collect().toSeq

  test("generation is deterministic") {
    val again = EmDatasets.generate(spark, p).companies.collect().toSeq
    assert(companies.sortBy(_.recordId) == again.sortBy(_.recordId))
  }

  test("every group produces at least one company record") {
    val gids = companies.map(_.recordId / 16).toSet
    assert(gids == (0L until p.nGroups.toLong).toSet)
  }

  test("record ids are unique") {
    assert(companies.map(_.recordId).distinct.size == companies.size)
    assert(securities.map(_.recordId).distinct.size == securities.size)
  }

  test("company and security record id spaces do not overlap") {
    assert(companies.forall(_.recordId < SecurityIdOffset))
    assert(securities.forall(_.recordId >= SecurityIdOffset))
  }

  test("sources are within range and at most one company record per source per group") {
    assert(companies.forall(c => c.source >= 1 && c.source <= p.nSources))
    companies.groupBy(_.recordId / 16).values.foreach { g =>
      assert(g.map(_.source).distinct.size == g.size)
    }
  }

  test("records per company entity matches presence parameter") {
    val avg = companies.size.toDouble / p.nGroups
    val expected = p.nSources * p.companyPresence
    assert(math.abs(avg - expected) < 0.5, s"avg records/group $avg vs $expected")
  }

  test("share of records with descriptions is near the paper's 32%") {
    val share = companies.count(_.description != null).toDouble / companies.size
    assert(share > 0.20 && share < 0.45, s"description share $share")
  }

  test("acquisition pairs share one company entity id") {
    val acqPairs = (0L until (p.nGroups / 2).toLong).filter(pairEvent(p, _) == Acquisition)
    assert(acqPairs.nonEmpty)
    acqPairs.foreach { i =>
      val g0 = 2 * i; val g1 = 2 * i + 1
      val recsB = companies.filter(_.recordId / 16 == g1)
      assert(recsB.nonEmpty)
      assert(recsB.forall(_.entityId == g0), s"pair $i acquiree not merged")
    }
  }

  test("non-event pairs keep separate entity ids") {
    val nonePairs = (0L until (p.nGroups / 2).toLong).filter(pairEvent(p, _) == NoEvent)
    nonePairs.foreach { i =>
      val g1 = 2 * i + 1
      assert(companies.filter(_.recordId / 16 == g1).forall(_.entityId == g1))
    }
  }

  test("merger pairs keep separate entity ids but share identifiers") {
    val merPairs = (0L until (p.nGroups / 2).toLong).filter(pairEvent(p, _) == Merger)
    assert(merPairs.nonEmpty)
    var sharedIdSomewhere = false
    merPairs.foreach { i =>
      val g0 = 2 * i; val g1 = 2 * i + 1
      assert(companies.filter(_.recordId / 16 == g1).forall(_.entityId == g1))
      val secA = securities.filter(_.issuerEntityId == g0)
      val secB = securities.filter(s => s.recordId >= SecurityIdOffset &&
        (s.recordId - SecurityIdOffset) / 16 / 8 == g1)
      val idsA = secA.flatMap(s => Seq(s.isin, s.cusip, s.valor, s.sedol)).filter(_ != null).toSet
      val idsB = secB.flatMap(s => Seq(s.isin, s.cusip, s.valor, s.sedol)).filter(_ != null).toSet
      if (idsA.intersect(idsB).nonEmpty) sharedIdSomewhere = true
    }
    assert(sharedIdSomewhere, "no merger pair shares identifiers — id pollution missing")
  }

  test("acquisition merges the primary security entity") {
    val acqPairs = (0L until (p.nGroups / 2).toLong).filter(pairEvent(p, _) == Acquisition)
    acqPairs.foreach { i =>
      val g0 = 2 * i; val g1 = 2 * i + 1
      val primB = securities.filter(s =>
        (s.recordId - SecurityIdOffset) / 16 == g1 * 8 + 0)
      assert(primB.forall(_.entityId == securityEntityId(g0, 0)))
      assert(primB.forall(_.issuerEntityId == g0))
    }
  }

  test("issuer record ids point at a company record in the same source") {
    val companyIds = companies.map(c => (c.recordId, c.source)).toMap
    securities.filter(_.issuerRecordId != -1L).foreach { s =>
      assert(companyIds.get(s.issuerRecordId).contains(s.source),
        s"security ${s.recordId} issuer link broken")
    }
  }

  test("noIdOverlaps groups have no identifiers on primary securities") {
    val wiped = (0L until p.nGroups.toLong)
      .filter(g => baseCompany(p, g).artifacts.noIdOverlaps)
      // acquisitions overwrite ids in updated sources, so exclude event pairs
      .filter(g => pairEvent(p, g / 2) == NoEvent)
    assert(wiped.nonEmpty)
    wiped.foreach { g =>
      val secs = securities.filter(s => (s.recordId - SecurityIdOffset) / 16 / 8 == g)
      assert(secs.forall(s => s.isin == null && s.cusip == null && s.valor == null && s.sedol == null))
    }
  }

  test("multipleIds groups use two id sets on the primary security") {
    val g = (0L until p.nGroups.toLong).find { g =>
      val b = baseCompany(p, g)
      b.artifacts.multipleIds && !b.artifacts.noIdOverlaps && pairEvent(p, g / 2) == NoEvent
    }
    assert(g.nonEmpty, "no multipleIds group generated at this size/seed")
  }

  test("most groups have identifier overlap across their security records") {
    // sanity: the easy ID-matched majority must exist (paper §3.3)
    val byEntity = securities.filter(_.isin != null).groupBy(_.entityId)
    val overlapping = byEntity.values.count { g =>
      g.map(_.isin).distinct.size < g.size || g.size == 1
    }
    assert(overlapping.toDouble / byEntity.size > 0.6)
  }

  test("security type variety includes generic names") {
    val genericShare = securities.count(s => s.name == s.secType).toDouble / securities.size
    assert(genericShare > 0.25 && genericShare < 0.55, s"generic name share $genericShare")
  }

  test("real params produce 8 sources and longer descriptions") {
    val rp = GenParams.real(nGroups = 60, seed = 3L)
    val rd = EmDatasets.generate(spark, rp)
    val recs = rd.companies.collect().toSeq
    assert(recs.map(_.source).max <= 8)
    val descs = recs.flatMap(r => Option(r.description))
    assert(descs.nonEmpty)
    val sDescs = companies.flatMap(r => Option(r.description))
    assert(descs.map(_.length).max > sDescs.map(_.length).max)
  }

  test("ground truth matches per entity is in the paper ballpark (~7.5)") {
    val pairsPerEntity = companies.groupBy(_.entityId).values.map { g =>
      g.size.toLong * (g.size - 1) / 2
    }
    val totalEntities = companies.map(_.entityId).distinct.size
    val avg = pairsPerEntity.sum.toDouble / totalEntities
    assert(avg > 5.0 && avg < 11.0, s"avg matches/entity $avg")
  }
}
