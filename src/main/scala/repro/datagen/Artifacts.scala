package repro.datagen

import scala.util.Random
import NamePools._

/** Base (source-independent) entity descriptions plus the per-group data
  * artifact decisions (paper §3.2). A base entity is a pure function of
  * (params, groupId), which lets the generator recompute another group's
  * attributes without coordination — required by the cross-group events
  * (acquisition / merger), where the acquiree's records are overwritten with
  * the acquirer's attributes.
  */
object Artifacts {

  /** Deterministic RNG derived from the generation seed and any id parts. */
  def rngFor(seed: Long, parts: Long*): Random =
    new Random(parts.foldLeft(seed ^ 0x9e3779b97f4a7c15L) { (a, b) =>
      a * 6364136223846793005L + b + 1442695040888963407L
    })

  /** Per-group data-artifact switches (paper §3.2 artifacts 1, 2, 4–7;
    * artifacts 3 — acquisition/merger — are pair-level, see [[PairEvent]]).
    */
  final case class GroupArtifacts(
      acronymName: Boolean,        // (1) AcronymName
      insertCorporateTerm: Boolean, // (2) InsertCorporateTerm
      paraphrase: Boolean,         // (4) ParaphraseAttribute
      multipleIds: Boolean,        // (5) MultipleIDs
      noIdOverlaps: Boolean,       // (6) NoIdOverlaps
      multipleSecurities: Boolean  // (7) MultipleSecurities
  )

  sealed trait PairEvent
  case object NoEvent     extends PairEvent
  case object Acquisition extends PairEvent // (3a) all records become matches
  case object Merger      extends PairEvent // (3b) id pollution, NOT matches

  final case class IdSet(isin: String, cusip: String, valor: String, sedol: String)

  final case class BaseSecurity(
      secIdx: Int,
      secType: String,
      ids: IdSet,
      altIds: IdSet // used by the MultipleIDs artifact
  )

  final case class BaseCompany(
      gid: Long,
      coreTokens: Seq[String],
      suffix: String,
      altSuffix: String,
      place: (String, String, String, String, String, String),
      activity: String,
      adjective: String,
      hasDescription: Boolean,
      securities: Seq[BaseSecurity],
      artifacts: GroupArtifacts
  ) {
    def coreName: String  = coreTokens.mkString(" ")
    def countryA2: String = place._5
  }

  private val EquityTypes = Vector("Ordinary Share", "Common Stock", "Equity Shares", "Registered Shares")
  private val ExtraTypes  = Vector("Bond", "Right", "Unit")

  def groupArtifacts(p: GenParams, rng: Random): GroupArtifacts = GroupArtifacts(
    acronymName = rng.nextDouble() < p.pAcronym,
    insertCorporateTerm = rng.nextDouble() < p.pCorporateTerm,
    paraphrase = rng.nextDouble() < p.pParaphrase,
    multipleIds = rng.nextDouble() < p.pMultipleIds,
    noIdOverlaps = rng.nextDouble() < p.pNoIdOverlaps,
    multipleSecurities = rng.nextDouble() < p.pMultipleSecurities
  )

  def idSet(rng: Random, countryA2: String): IdSet =
    IdSet(isin(rng, countryA2), cusip(rng), valor(rng), sedol(rng))

  /** The pair-level event decision (paper artifact 3): consecutive groups
    * (2i, 2i+1) may be tied by an acquisition (acquirer = 2i, acquiree =
    * 2i+1 — all records of both groups become matches) or a merger (some of
    * 2i+1's security identifiers are overwritten with 2i's, while the
    * entities remain distinct).
    */
  def pairEvent(p: GenParams, pairIdx: Long): PairEvent = {
    val r = rngFor(p.seed, pairIdx, 101L).nextDouble()
    if (r < p.pAcquisition) Acquisition
    else if (r < p.pAcquisition + p.pMerger) Merger
    else NoEvent
  }

  /** Base company entity: a pure function of (params, groupId). */
  def baseCompany(p: GenParams, gid: Long): BaseCompany = {
    val rng = rngFor(p.seed, gid, 1L)
    val style = rng.nextDouble()
    val core: Seq[String] =
      if (style < 0.40) Seq(distinctWord(rng), distinctWord(rng)).distinct
      else if (style < 0.70) Seq(distinctWord(rng), pick(IndustryTerms, rng))
      else if (style < 0.82)
        // pure shared-term names ("Swiss Energy") — the paper's named source
        // of false-positive predictions among synthetic companies
        Seq(pick(GeoTerms, rng), pick(IndustryTerms, rng))
      else Seq(pick(GeoTerms, rng), pick(IndustryTerms, rng), distinctWord(rng))
    val suffix    = pick(CorporateSuffixes, rng)
    val altSuffix = pick(CorporateSuffixes.filterNot(_ == suffix), rng)
    val place     = pick(Places, rng)
    val activity  = pick(Activities, rng)
    val adjective = pick(Adjectives, rng)
    val hasDesc   = rng.nextDouble() < p.pDescription
    val art       = groupArtifacts(p, rng)

    val nEquity =
      { val r = rng.nextDouble(); if (r < 0.75) 1 else if (r < 0.95) 2 else 3 }
    val nExtra = if (art.multipleSecurities) 1 + rng.nextInt(2) else 0
    val secs = (0 until (nEquity + nExtra)).map { i =>
      val tpe =
        if (i < nEquity) pick(EquityTypes, rng)
        else ExtraTypes((i - nEquity) % ExtraTypes.size)
      BaseSecurity(i, tpe, idSet(rng, place._5), idSet(rng, place._5))
    }
    BaseCompany(gid, core, suffix, altSuffix, place, activity, adjective, hasDesc, secs, art)
  }
}
