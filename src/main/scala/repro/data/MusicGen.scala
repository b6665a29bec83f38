package repro.data

import repro.linalg.Rng

/** Synthetic analog of the paper's Music-3K / Music-1M corpora (Table 2):
  * 7 websites, 3 entity types (artist / album / track), 9 textual
  * attributes, with the three MEL challenges injected per data source:
  *
  *  - '''C1 missing values''': every attribute is dropped with a per-source
  *    probability (higher in unseen sources).
  *  - '''C2 new attributes''': `name_native_language` is empty in the seen
  *    sources (site1-3) and populated in the unseen ones (site4-7) — an
  *    attribute the source-domain labels can never teach a model to use.
  *  - '''C3 value-distribution shift''': unseen sources abbreviate performer
  *    names to initials ("neil diamond" -> "n d") and append filler tokens
  *    to titles ("official", "audio", ...), mirroring Fig. 1's example.
  *
  * Music-1M's weak labeling (hyperlink-following, with mixed-type errors
  * such as matching an artist to her album, §5.1) is reproduced by emitting
  * a fraction of album/track records under their *artist's* ground-truth
  * entity id (`weakLabelNoise`).
  */
final case class MusicConfig(
    nArtists: Int = 260,
    seed: Long = 42,
    weakLabelNoise: Double = 0.0,
    pPresent: Double = 0.45,
    pAbbrevTarget: Double = 0.90,
    pMissingSeen: Double = 0.05,
    pMissingTarget: Double = 0.30,
    pNativeLang: Double = 0.80,
    pTitleNoiseTarget: Double = 0.50,
    pTypoSeen: Double = 0.03,
    pTypoTarget: Double = 0.08,
)

object MusicGen {
  val sources: Vector[String] = (1 to 7).map(i => s"site$i").toVector
  val seenSources: Set[String] = Set("site1", "site2", "site3")

  /** The aligned 9-attribute ontology (paper Table 2: |A| = 9). */
  val attrs: Vector[String] = Vector(
    "name", "main_performer", "name_native_language", "source",
    "title", "album", "genre", "country", "year")

  val ArtistBase = 0L
  val AlbumBase = 1000000L
  val TrackBase = 2000000L

  private final case class Artist(id: Long, first: String, last: String,
                                  genre: String, country: String, year: Int)
  private final case class Album(id: Long, artist: Artist, title: Seq[String], year: Int)
  private final case class Track(id: Long, album: Album, title: Seq[String], version: String)

  def generate(cfg: MusicConfig): Seq[Rec] = {
    val rng = new Rng(cfg.seed)
    // Shared pools create cross-entity token collisions -> hard negatives.
    val firstPool = Vocab.distinctWords(rng, math.max(40, cfg.nArtists / 4))
    val lastPool = Vocab.distinctWords(rng, math.max(50, cfg.nArtists / 3))
    val titlePool = Vocab.distinctWords(rng, math.max(80, cfg.nArtists))

    val artists = (0 until cfg.nArtists).map { i =>
      Artist(ArtistBase + i, rng.pick(firstPool), rng.pick(lastPool),
        rng.pick(Vocab.genres), rng.pick(Vocab.countries), 1960 + rng.nextInt(60))
    }
    var albumId = AlbumBase
    val albums = artists.flatMap { a =>
      (0 until (1 + rng.nextInt(2))).map { _ =>
        albumId += 1
        Album(albumId, a, Seq.fill(2 + rng.nextInt(2))(rng.pick(titlePool)), a.year + rng.nextInt(20))
      }
    }
    var trackId = TrackBase
    val tracks = albums.flatMap { al =>
      (0 until (1 + rng.nextInt(2))).map { _ =>
        trackId += 1
        Track(trackId, al, al.title.take(1) ++ Seq(rng.pick(titlePool)), rng.pick(Vocab.versionTokens))
      }
    }

    var recId = 0L
    val out = Vector.newBuilder[Rec]

    // Weak-label decisions draw from a per-record side stream, NOT the main
    // rng: generations with and without `weakLabelNoise` therefore emit
    // token-identical records and differ only in the ground-truth entity ids
    // of the mislabeled records. The bench exploits this to train on the
    // weakly-labeled corpus and evaluate on the clean labels, as the paper
    // does ("Music-1M shares the same testing set as Music-3K", §5.1).
    def weakEid(trueEid: Long, hyperlinkEid: Long, rid: Long): Long =
      if (cfg.weakLabelNoise > 0 &&
          new Rng(rid * 0x9E3779B9L + cfg.seed).nextBoolean(cfg.weakLabelNoise)) hyperlinkEid
      else trueEid

    def presentSources(): Seq[String] = {
      var chosen = sources.filter(_ => rng.nextBoolean(cfg.pPresent))
      while (chosen.size < 2) chosen = sources.filter(_ => rng.nextBoolean(cfg.pPresent))
      chosen
    }

    def typo(tokens: Seq[String], p: Double): Seq[String] =
      tokens.map(t => if (t.length > 3 && rng.nextBoolean(p)) t.dropRight(1) else t)

    def corrupt(value: Seq[String], seen: Boolean, pMissOverride: Option[Double] = None): Option[String] = {
      val pMiss = pMissOverride.getOrElse(if (seen) cfg.pMissingSeen else cfg.pMissingTarget)
      if (rng.nextBoolean(pMiss)) None
      else Some(typo(value, if (seen) cfg.pTypoSeen else cfg.pTypoTarget).mkString(" "))
    }

    def performer(a: Artist, seen: Boolean): Seq[String] = {
      val full = Seq(a.first, a.last)
      if (!seen && rng.nextBoolean(cfg.pAbbrevTarget)) Vocab.abbreviate(full) else full
    }

    def nativeLang(a: Artist, seen: Boolean): Option[String] =
      if (!seen && rng.nextBoolean(cfg.pNativeLang))
        Some(Seq(a.first, a.last).map(Vocab.transliterate).mkString(" "))
      else None

    def sourceAttr(src: String, a: Artist): String = s"$src ${a.genre}sec"

    def titled(base: Seq[String], seen: Boolean): Seq[String] =
      if (!seen && rng.nextBoolean(cfg.pTitleNoiseTarget)) base :+ rng.pick(Vocab.fillerTokens)
      else base

    def emit(entityId: Long, etype: String, src: String, kv: Seq[(String, Option[String])]): Unit = {
      recId += 1
      out += Rec(recId, src, entityId, etype,
        kv.collect { case (k, Some(v)) if v.nonEmpty => k -> v }.toMap)
    }

    artists.foreach { a =>
      presentSources().foreach { src =>
        val seen = seenSources(src)
        emit(a.id, "artist", src, Seq(
          "name" -> corrupt(performer(a, seen), seen, Some(0.02)),
          "main_performer" -> corrupt(performer(a, seen), seen),
          "name_native_language" -> nativeLang(a, seen),
          "source" -> Some(sourceAttr(src, a)),
          "title" -> None,
          "album" -> None,
          "genre" -> corrupt(Seq(a.genre), seen),
          "country" -> corrupt(Seq(a.country), seen),
          "year" -> corrupt(Seq(s"y${a.year}"), seen),
        ))
      }
    }

    albums.foreach { al =>
      presentSources().foreach { src =>
        val seen = seenSources(src)
        val eid = weakEid(al.id, al.artist.id, recId + 1)
        emit(eid, "album", src, Seq(
          "name" -> corrupt(al.title, seen),
          "main_performer" -> corrupt(performer(al.artist, seen), seen),
          "name_native_language" -> nativeLang(al.artist, seen),
          "source" -> Some(sourceAttr(src, al.artist)),
          "title" -> corrupt(titled(al.title, seen), seen, Some(if (seen) 0.02 else 0.1)),
          "album" -> corrupt(al.title, seen),
          "genre" -> corrupt(Seq(al.artist.genre), seen),
          "country" -> corrupt(Seq(al.artist.country), seen),
          "year" -> corrupt(Seq(s"y${al.year}"), seen),
        ))
      }
    }

    tracks.foreach { tr =>
      presentSources().foreach { src =>
        val seen = seenSources(src)
        val eid = weakEid(tr.id, tr.album.id, recId + 1)
        // Track diversity (paper §5.2): version tokens vary per site emission.
        val version = if (rng.nextBoolean(0.3)) rng.pick(Vocab.versionTokens) else tr.version
        emit(eid, "track", src, Seq(
          "name" -> corrupt(tr.title, seen),
          "main_performer" -> corrupt(performer(tr.album.artist, seen), seen),
          "name_native_language" -> nativeLang(tr.album.artist, seen),
          "source" -> Some(sourceAttr(src, tr.album.artist)),
          "title" -> corrupt(titled(tr.title :+ version, seen), seen, Some(if (seen) 0.02 else 0.1)),
          "album" -> corrupt(tr.album.title, seen),
          "genre" -> corrupt(Seq(tr.album.artist.genre), seen),
          "country" -> corrupt(Seq(tr.album.artist.country), seen),
          "year" -> corrupt(Seq(s"y${tr.album.year}"), seen),
        ))
      }
    }

    out.result()
  }
}
