package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.text.Tokenizer

class MusicGenSpec extends AnyFunSuite {
  private val cfg = MusicConfig(nArtists = 80, seed = 5)
  private lazy val recs = MusicGen.generate(cfg)

  test("generation is deterministic in the seed") {
    assert(MusicGen.generate(cfg) == MusicGen.generate(cfg))
    assert(MusicGen.generate(cfg.copy(seed = 6)) != recs)
  }

  test("all seven sources emit records") {
    assert(recs.map(_.source).toSet == MusicGen.sources.toSet)
  }

  test("three entity types are produced") {
    assert(recs.map(_.etype).toSet == Set("artist", "album", "track"))
  }

  test("attribute keys stay within the 9-attribute ontology") {
    recs.foreach(r => assert(r.attrs.keySet.subsetOf(MusicGen.attrs.toSet)))
  }

  test("every entity appears in at least two sources (pairs exist)") {
    recs.groupBy(_.entityId).foreach { case (_, rs) =>
      assert(rs.map(_.source).distinct.size >= 2)
    }
  }

  test("record ids are unique") {
    assert(recs.map(_.id).distinct.size == recs.size)
  }

  test("C1: unseen sources have more missing values than seen sources") {
    def missingRate(seen: Boolean): Double = {
      val sel = recs.filter(r => MusicGen.seenSources(r.source) == seen && r.etype == "artist")
      val fields = Seq("genre", "country", "year")
      val total = sel.size * fields.size
      val missing = sel.map(r => fields.count(f => !r.attrs.contains(f))).sum
      missing.toDouble / total
    }
    assert(missingRate(seen = false) > missingRate(seen = true) + 0.1)
  }

  test("C2: name_native_language appears only in unseen sources") {
    assert(!recs.exists(r => MusicGen.seenSources(r.source) && r.attrs.contains("name_native_language")))
    assert(recs.exists(r => !MusicGen.seenSources(r.source) && r.attrs.contains("name_native_language")))
  }

  test("C3: unseen sources abbreviate performer names to initials") {
    def abbrevRate(seen: Boolean): Double = {
      val sel = recs.filter(r => MusicGen.seenSources(r.source) == seen)
        .flatMap(_.attrs.get("main_performer"))
      val ab = sel.count(v => Tokenizer.tokens(v).forall(_.length <= 2))
      ab.toDouble / math.max(sel.size, 1)
    }
    assert(abbrevRate(seen = false) > 0.5)
    assert(abbrevRate(seen = true) < 0.1)
  }

  test("weak labels: album records sometimes carry the artist entity id (Music-1M)") {
    val noisy = MusicGen.generate(cfg.copy(weakLabelNoise = 0.2))
    val albumRecs = noisy.filter(_.etype == "album")
    assert(albumRecs.exists(_.entityId < MusicGen.AlbumBase), "expected mixed-type label noise")
    assert(recs.filter(_.etype == "album").forall(_.entityId >= MusicGen.AlbumBase))
  }

  test("entity id spaces are disjoint per type without weak labels") {
    val byType = recs.groupBy(_.etype)
    assert(byType("artist").forall(_.entityId < MusicGen.AlbumBase))
    assert(byType("album").forall(r => r.entityId >= MusicGen.AlbumBase && r.entityId < MusicGen.TrackBase))
    assert(byType("track").forall(_.entityId >= MusicGen.TrackBase))
  }

  test("matching artists share name tokens in the seen domain") {
    val seenArtists = recs.filter(r => r.etype == "artist" && MusicGen.seenSources(r.source))
    val byEntity = seenArtists.groupBy(_.entityId).filter(_._2.size >= 2)
    val shareRate = byEntity.values.count { rs =>
      val t = rs.toList.flatMap(_.attrs.get("name")).map(Tokenizer.tokenSet(_).toSet)
      t.size >= 2 && t.head.intersect(t(1)).nonEmpty
    }.toDouble / byEntity.size
    assert(shareRate > 0.8, s"share rate $shareRate")
  }
}

class MonitorGenSpec extends AnyFunSuite {
  private val cfg = MonitorConfig(nMonitors = 120, seed = 3)
  private lazy val recs = MonitorGen.generate(cfg)

  test("generation is deterministic in the seed") {
    assert(MonitorGen.generate(cfg) == MonitorGen.generate(cfg))
  }

  test("24 sources, 5 seen (Table 2)") {
    assert(MonitorGen.sources.size == 24 && MonitorGen.seenSources.size == 5)
    assert(MonitorGen.sources.distinct.size == 24)
  }

  test("13 attributes with exactly 5 target-only (Fig. 11)") {
    assert(MonitorGen.attrs.size == 13 && MonitorGen.targetOnlyAttrs.size == 5)
    assert(MonitorGen.targetOnlyAttrs.subsetOf(MonitorGen.attrs.toSet))
  }

  test("C2: target-only attributes never appear in seen sources") {
    val seen = recs.filter(r => MonitorGen.seenSources.contains(r.source))
    seen.foreach(r => assert(r.attrs.keySet.intersect(MonitorGen.targetOnlyAttrs).isEmpty))
    val unseen = recs.filterNot(r => MonitorGen.seenSources.contains(r.source))
    assert(MonitorGen.targetOnlyAttrs.forall(a => unseen.exists(_.attrs.contains(a))))
  }

  test("page_title and source are near-universal (App. A.2)") {
    val titleRate = recs.count(_.attrs.contains("page_title")).toDouble / recs.size
    val sourceRate = recs.count(_.attrs.contains("source")).toDouble / recs.size
    assert(titleRate > 0.9 && sourceRate == 1.0)
  }

  test("most other attributes are sparse (C1)") {
    Seq("model_name", "resolution", "price").foreach { a =>
      val rate = recs.count(_.attrs.contains(a)).toDouble / recs.size
      assert(rate < 0.55, s"$a rate $rate")
    }
  }

  test("C3: prod_type token distributions differ between domains") {
    val seenVals = recs.filter(r => MonitorGen.seenSources.contains(r.source)).flatMap(_.attrs.get("prod_type")).toSet
    val unseenVals = recs.filterNot(r => MonitorGen.seenSources.contains(r.source)).flatMap(_.attrs.get("prod_type")).toSet
    assert(seenVals.isEmpty || seenVals.intersect(unseenVals).isEmpty)
    assert(unseenVals.nonEmpty)
  }

  test("every monitor appears in at least two sources") {
    recs.groupBy(_.entityId).foreach { case (_, rs) => assert(rs.map(_.source).distinct.size >= 2) }
  }

  test("page_title contains brand and model tokens (matchable)") {
    val withBrand = recs.filter(_.attrs.contains("page_title"))
    val sameEntity = withBrand.groupBy(_.entityId).filter(_._2.size >= 2)
    val shared = sameEntity.values.count { rs =>
      val t = rs.toList.map(r => Tokenizer.tokenSet(r.attrs("page_title")).toSet)
      t.head.intersect(t(1)).size >= 2
    }
    assert(shared.toDouble / sameEntity.size > 0.9)
  }
}

class BenchmarkGenSpec extends AnyFunSuite {

  test("table7Configs covers the 11 Table 7 rows") {
    assert(BenchmarkGen.table7Configs.size == 11)
    assert(BenchmarkGen.table7Configs.count(_.dirtyRate > 0) == 4)
    assert(BenchmarkGen.table7Configs.map(_.name).distinct.size == 11)
  }

  test("every entity appears in both catalogs") {
    val recs = BenchmarkGen.generate(BenchConfig("t", "d", 50, noise = 0.1))
    recs.groupBy(_.entityId).foreach { case (_, rs) =>
      assert(rs.map(_.source).toSet == Set("src_a", "src_b"))
    }
  }

  test("zero noise yields identical titles across catalogs") {
    val recs = BenchmarkGen.generate(BenchConfig("t", "d", 30, noise = 0.0))
    recs.groupBy(_.entityId).foreach { case (_, rs) =>
      val titles = rs.map(_.attrs("title")).toSet
      assert(titles.size == 1)
    }
  }

  test("dirty transform displaces values across columns") {
    val clean = BenchmarkGen.generate(BenchConfig("t", "d", 100, noise = 0.0))
    val dirty = BenchmarkGen.generate(BenchConfig("t", "d", 100, noise = 0.0, dirtyRate = 0.5))
    // In dirty data some categories must land in non-category columns.
    val cleanCats = clean.flatMap(_.attrs.get("category")).toSet
    val displaced = dirty.exists { r =>
      r.attrs.exists { case (k, v) => k != "category" && Tokenizer.tokens(v).exists(cleanCats.contains) }
    }
    assert(displaced)
  }

  test("noise knob orders dataset difficulty (token overlap decreases)") {
    def avgOverlap(noise: Double): Double = {
      val recs = BenchmarkGen.generate(BenchConfig("t", "d", 80, noise = noise))
      val byE = recs.groupBy(_.entityId)
      val js = byE.values.map { rs =>
        val t = rs.toList.map(r => Tokenizer.tokenSet(r.attrs.getOrElse("title", "")).toSet)
        if (t.head.isEmpty && t(1).isEmpty) 0.0
        else t.head.intersect(t(1)).size.toDouble / t.head.union(t(1)).size
      }
      js.sum / js.size
    }
    assert(avgOverlap(0.05) > avgOverlap(0.5) + 0.2)
  }

  test("generation is deterministic") {
    val c = BenchConfig("Beer", "Product", 40, noise = 0.2)
    assert(BenchmarkGen.generate(c) == BenchmarkGen.generate(c))
  }
}
