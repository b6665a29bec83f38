package repro.data

import repro.linalg.Rng

/** Synthetic analogs of the DeepMatcher-era public benchmarks used in the
  * paper's Table 7 (single-domain scenario, no C1-C3 challenges).
  *
  * Each config is one benchmark row: two catalogs ("src_a", "src_b") over a
  * shared clean schema (title / manufacturer / category / price / extra);
  * every entity appears in both catalogs with per-catalog token noise.
  * Difficulty is governed by `noise` (token corruption probability) and
  * `hardNegShare`; "dirty" benchmarks additionally displace attribute
  * values into the wrong column with probability `dirtyRate` — the standard
  * transform used to derive the dirty variants of these benchmarks.
  *
  * The per-config knobs are set to mimic each benchmark's observed hardness
  * ordering (Fodors-Zagats ~ trivial ... Walmart-Amazon ~ hard); absolute F1
  * is not the reproduction target, the DeepMatcher-vs-AdaMEL gap shape is.
  */
final case class BenchConfig(
    name: String,
    domain: String,
    nEntities: Int,
    noise: Double,
    dirtyRate: Double = 0.0,
    seed: Long = 2021,
)

object BenchmarkGen {
  val attrs: Vector[String] = Vector("title", "manufacturer", "category", "price", "extra")
  val sources: Vector[String] = Vector("src_a", "src_b")
  val seenSources: Set[String] = Set("src_a", "src_b")

  /** The 11 rows of Table 7 (7 structured + 4 dirty). */
  val table7Configs: Seq[BenchConfig] = Seq(
    BenchConfig("Amazon-Google", "Software", 300, noise = 0.45),
    BenchConfig("Beer", "Product", 120, noise = 0.25),
    BenchConfig("DBLP-ACM", "Citation", 300, noise = 0.06),
    BenchConfig("DBLP-Google", "Citation", 300, noise = 0.12),
    BenchConfig("Fodors-Zagats", "Restaurant", 120, noise = 0.03),
    BenchConfig("iTunes-Amazon", "Music", 120, noise = 0.15),
    BenchConfig("Walmart-Amazon", "Electronics", 300, noise = 0.50),
    BenchConfig("DBLP-ACM-dirty", "Citation", 300, noise = 0.06, dirtyRate = 0.35),
    BenchConfig("DBLP-Google-dirty", "Citation", 300, noise = 0.12, dirtyRate = 0.35),
    BenchConfig("iTunes-Amazon-dirty", "Music", 120, noise = 0.15, dirtyRate = 0.35),
    BenchConfig("Walmart-Amazon-dirty", "Electronics", 300, noise = 0.50, dirtyRate = 0.35),
  )

  def generate(cfg: BenchConfig): Seq[Rec] = {
    val rng = new Rng(cfg.seed ^ cfg.name.hashCode.toLong)
    val titlePool = Vocab.distinctWords(rng, math.max(60, cfg.nEntities / 2))
    val makerPool = Vocab.distinctWords(rng, 25)
    val catPool = Vocab.distinctWords(rng, 10)

    final case class Entity(id: Long, title: Seq[String], maker: String, cat: String,
                            price: Int, extra: Seq[String])
    val entities = (1 to cfg.nEntities).map { i =>
      Entity(i.toLong, Seq.fill(3 + rng.nextInt(2))(rng.pick(titlePool)), rng.pick(makerPool),
        rng.pick(catPool), 10 + rng.nextInt(500), Seq.fill(2)(rng.pick(titlePool)))
    }

    def noisy(tokens: Seq[String]): Seq[String] = tokens.flatMap { t =>
      if (rng.nextBoolean(cfg.noise)) {
        rng.nextInt(3) match {
          case 0 => Seq.empty            // drop
          case 1 => Seq(t.dropRight(1))  // typo
          case _ => Seq(t, rng.pick(Vocab.fillerTokens)) // insert
        }
      } else Seq(t)
    }

    var recId = 0L
    entities.flatMap { e =>
      sources.map { src =>
        recId += 1
        var kv: Map[String, String] = Map(
          "title" -> noisy(e.title).mkString(" "),
          "manufacturer" -> noisy(Seq(e.maker)).mkString(" "),
          "category" -> e.cat,
          "price" -> s"p${e.price + rng.nextInt(6) - 3}",
          "extra" -> noisy(e.extra).mkString(" "),
        ).filter(_._2.nonEmpty)
        // Dirty transform: displace a value into another column.
        if (cfg.dirtyRate > 0) {
          kv.keys.toSeq.foreach { k =>
            if (rng.nextBoolean(cfg.dirtyRate)) {
              val dst = rng.pick(attrs.filter(_ != k))
              val v = kv(k)
              kv = (kv - k) + (dst -> (kv.getOrElse(dst, "") + " " + v).trim)
            }
          }
        }
        Rec(recId, src, e.id, "generic", kv)
      }
    }
  }
}
