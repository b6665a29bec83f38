package repro.er

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.types._
import repro.SparkSpec
import repro.text.HashEmbed

class FeaturePipelineSpec extends SparkSpec {

  private val attrs = Seq("title", "artist")

  private val pairSchema = StructType(Seq(
    StructField("pair_id", LongType), StructField("label", DoubleType),
    StructField("src1", StringType), StructField("src2", StringType),
    StructField("a1", MapType(StringType, StringType)),
    StructField("a2", MapType(StringType, StringType)),
  ))

  private def pairsDF(rows: Seq[(Long, Double, Map[String, String], Map[String, String])]): DataFrame = {
    val rws = rows.map { case (id, l, a1, a2) => Row(id, l, "sA", "sB", a1, a2) }
    spark.createDataFrame(spark.sparkContext.parallelize(rws, 2), pairSchema)
  }

  private val samplePairs = pairsDF(Seq(
    (1L, 1.0, Map("title" -> "Hey Jude Remix", "artist" -> "The Beatles"),
      Map("title" -> "hey jude", "artist" -> "Beatles")),
    (2L, 0.0, Map("title" -> "Hello", "artist" -> "Adele A"),
      Map("title" -> "Hello", "artist" -> "Avril W")),
    (3L, -1.0, Map("title" -> "Yesterday"), Map("artist" -> "Beatles")),
  ))

  test("sim is the token intersection, uni the symmetric difference (Eq. 2)") {
    val df = FeaturePipeline.withTokenColumns(samplePairs, attrs).orderBy("pair_id")
    val r = df.collect()(0)
    assert(r.getSeq[String](r.fieldIndex("sim_0")).toSet == Set("hey", "jude"))
    assert(r.getSeq[String](r.fieldIndex("uni_0")).toSet == Set("remix"))
    assert(r.getSeq[String](r.fieldIndex("sim_1")).toSet == Set("beatles"))
    assert(r.getSeq[String](r.fieldIndex("uni_1")).toSet == Set("the"))
  }

  test("sim and uni are disjoint and their union is the token union") {
    val df = FeaturePipeline.withTokenColumns(samplePairs, attrs)
    df.collect().foreach { r =>
      attrs.indices.foreach { i =>
        val t1 = r.getSeq[String](r.fieldIndex(s"t1_$i")).toSet
        val t2 = r.getSeq[String](r.fieldIndex(s"t2_$i")).toSet
        val sim = r.getSeq[String](r.fieldIndex(s"sim_$i")).toSet
        val uni = r.getSeq[String](r.fieldIndex(s"uni_$i")).toSet
        assert(sim.intersect(uni).isEmpty)
        assert(sim.union(uni) == t1.union(t2))
        assert(sim == t1.intersect(t2))
      }
    }
  }

  test("features vector has length 2|A|*D (F = 2|A|, §4.2)") {
    val batch = FeaturePipeline.collectBatch(samplePairs, attrs, dim = 16)
    assert(batch.numFeatures == 4)
    batch.pairs.foreach(p => assert(p.features.length == 4 * 16))
  }

  test("missing attribute values embed as the fixed missing vector (C1)") {
    val batch = FeaturePipeline.collectBatch(samplePairs, attrs, dim = 8)
    val p3 = batch.pairs(2) // pair 3: title only on side 1, artist only on side 2
    val missing = HashEmbed.missingVector(8)
    // sim(title) is empty -> missing vector (feature 0)
    assert(p3.features.slice(0, 8).sameElements(missing))
    // sim(artist) is empty -> missing vector (feature 2)
    assert(p3.features.slice(16, 24).sameElements(missing))
    // uni(title) is non-empty -> not the missing vector
    assert(!p3.features.slice(8, 16).sameElements(missing))
  }

  test("feature embeddings equal driver-side embedSum of the token sets") {
    val batch = FeaturePipeline.collectBatch(samplePairs, attrs, dim = 8)
    val p1 = batch.pairs(0)
    val simTitle = Seq("hey", "jude") // intersection computed above
    val expected = HashEmbed.embedSum(simTitle, 8)
    val got = p1.features.slice(0, 8)
    assert(got.zip(expected).forall { case (a, b) => math.abs(a - b) < 1e-12 },
      s"got ${got.toSeq} expected ${expected.toSeq}")
  }

  test("collectBatch preserves labels, sources and pair order") {
    val batch = FeaturePipeline.collectBatch(samplePairs, attrs, dim = 4)
    assert(batch.labels.toSeq == Seq(1.0, 0.0, -1.0))
    assert(batch.pairs.forall(p => p.src1 == "sA" && p.src2 == "sB"))
  }

  test("featureMat stacks per-pair features row-wise") {
    val batch = FeaturePipeline.collectBatch(samplePairs, attrs, dim = 4)
    val m0 = batch.featureMat(0)
    assert(m0.rows == 3 && m0.cols == 4)
    assert((0 until 4).forall(d => m0(1, d) == batch.pairs(1).features(d)))
  }

  test("featureNames follow the paper's <attr>_shared/<attr>_unique naming") {
    val batch = FeaturePipeline.collectBatch(samplePairs, attrs, dim = 4)
    assert(batch.featureNames == Vector("title_shared", "title_unique", "artist_shared", "artist_unique"))
  }

  test("subset/positives/negatives filter correctly") {
    val batch = FeaturePipeline.collectBatch(samplePairs, attrs, dim = 4)
    assert(batch.positives.n == 1 && batch.negatives.n == 1)
    assert(batch.positives.pairs(0).label == 1.0)
  }

  test("tokenization inside Spark matches the driver-side Tokenizer") {
    val df = FeaturePipeline.withTokenColumns(samplePairs, attrs).orderBy("pair_id")
    val r = df.collect()(0)
    assert(r.getSeq[String](r.fieldIndex("t1_0")) ==
      repro.text.Tokenizer.tokenSet("Hey Jude Remix"))
  }

  test("pipeline feature count stats agree with DuckDB oracle") {
    // Count pairs by label via the pipeline output vs DuckDB on the raw pairs.
    import org.apache.spark.sql.functions._
    val out = FeaturePipeline.features(samplePairs, attrs, 4)
      .groupBy("label").agg(count("*").as("n")).select(col("label").cast("string").as("label"), col("n").cast("string").as("n"))
    val raw = samplePairs.select(col("pair_id").cast("string").as("pair_id"), col("label").cast("string").as("label"))
    repro.Oracle.assertEquivalent(out,
      "SELECT label, CAST(COUNT(*) AS VARCHAR) AS n FROM pairs GROUP BY label",
      "pairs" -> raw)
  }
}
