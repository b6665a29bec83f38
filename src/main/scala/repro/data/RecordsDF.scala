package repro.data

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._

/** The aligned-ontology record representation shared by every generator.
  *
  * @param id        globally unique record id
  * @param source    data-source name (website)
  * @param entityId  ground-truth entity (generator-side only; used for
  *                  labeling pairs, never exposed to models as a feature)
  * @param etype     entity type (artist / album / track / monitor / generic)
  * @param attrs     attribute name -> textual value; missing attributes are
  *                  absent from the map (challenge C1/C2)
  */
final case class Rec(id: Long, source: String, entityId: Long, etype: String,
                     attrs: Map[String, String])

object RecordsDF {
  val schema: StructType = StructType(Seq(
    StructField("id", LongType, nullable = false),
    StructField("source", StringType, nullable = false),
    StructField("entity_id", LongType, nullable = false),
    StructField("etype", StringType, nullable = false),
    StructField("attrs", MapType(StringType, StringType), nullable = false),
  ))

  /** Materializes generated records as a DataFrame (the entry point of the
    * distributed pipeline; generation itself is driver-side and seeded). */
  def toDF(spark: SparkSession, recs: Seq[Rec]): DataFrame = {
    val rows = recs.map(r => Row(r.id, r.source, r.entityId, r.etype, r.attrs))
    spark.createDataFrame(spark.sparkContext.parallelize(rows.toSeq, 8), schema)
  }
}
