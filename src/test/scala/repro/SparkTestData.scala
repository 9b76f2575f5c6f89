package repro

import org.apache.spark.sql.SparkSession
import repro.data.{DatasetGroup, MultiSourceGen, SourceCatalog}

/** Shared on-disk Parquet fixtures for the Spark-path suites: the coyo
  * group at unit-test scale, written once per JVM under target/.
  */
object SparkTestData {
  val dir = "target/test-data/sources"
  val group: DatasetGroup = SourceCatalog.coyo700m

  @volatile private var written = false
  def ensure(spark: SparkSession): Unit = synchronized {
    if (!written) {
      // SF=0.01-equivalent: a few hundred rows per source.
      MultiSourceGen.writeGroupParquet(spark, group, dir, sf = 0.01, baseRowsPerSource = 20000L)
      written = true
    }
  }
}
