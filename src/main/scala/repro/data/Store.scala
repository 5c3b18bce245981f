package repro.data

import java.nio.file.{Files, Path}
import org.apache.spark.sql.{DataFrame, SaveMode, SparkSession}

/** Parquet-on-local-FS storage layer — the role PostgreSQL plays in the
  * paper (§VII-B: "The RDBMS is utilized primarily for storage of relations
  * and all algorithm logic is implemented on top").
  *
  * Base tables are written once; M-* algorithms additionally materialize
  * the join result T here and read it back every iteration; S- and F-
  * algorithms re-read the base tables instead.
  */
final class Store(spark: SparkSession, val root: Path) {

  private def pathOf(name: String): String = root.resolve(name).toString

  /** Persist `df` as table `name` (overwrite). Returns the re-read frame so
    * downstream passes scan Parquet, not the generator's lineage.
    */
  def write(name: String, df: DataFrame): DataFrame = {
    df.write.mode(SaveMode.Overwrite).parquet(pathOf(name))
    read(name)
  }

  /** Read table `name` from Parquet. */
  def read(name: String): DataFrame = spark.read.parquet(pathOf(name))

  /** Total on-disk size of table `name` in bytes (I/O accounting). */
  def sizeBytes(name: String): Long = {
    val dir = root.resolve(name).toFile
    Option(dir.listFiles()).map(_.filter(_.isFile).map(_.length()).sum).getOrElse(0L)
  }

  /** Delete everything under this store. */
  def close(): Unit = {
    def rm(f: java.io.File): Unit = {
      Option(f.listFiles()).foreach(_.foreach(rm))
      f.delete(): Unit
    }
    rm(root.toFile)
  }
}

object Store {
  /** Fresh store under a temp directory. */
  def temp(spark: SparkSession, prefix: String = "repro-store"): Store =
    new Store(spark, Files.createTempDirectory(prefix))
}
