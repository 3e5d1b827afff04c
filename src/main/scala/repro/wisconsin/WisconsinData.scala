package repro.wisconsin

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Scalable Wisconsin benchmark generator — paper Table II.
  *
  * Attribute semantics follow DeWitt's spec as reproduced in the paper:
  *
  *  - `unique2` is the declared key, sequential 0..n-1.
  *  - `unique1` is a dense set of unique values, randomly distributed —
  *    implemented as an affine permutation `(a*unique2 + b) mod n` with
  *    `gcd(a, n) = 1`, which is deterministic in (n, seed) and exactly a
  *    permutation of 0..n-1 (so selectivities are exact, as the paper
  *    relies on).
  *  - `two`/`four`/`ten`/`twenty`/`onePercent`/`tenPercent`/
  *    `twentyPercent`/`fiftyPercent` are `unique1 mod` 2/4/10/20/100/10/5/2.
  *  - `unique3 = unique1`, `evenOnePercent = onePercent*2`,
  *    `oddOnePercent = onePercent*2 + 1`.
  *  - `stringu1`/`stringu2`: 52-char strings — 7 base-26 capital letters
  *    derived from unique1/unique2, padded with 45 'x' (classic template).
  *  - `string4`: cyclic A, H, O, V.
  *
  * Paper modification for expression 13: the dataset is "modified to include
  * missing values" — here `tenPercent` is missing (null / absent in JSON)
  * whenever `unique1 mod 10 == 0`, i.e. exactly 10% of the records.
  */
object WisconsinData {

  val columns: Seq[String] = Seq(
    "unique1", "unique2", "two", "four", "ten", "twenty", "onePercent",
    "tenPercent", "twentyPercent", "fiftyPercent", "unique3",
    "evenOnePercent", "oddOnePercent", "stringu1", "stringu2", "string4")

  /** Multiplier for the unique1 permutation: smallest element of a fixed
    * prime ladder that is coprime with n, offset by the seed.
    */
  private[wisconsin] def permMultiplier(n: Long): Long = {
    val candidates = Seq(48271L, 16807L, 69621L, 40692L, 10007L, 104729L, 7L, 3L)
    candidates.find(a => BigInt(a).gcd(BigInt(n)) == 1).getOrElse(1L)
  }

  private[wisconsin] def stringFromNumber(v: Long): String = {
    val letters = new Array[Char](7)
    var x = v
    var i = 6
    while (i >= 0) { letters(i) = ('A' + (x % 26)).toChar; x /= 26; i -= 1 }
    new String(letters) + ("x" * 45)
  }

  /** Generate n records as a Spark DataFrame (the "stored in the database"
    * representation used by every PolyFrame backend).
    */
  def generate(spark: SparkSession, n: Long, seed: Long = 0): DataFrame = {
    val a = permMultiplier(n)
    val b = math.abs(seed) % math.max(1L, n)
    val strUdf = udf((v: Long) => stringFromNumber(v))
    val u1 = if (n == 0) lit(0L) else (col("id") * lit(a) + lit(b)) % lit(n)
    val onePct = (u1 % 100).cast(IntegerType)
    spark.range(n).select(
      u1.cast(LongType)                                    as "unique1",
      col("id").cast(LongType)                             as "unique2",
      (u1 % 2).cast(IntegerType)                           as "two",
      (u1 % 4).cast(IntegerType)                           as "four",
      (u1 % 10).cast(IntegerType)                          as "ten",
      (u1 % 20).cast(IntegerType)                          as "twenty",
      onePct                                               as "onePercent",
      when(u1 % 10 === 0, lit(null).cast(IntegerType))
        .otherwise((u1 % 10).cast(IntegerType))            as "tenPercent",
      (u1 % 5).cast(IntegerType)                           as "twentyPercent",
      (u1 % 2).cast(IntegerType)                           as "fiftyPercent",
      u1.cast(LongType)                                    as "unique3",
      (onePct * 2).cast(IntegerType)                       as "evenOnePercent",
      (onePct * 2 + 1).cast(IntegerType)                   as "oddOnePercent",
      strUdf(u1)                                           as "stringu1",
      strUdf(col("id"))                                    as "stringu2",
      element_at(array(lit("A"), lit("H"), lit("O"), lit("V")),
                 (col("id") % 4 + 1).cast(IntegerType))    as "string4",
    )
  }

  /** Write the dataset as a JSON-lines file (the paper generates JSON files
    * and Pandas loads them with `pd.read_json`). Missing `tenPercent`
    * values are *absent* attributes, mimicking real missing data. Returns
    * the file size in bytes.
    */
  def writeJsonLines(df: DataFrame, path: java.nio.file.Path): Long = {
    import scala.jdk.CollectionConverters._
    val lines = df.toJSON.collect()
    java.nio.file.Files.write(path, lines.toSeq.asJava)
    java.nio.file.Files.size(path)
  }

}
