package repro

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic OLAP data at a configurable scale factor.
  *
  * SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
  * benchmarks use SF~=0.1. Generators are deterministic in (sf, seed) so
  * the DuckDB oracle sees identical input.
  */
object SynthData {
  private val NLineitemPerSf = 6_000_000L
  private val NOrdersPerSf   = 1_500_000L
  private val NCustomerPerSf =   150_000L
  private val NPartPerSf     =   200_000L

  private def n(base: Long, sf: Double): Long = math.max(1L, (base * sf).toLong)

  def lineitem(spark: SparkSession, sf: Double = 0.01, seed: Long = 0): DataFrame = {
    import spark.implicits._
    val nOrders = n(NOrdersPerSf, sf); val nPart = n(NPartPerSf, sf)
    spark.range(n(NLineitemPerSf, sf)).select(
      (rand(seed)     * nOrders + 1).cast(LongType)    as "l_orderkey",
      (rand(seed + 1) * nPart   + 1).cast(LongType)    as "l_partkey",
      (rand(seed + 2) * 7 + 1).cast(IntegerType)       as "l_linenumber",
      (rand(seed + 3) * 50 + 1).cast(DoubleType)       as "l_quantity",
      round(rand(seed + 4) * 90000 + 900, 2)           as "l_extendedprice",
      round(rand(seed + 5) * 0.10, 2)                  as "l_discount",
      round(rand(seed + 6) * 0.08, 2)                  as "l_tax",
      element_at(array(lit("N"), lit("R"), lit("A")),
                 (rand(seed + 7) * 3 + 1).cast("int")) as "l_returnflag",
      element_at(array(lit("O"), lit("F")),
                 (rand(seed + 8) * 2 + 1).cast("int")) as "l_linestatus",
      date_add(lit("1992-01-01").cast(DateType),
               (rand(seed + 9) * 2557).cast("int"))    as "l_shipdate",
    )
  }

  def orders(spark: SparkSession, sf: Double = 0.01, seed: Long = 1): DataFrame = {
    import spark.implicits._
    val nCust = n(NCustomerPerSf, sf)
    spark.range(1, n(NOrdersPerSf, sf) + 1).toDF("o_orderkey").select(
      $"o_orderkey",
      (rand(seed)     * nCust + 1).cast(LongType)             as "o_custkey",
      element_at(array(lit("O"), lit("F"), lit("P")),
                 (rand(seed + 1) * 3 + 1).cast("int"))         as "o_orderstatus",
      round(rand(seed + 2) * 500000 + 1000, 2)                 as "o_totalprice",
      date_add(lit("1992-01-01").cast(DateType),
               (rand(seed + 3) * 2406).cast("int"))            as "o_orderdate",
    )
  }

  def customer(spark: SparkSession, sf: Double = 0.01, seed: Long = 2): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NCustomerPerSf, sf) + 1).toDF("c_custkey").select(
      $"c_custkey",
      (rand(seed) * 25).cast(IntegerType)                as "c_nationkey",
      round(rand(seed + 1) * 10000 - 1000, 2)            as "c_acctbal",
      element_at(array(lit("BUILDING"), lit("AUTOMOBILE"), lit("MACHINERY"),
                       lit("HOUSEHOLD"), lit("FURNITURE")),
                 (rand(seed + 2) * 5 + 1).cast("int"))   as "c_mktsegment",
    )
  }

  def part(spark: SparkSession, sf: Double = 0.01, seed: Long = 5): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NPartPerSf, sf) + 1).toDF("p_partkey").select(
      $"p_partkey",
      element_at(array(lit("STANDARD"), lit("SMALL"), lit("MEDIUM"),
                       lit("LARGE"), lit("ECONOMY"), lit("PROMO")),
                 (rand(seed) * 6 + 1).cast("int"))              as "p_type",
      (rand(seed + 1) * 50 + 1).cast(IntegerType)               as "p_size",
      round(lit(900.0) + ($"p_partkey" % 1000) / 10.0, 2)       as "p_retailprice",
    )
  }

  /** Skewed key column — for join-skew / cardinality-estimation papers. */
  def zipfKeys(spark: SparkSession, rows: Long, nKeys: Long,
               alpha: Double = 1.1, seed: Long = 3): DataFrame = {
    import spark.implicits._
    // Inverse-CDF draw over rank weights 1/k^alpha; good enough for skew.
    val norm = (1L to math.min(nKeys, 10000L)).map(k => 1.0 / math.pow(k, alpha)).sum
    spark.range(rows).select(
      least(lit(nKeys),
            greatest(lit(1L),
              pow(lit(1.0) / (rand(seed) * norm + 1e-9), lit(1.0 / alpha)).cast(LongType)
            )) as "k",
      rand(seed + 1) as "v",
    )
  }

  def uniformKeys(spark: SparkSession, rows: Long, nKeys: Long, seed: Long = 4): DataFrame = {
    import spark.implicits._
    spark.range(rows).select(
      (rand(seed) * nKeys + 1).cast(LongType) as "k",
      rand(seed + 1)                          as "v",
    )
  }

  // ------------------------------------------------------------------
  // Temporal bipartite graphs (for the MFG reproduction).
  //
  // All generators below are hash-based (xxhash64 of the row id), not
  // rand()-based, so the edge set is fully deterministic in (params, seed)
  // regardless of partitioning -- the local/Spark/DuckDB cross-checks rely
  // on this. Edge schema: (u: long, v: long, t: long); duplicates are
  // legal and dropped by consumers (an edge is a set element).
  // ------------------------------------------------------------------

  /** Uniform hash in [0, n) derived from the row id. */
  private def hmod(idCol: Column, seed: Long, n: Long): Column =
    pmod(xxhash64(idCol, lit(seed)), lit(n))

  /** Uniform hash in (0, 1] derived from the row id. */
  private def h01(idCol: Column, seed: Long): Column =
    (pmod(xxhash64(idCol, lit(seed)), lit(1000000000L)) + 1) / lit(1.0e9)

  /** Background edges of a temporal bipartite graph: U uniform, V zipf-like
    * (popular products/conditions attract most interactions), timestamps
    * uniform over [0, nT).
    */
  def temporalBipartite(spark: SparkSession, nU: Long, nV: Long, nT: Int,
                        nEdges: Long, alphaV: Double = 1.15, seed: Long = 7): DataFrame = {
    import spark.implicits._
    // 60% of edges follow the zipf head (popular items), 40% are uniform so
    // the long tail of V is populated and |V| lands near the scaled target.
    val zipfV = least(lit(nV - 1),
      (pow(h01($"id", seed + 1), lit(-1.0 / alphaV)) - 1).cast(LongType))
    val unifV = hmod($"id", seed + 3, nV)
    spark.range(nEdges).select(
      hmod($"id", seed, nU)                           as "u",
      when(h01($"id", seed + 4) < 0.6, zipfV).otherwise(unifV) as "v",
      hmod($"id", seed + 2, nT.toLong)                as "t",
    )
  }

  /** Dense random block `[uLo, uLo+uN) x [vLo, vLo+vN) x [tLo, tLo+tN)` with
    * Bernoulli(prob) edges -- the combinatorial hot spot that makes BK-style
    * enumeration expensive (stands in for the dense communities of the real
    * KONECT graphs).
    */
  def denseBlock(spark: SparkSession, uLo: Long, uN: Long, vLo: Long, vN: Long,
                 tLo: Long, tN: Long, prob: Double, seed: Long = 11): DataFrame = {
    import spark.implicits._
    spark.range(uN * vN * tN)
      .filter(hmod($"id", seed, 1000000L) < (prob * 1e6).toLong)
      .select(
        ($"id" / (vN * tN) + uLo).cast(LongType)      as "u",
        ($"id" / tN % vN + vLo).cast(LongType)        as "v",
        ($"id" % tN + tLo).cast(LongType)             as "t",
      )
  }

  /** One planted frequency group: the V vertices `vIds` form a full biclique
    * with `gU` U-vertices at each of the given timestamps -- by construction
    * a frequency group with frequency >= |timestamps|. The U side is sampled
    * per timestamp from a small stable pool (real actors recur across time;
    * a fresh U side per timestamp would inflate static degrees far beyond
    * anything in the paper's graphs). Driver-side and deterministic in rng.
    */
  def plantedGroup(vIds: Seq[Long], timestamps: Seq[Long], gU: Int, nU: Long,
                   rng: scala.util.Random, uPool: Seq[Long] = Nil): Seq[(Long, Long, Long)] = {
    val pool =
      if (uPool.nonEmpty) uPool
      else Iterator.continually(math.floorMod(rng.nextLong(), nU)).distinct.take(gU + 3).toSeq
    timestamps.flatMap { t =>
      val us = rng.shuffle(pool).take(gU)
      for (u <- us; v <- vIds) yield (u, v, t)
    }
  }

  /** Draws a stable U pool for [[plantedGroup]]: `size` distinct U ids. */
  def uPool(size: Int, nU: Long, rng: scala.util.Random): Seq[Long] =
    Iterator.continually(math.floorMod(rng.nextLong(), nU)).distinct.take(size).toSeq
}
