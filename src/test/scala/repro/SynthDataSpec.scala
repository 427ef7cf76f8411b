package repro

import org.apache.spark.sql.functions._

import repro.core.{BruteForce, Enumerators, Params}
import repro.graph.TemporalBipartiteGraph

class SynthDataSpec extends SparkSpec {

  test("temporalBipartite: values are in range") {
    val df = SynthData.temporalBipartite(spark, nU = 50, nV = 40, nT = 10, nEdges = 2000, seed = 1)
    val row = df.agg(min("u"), max("u"), min("v"), max("v"), min("t"), max("t")).head()
    assert(row.getLong(0) >= 0 && row.getLong(1) < 50)
    assert(row.getLong(2) >= 0 && row.getLong(3) < 40)
    assert(row.getLong(4) >= 0 && row.getLong(5) < 10)
    assert(df.count() == 2000)
  }

  test("temporalBipartite: deterministic in seed, regardless of recomputation") {
    val a = SynthData.temporalBipartite(spark, 30, 30, 5, 500, seed = 7).collect().toSet
    val b = SynthData.temporalBipartite(spark, 30, 30, 5, 500, seed = 7).collect().toSet
    val c = SynthData.temporalBipartite(spark, 30, 30, 5, 500, seed = 8).collect().toSet
    assert(a == b)
    assert(a != c)
  }

  test("temporalBipartite: V side is skewed (zipf-like)") {
    val df = SynthData.temporalBipartite(spark, 1000, 1000, 5, 20000, alphaV = 1.1, seed = 3)
    val counts = df.groupBy("v").count().orderBy(desc("count")).limit(10)
      .collect().map(_.getLong(1))
    // top-10 most popular V vertices hold a disproportionate share
    assert(counts.sum > 20000 / 10, s"no skew: top10=${counts.toSeq}")
  }

  test("denseBlock: coordinates stay inside the block") {
    val df = SynthData.denseBlock(spark, uLo = 100, uN = 10, vLo = 50, vN = 8, tLo = 2, tN = 4, prob = 0.5, seed = 5)
    val row = df.agg(min("u"), max("u"), min("v"), max("v"), min("t"), max("t")).head()
    assert(row.getLong(0) >= 100 && row.getLong(1) < 110)
    assert(row.getLong(2) >= 50 && row.getLong(3) < 58)
    assert(row.getLong(4) >= 2 && row.getLong(5) < 6)
  }

  test("denseBlock: density approximates prob") {
    val df = SynthData.denseBlock(spark, 0, 20, 0, 20, 0, 10, prob = 0.5, seed = 9)
    val n = df.count().toDouble / (20 * 20 * 10)
    assert(n > 0.4 && n < 0.6, s"density $n")
  }

  test("plantedGroup: forms a full biclique at every chosen timestamp") {
    val rng = new scala.util.Random(11)
    val edges = SynthData.plantedGroup(Seq(1L, 2L, 3L), Seq(0L, 4L), gU = 3, nU = 100, rng = rng)
    val byT = edges.groupBy(_._3)
    assert(byT.keySet == Set(0L, 4L))
    for ((_, es) <- byT) {
      val us = es.map(_._1).distinct
      val vs = es.map(_._2).distinct
      assert(vs.toSet == Set(1L, 2L, 3L))
      assert(es.toSet.size == us.size * 3) // complete biclique
    }
  }

  test("planted group inside background is recovered as an MFG") {
    val rng = new scala.util.Random(123)
    val planted = SynthData.plantedGroup(Seq(200L, 201L, 202L), Seq(0L, 1L, 2L, 3L), gU = 4, nU = 60, rng = rng)
    val background = SynthData.temporalBipartite(spark, 60, 200, 6, 400, seed = 55)
    import spark.implicits._
    val df = background.union(planted.toDF("u", "v", "t"))
    val g = TemporalBipartiteGraph.fromDF(df)
    val p = Params(3, 3, 3)
    val res = Enumerators.vFree(g, p).results.get
    assert(res.exists(s => Set(200L, 201L, 202L).subsetOf(s)),
      s"planted group lost; got $res")
    assert(res == BruteForce.mfgLabels(g, p))
  }
}
