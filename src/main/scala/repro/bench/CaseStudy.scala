package repro.bench

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.SynthData
import repro.core.Params

/** Synthetic stand-in for the D1 (MIMIC-III) patient–condition graph used
  * by the Table 3 case study. U = patients, V = health conditions (named
  * after the conditions the paper reports), timestamps = diagnosis periods.
  *
  * Multimorbidity clusters are planted so that the condition combinations
  * the paper surfaces re-appear: each cluster is diagnosed together for a
  * few patients at many distinct timestamps, with *different* patients at
  * different timestamps — which is exactly what makes MFG find them, MFB
  * (which pins both sides) find nothing, and MSG (static) blur them into
  * oversized groups.
  */
object CaseStudy {

  val params: Params = Params(tauU = 2, tauV = 2, lambda = 6)

  /** Condition names; ids are indices into this list. */
  val conditions: Vector[String] = Vector(
    "SEPSIS", "PNEUMONIA", "GASTROINTESTINAL BLEED", "LOWER GI BLEED",
    "UPPER GI BLEED", "ASTHMA", "COPD EXACERBATION", "CHRONIC OBST PULM DISEASE",
    "RESPIRATORY FAILURE", "HYPERTENSIVE EMERGENCY", "HYPERTENSIVE URGENCY",
    "ABDOMINAL PAIN", "DIABETIC KETOACIDOSIS", "CHEST PAIN", "CONGESTIVE HEART FAILURE",
    "ALTERED MENTAL STATUS", "ACUTE RENAL FAILURE", "UROSEPSIS", "FEVER", "CELLULITIS",
  ) ++ (20 until 48).map(i => s"CONDITION_$i")

  /** The multimorbidity clusters the paper's Table 3 reports for MFG. */
  val plantedClusters: Seq[Seq[String]] = Seq(
    Seq("SEPSIS", "PNEUMONIA"),
    Seq("GASTROINTESTINAL BLEED", "LOWER GI BLEED"),
    Seq("ASTHMA", "COPD EXACERBATION", "PNEUMONIA"),
    Seq("UPPER GI BLEED", "LOWER GI BLEED"),
  )

  val nPatients: Long = 3000
  val nT: Int = 25

  def conditionId(name: String): Long = conditions.indexOf(name).toLong
  def conditionName(id: Long): String = conditions(id.toInt)

  /** Patient–condition temporal edges (u = patient, v = condition id). */
  def edges(spark: SparkSession): DataFrame = {
    import spark.implicits._
    val rng = new scala.util.Random(20240816L)
    // each planted cluster: diagnosed together for ≥ τ_U patients at ≥ 10
    // distinct timestamps, different patients per timestamp
    val plantedEdges: Seq[(Long, Long, Long)] = plantedClusters.flatMap { cluster =>
      val vIds = cluster.map(conditionId)
      val ts = rng.shuffle((0L until nT.toLong).toList).take(10)
      SynthData.plantedGroup(vIds, ts, gU = 3, nU = nPatients, rng)
    }
    // zipf background of unrelated diagnoses (common conditions dominate)
    val background = SynthData.temporalBipartite(
      spark, nU = nPatients, nV = conditions.length.toLong, nT = nT,
      nEdges = 6000, alphaV = 1.05, seed = 42)
    background.union(plantedEdges.toDF("u", "v", "t"))
  }
}
