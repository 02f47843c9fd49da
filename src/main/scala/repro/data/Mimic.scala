package repro.data

import org.apache.spark.sql.SparkSession
import repro.core.Query._
import repro.core.Schema._
import scala.util.Random

/** Synthetic MIMIC-III-style hospital database (paper Section 5, schema of
  * Figure 6).
  *
  * MIMIC-III is a restricted-access clinical dataset, so we generate a
  * synthetic stand-in with the correlations the paper's case study
  * surfaces (Table 6): Medicare admissions skew old/emergency/male with a
  * higher death rate, neoplasm diagnoses (chapter 2) are deadlier than
  * musculoskeletal ones (chapter 13), ICU length-of-stay tracks hospital
  * stay length (and chapter-16 procedures), Hispanic patients skew
  * younger/Catholic with slightly more procedures than Asian patients.
  * sf=1 ≈ 12k admissions.
  */
object Mimic {

  final case class AdmissionRow(hadm_id: Int, subject_id: Int, admission_type: String,
                                admission_location: String, insurance: String, marital_status: String,
                                hospital_stay_length: Double, hospital_expire_flag: Int)
  final case class PatientRow(subject_id: Int, gender: String, expire_flag: Int)
  final case class PaiRow(hadm_id: Int, subject_id: Int, age: Double, language: String,
                          religion: String, ethnicity: String)
  final case class DiagnosisRow(subject_id: Int, hadm_id: Int, seq_num: Int, icd9_code: String, chapter: String)
  final case class ProcedureRow(subject_id: Int, hadm_id: Int, seq_num: Int, icd9_code: String, chapter: String)
  final case class IcuRow(subject_id: Int, hadm_id: Int, icustay_id: Int, dbsource: String,
                          los: Double, los_group: String)

  def losGroup(los: Double): String =
    if (los <= 1) "0-1" else if (los <= 2) "1-2" else if (los <= 4) "2-4" else if (los <= 8) "4-8" else "x>8"

  def generate(spark: SparkSession, sf: Double = 0.1, seed: Long = 29): Database = {
    import spark.implicits._
    val rnd = new Random(seed)
    val nAdm = math.max(400, (12000 * sf).toInt)
    val nSubjects = math.max(300, (nAdm * 0.8).toInt)

    val ethnicities = Vector("White", "Black", "Hispanic", "Asian", "Other", "Unknown")
    val ethWeights = Vector(0.62, 0.10, 0.047, 0.038, 0.065, 0.13)
    def draw[T](vals: Vector[T], weights: Vector[Double]): T = {
      val r = rnd.nextDouble() * weights.sum
      var acc = 0.0
      var res: Option[T] = None
      vals.zip(weights).foreach { case (v, w) =>
        acc += w
        if (res.isEmpty && r < acc) res = Some(v)
      }
      res.getOrElse(vals.last)
    }

    // Per-subject latent attributes drive the planted correlations.
    final case class Subject(id: Int, ageBase: Double, gender: String, ethnicity: String,
                             religion: String, language: String)
    val subjects = (1 to nSubjects).map { sid =>
      val eth = draw(ethnicities, ethWeights)
      val age = eth match {
        case "Hispanic" => 38 + rnd.nextGaussian() * 14
        case "Asian"    => 48 + rnd.nextGaussian() * 16
        case _          => 55 + rnd.nextGaussian() * 20
      }
      val religion = eth match {
        case "Hispanic" => if (rnd.nextDouble() < 0.75) "Catholic" else "Other"
        case _          => draw(Vector("Catholic", "Protestant", "Jewish", "Other", "Not Specified"),
                                Vector(0.3, 0.2, 0.1, 0.2, 0.2))
      }
      val lang = if (eth == "Hispanic" && rnd.nextDouble() < 0.4) "SPAN"
                 else if (rnd.nextDouble() < 0.9) "ENGL" else "OTHER"
      Subject(sid, math.max(16, math.min(95, age)), if (rnd.nextDouble() < 0.55) "M" else "F", eth, religion, lang)
    }

    val admissions = Vector.newBuilder[AdmissionRow]
    val pais = Vector.newBuilder[PaiRow]
    val diagnoses = Vector.newBuilder[DiagnosisRow]
    val procedures = Vector.newBuilder[ProcedureRow]
    val icustays = Vector.newBuilder[IcuRow]
    val subjectDied = scala.collection.mutable.Map.empty[Int, Boolean]

    val diagChapters = Vector("1", "2", "3", "4", "5", "6", "7", "8", "9", "10",
                              "11", "12", "13", "14", "15", "16", "17", "V", "E")
    // Death-rate plant per chapter, anchored to Q_mimic1 (2: 0.19 … 13: 0.09).
    val chapterDeath: Map[String, Double] = Map(
      "1" -> 0.19, "2" -> 0.19, "3" -> 0.12, "4" -> 0.14, "5" -> 0.08, "6" -> 0.13,
      "7" -> 0.12, "8" -> 0.18, "9" -> 0.14, "10" -> 0.15, "11" -> 0.01, "12" -> 0.14,
      "13" -> 0.09, "14" -> 0.05, "15" -> 0.02, "16" -> 0.16, "17" -> 0.13,
      "V" -> 0.09, "E" -> 0.10)

    var icuId = 1
    (1 to nAdm).foreach { hadm =>
      val subj = subjects(rnd.nextInt(nSubjects))
      val age = math.max(16, math.min(95, subj.ageBase + rnd.nextGaussian() * 3))
      // Hispanic patients get admitted (and operated on) slightly more.
      val insurance =
        if (age > 65) draw(Vector("Medicare", "Private", "Medicaid"), Vector(0.78, 0.17, 0.05))
        else draw(Vector("Private", "Medicaid", "Medicare", "Government", "Self Pay"),
                  Vector(0.55, 0.22, 0.10, 0.08, 0.05))
      val admType = insurance match {
        case "Medicare" => draw(Vector("EMERGENCY", "ELECTIVE", "URGENT"), Vector(0.72, 0.18, 0.10))
        case "Self Pay" => draw(Vector("EMERGENCY", "ELECTIVE", "URGENT"), Vector(0.85, 0.05, 0.10))
        case _          => draw(Vector("EMERGENCY", "ELECTIVE", "URGENT"), Vector(0.45, 0.45, 0.10))
      }
      // Primary diagnosis chapter; older patients skew toward neoplasms,
      // younger toward musculoskeletal.
      val chapter =
        if (age > 60 && rnd.nextDouble() < 0.22) "2"
        else if (age < 50 && rnd.nextDouble() < 0.20) "13"
        else diagChapters(rnd.nextInt(diagChapters.size))
      val pDeath = {
        val base = chapterDeath(chapter)
        val ageF = math.max(0.0, (age - 55) / 200.0)
        val emF = if (admType == "EMERGENCY") 0.05 else -0.03
        math.min(0.9, math.max(0.005, base + ageF + emF))
      }
      val died = rnd.nextDouble() < pDeath
      if (died) subjectDied(subj.id) = true
      else subjectDied.getOrElseUpdate(subj.id, false)
      val stay = math.max(0.5,
        (if (died) 6.0 else 8.0) + rnd.nextGaussian() * 5 +
          (if (admType == "EMERGENCY") 1.5 else 0.0) +
          (if (subj.ethnicity == "Hispanic") 1.5 else 0.0) +
          (if (subj.ethnicity == "Asian") -2.0 else 0.0))
      admissions += AdmissionRow(hadm, subj.id, admType,
        if (admType == "EMERGENCY") "EMERGENCY ROOM ADMIT" else "PHYS REFERRAL",
        insurance,
        draw(Vector("MARRIED", "SINGLE", "WIDOWED", "DIVORCED"), Vector(0.45, 0.3, 0.15, 0.1)),
        math.round(stay * 10) / 10.0, if (died) 1 else 0)
      pais += PaiRow(hadm, subj.id, math.round(age * 100) / 100.0, subj.language, subj.religion, subj.ethnicity)

      val nDiag = 1 + rnd.nextInt(3)
      diagnoses += DiagnosisRow(subj.id, hadm, 1, s"d$chapter${rnd.nextInt(90)}", chapter)
      (2 to nDiag).foreach { s =>
        val ch = diagChapters(rnd.nextInt(diagChapters.size))
        diagnoses += DiagnosisRow(subj.id, hadm, s, s"d$ch${rnd.nextInt(90)}", ch)
      }

      val extraProcs = if (subj.ethnicity == "Hispanic") 0.35 else 0.0
      val nProc = (if (rnd.nextDouble() < 0.75 + extraProcs / 2) 1 else 0) +
        (if (rnd.nextDouble() < 0.35 + extraProcs) 1 else 0)
      (1 to nProc).foreach { s =>
        val ch = if (stay > 9 && rnd.nextDouble() < 0.5) "16" else (1 + rnd.nextInt(16)).toString
        procedures += ProcedureRow(subj.id, hadm, s, s"p$ch${rnd.nextInt(90)}", ch)
      }

      if (rnd.nextDouble() < 0.6) {
        val los = math.round(math.max(0.1,
          stay * (0.25 + rnd.nextDouble() * 0.45) + rnd.nextGaussian() * 0.8) * 100) / 100.0
        icustays += IcuRow(subj.id, hadm, icuId,
          if (subj.id % 3 == 0) "metavision" else "carevue",
          los, losGroup(los))
        icuId += 1
      }
    }

    val patientRows = subjects.map(s => PatientRow(s.id, s.gender, if (subjectDied.getOrElse(s.id, false)) 1 else 0)).toVector

    val tables = Map(
      "admissions" -> admissions.result().toDF(),
      "patients" -> patientRows.toDF(),
      "patients_admit_info" -> pais.result().toDF(),
      "diagnoses" -> diagnoses.result().toDF(),
      "procedures" -> procedures.result().toDF(),
      "icustays" -> icustays.result().toDF(),
    )
    Database(tables, schemaGraph)
  }

  /** Schema graph of Figure 6. Mapping tables (diagnoses/procedures/
    * icustays) use hadm_id as their join identity — their seq_num/icustay_id
    * tie-breakers join nowhere, so including them in the declared key would
    * bar these tables from every join graph (see DESIGN.md).
    */
  val schemaGraph: SchemaGraph = SchemaGraph(
    rels = Map(
      "admissions" -> RelMeta("admissions", Seq("hadm_id")),
      "patients" -> RelMeta("patients", Seq("subject_id")),
      "patients_admit_info" -> RelMeta("patients_admit_info", Seq("hadm_id", "subject_id")),
      "diagnoses" -> RelMeta("diagnoses", Seq("hadm_id")),
      "procedures" -> RelMeta("procedures", Seq("hadm_id")),
      "icustays" -> RelMeta("icustays", Seq("hadm_id")),
    ),
    edges = Seq(
      SchemaEdge("admissions", "patients", Seq(JoinCond(Seq("subject_id" -> "subject_id")))),
      SchemaEdge("admissions", "patients_admit_info", Seq(
        JoinCond(Seq("hadm_id" -> "hadm_id", "subject_id" -> "subject_id")))),
      SchemaEdge("patients", "patients_admit_info", Seq(JoinCond(Seq("subject_id" -> "subject_id")))),
      SchemaEdge("admissions", "diagnoses", Seq(JoinCond(Seq("hadm_id" -> "hadm_id")))),
      SchemaEdge("patients", "diagnoses", Seq(JoinCond(Seq("subject_id" -> "subject_id")))),
      SchemaEdge("admissions", "procedures", Seq(JoinCond(Seq("hadm_id" -> "hadm_id")))),
      SchemaEdge("patients", "procedures", Seq(JoinCond(Seq("subject_id" -> "subject_id")))),
      SchemaEdge("admissions", "icustays", Seq(JoinCond(Seq("hadm_id" -> "hadm_id")))),
      SchemaEdge("patients", "icustays", Seq(JoinCond(Seq("subject_id" -> "subject_id")))),
    ),
  )

  // ---- workload queries (paper Tables 2/5) --------------------------------

  /** Q_mimic1 — death rate by diagnosis chapter. */
  val qMimic1: QuerySpec = QuerySpec(
    name = "Q_mimic1",
    tables = Seq("admissions" -> "a", "diagnoses" -> "d"),
    joins = Seq((("a", "hadm_id"), ("d", "hadm_id"))),
    filters = Nil,
    groupBy = Seq("d" -> "chapter"),
    agg = RateOf("a.hospital_expire_flag", "death_rate"),
  )

  /** Q_mimic2 / Q_mimic4 — death rate by insurance. */
  val qMimicInsurance: QuerySpec = QuerySpec(
    name = "Q_mimic2",
    tables = Seq("admissions" -> "a"),
    joins = Nil,
    filters = Nil,
    groupBy = Seq("a" -> "insurance"),
    agg = RateOf("a.hospital_expire_flag", "death_rate"),
  )

  /** Q_mimic3 — ICU stays per length-of-stay group. */
  val qMimic3: QuerySpec = QuerySpec(
    name = "Q_mimic3",
    tables = Seq("icustays" -> "i"),
    joins = Nil,
    filters = Nil,
    groupBy = Seq("i" -> "los_group"),
    agg = CountStar("cnt"),
  )

  /** Q_mimic5 — procedures per ethnicity. */
  val qMimic5: QuerySpec = QuerySpec(
    name = "Q_mimic5",
    tables = Seq("patients_admit_info" -> "pai", "procedures" -> "p"),
    joins = Seq(
      (("p", "hadm_id"), ("pai", "hadm_id")),
      (("p", "subject_id"), ("pai", "subject_id"))),
    filters = Nil,
    groupBy = Seq("pai" -> "ethnicity"),
    agg = CountStar("cnt"),
  )

  def question(q: QuerySpec, v1: String, v2: String): TwoPoint = {
    val c = q.groupCols.head
    TwoPoint(Map(c -> v1), Map(c -> v2))
  }
}
