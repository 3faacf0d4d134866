package repro.data

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic stand-ins for the paper's four evaluation datasets (Table I).
  *
  * The originals (Kaggle flight delays, ACS NY disability extract, Stack
  * Overflow '19 survey, FiveThirtyEight primaries polls) are not shippable;
  * these generators preserve what the algorithms are sensitive to — the
  * number of dimensions and targets, the relative dataset sizes, dimension
  * cardinalities (hence facts-per-subset ordering StackOverflow > Flights >
  * ACS, §VIII-B), and dimension-correlated targets so that fact selection is
  * non-trivial. Deterministic in (sf, seed).
  */
object VoiceData {

  /** Dataset metadata driving the problem generator and the benches. */
  final case class DatasetSpec(
      name: String,
      dims: Seq[String],
      targets: Seq[String],
      baseRows: Long,
      gen: (SparkSession, Double, Long) => DataFrame) {
    def df(spark: SparkSession, sf: Double, seed: Long = 0): DataFrame =
      gen(spark, sf, seed)
  }

  private def n(base: Long, sf: Double): Long = math.max(1L, (base * sf).toLong)

  /** Deterministic zero-mean interaction effect for a combination of
    * dimension columns, in [−scale/2, +scale/2]. Real survey/ops data has
    * idiosyncratic cell-level structure on top of main effects; without it,
    * single-fact utilities are so skewed that the exact algorithm's bound
    * pruning trivializes the search — unlike on the paper's datasets.
    */
  private def cellEffect(scale: Double, cols: Column*): Column =
    (pmod(hash(cols: _*), lit(97)).cast(DoubleType) / 97.0 - 0.5) * scale

  /** Checkerboard cell effect over two index columns: ±scale/2 by parity of
    * the index sum, plus a small hash jitter to break exact ties. Both
    * single-dimension marginals are exactly zero, so the effect is visible
    * ONLY to two-dimension facts — the whole pair group forms a *plateau*
    * of near-equal single-fact utilities with no intermediate tier above
    * it. That many-comparable-facts profile (ubiquitous in real data) is
    * what keeps the exact algorithm's search combinatorial instead of
    * letting its bound pruning collapse the frontier.
    */
  private def checkerEffect(scale: Double, idxA: Column, idxB: Column): Column =
    (pmod(idxA + idxB, lit(2.0)) * 2 - 1) * (scale / 2) +
      cellEffect(scale / 8, idxA, idxB)

  /** Categorical pick: returns (label column, index column) so targets can
    * depend on the drawn category deterministically.
    */
  private def cat(values: Seq[String], seed: Long): (Column, Column) = {
    val idx = (rand(seed) * values.length).cast(IntegerType)
    (element_at(array(values.map(lit): _*), idx + 1), idx.cast(DoubleType))
  }

  // ---------------------------------------------------------------- flights

  val airlines: Seq[String] =
    Seq("AA", "DL", "UA", "WN", "B6", "AS", "NK", "F9")
  val seasons: Seq[String] = Seq("Winter", "Spring", "Summer", "Fall")
  val dayParts: Seq[String] = Seq("morning", "afternoon", "evening", "night")
  val months: Seq[String] =
    Seq("Jan", "Feb", "Mar", "Apr", "May", "Jun",
        "Jul", "Aug", "Sep", "Oct", "Nov", "Dec")
  val regions: Seq[String] =
    Seq("Northeast", "Southeast", "Midwest", "South", "West",
        "Southwest", "Northwest", "Mountain", "Pacific")
  val carrierClasses: Seq[String] = Seq("legacy", "lowcost", "regional")

  /** Flight statistics: 6 dims, targets `delay` (minutes) and `cancelled`
    * (0/1; the mean is the cancellation probability of Example 5 / F-C).
    * Season is derived from month so the two dimensions are consistent.
    */
  def flights(spark: SparkSession, sf: Double, seed: Long = 0): DataFrame = {
    val monthIdx = (rand(seed) * 12).cast(IntegerType) // 0..11, Jan=0
    // Season is drawn independently of month (think: meteorological season
    // at the destination vs. calendar month of booking). Keeping the two
    // uncorrelated prevents month facts from shadowing the seasonal effect,
    // which would collapse the exact algorithm's search space — the paper's
    // datasets have many such quasi-independent dimensions.
    val seasonIdx = (rand(seed + 7) * 4).cast(IntegerType)
    val (airline, aIdx) = cat(airlines, seed + 1)
    val (dayPart, dIdx) = cat(dayParts, seed + 2)
    val (region, rIdx) = cat(regions, seed + 3)
    val (cclass, cIdx) = cat(carrierClasses, seed + 4)
    val winter = when(seasonIdx === 0, 1.0).otherwise(0.0)
    // One strong seasonal main effect (drives the obvious first fact) on top
    // of broad airline×month / region×day-part cell structure: many facts of
    // comparable utility, as in real operations data — this is what makes
    // exact search combinatorial (§VIII-B) instead of trivially pruned.
    val delayMean = lit(8.0) + winter * 8.0 +
      when(dIdx === 2, 0.5).otherwise(0.0) +
      aIdx * 0.3 +
      when(rIdx === 0, 0.5).otherwise(0.0) +
      cIdx * 0.3 +
      checkerEffect(24.0, aIdx, monthIdx.cast(DoubleType)) + // route/month quirks
      checkerEffect(10.0, rIdx, dIdx)
    val cancelProb = greatest(lit(0.002),
      lit(0.02) + winter * 0.05 + aIdx * 0.001 +
        when(rIdx === 0, 0.01).otherwise(0.0) +
        checkerEffect(0.08, aIdx, monthIdx.cast(DoubleType)))
    spark.range(n(5_800_000L, sf)).select(
      airline.as("airline"),
      element_at(array(seasons.map(lit): _*), seasonIdx + 1).as("season"),
      dayPart.as("day_part"),
      element_at(array(months.map(lit): _*), monthIdx + 1).as("month"),
      region.as("origin_region"),
      cclass.as("carrier_class"),
      greatest(lit(0.0),
        round(delayMean + (rand(seed + 5) - 0.3) * 40.0, 1)).as("delay"),
      when(rand(seed + 6) < cancelProb, 1.0).otherwise(0.0).as("cancelled"),
    )
  }

  // ------------------------------------------------------------------- ACS

  val boroughs: Seq[String] =
    Seq("Bronx", "Brooklyn", "Manhattan", "Queens", "StatenIsland")
  val ageGroups: Seq[String] = Seq("teen", "adult", "elder")
  val sexes: Seq[String] = Seq("female", "male")
  val acsTargets: Seq[String] =
    Seq("hearing", "visual", "cognitive", "ambulatory", "selfcare", "independent")

  /** ACS NY disability extract: 3 dims, six 0/1 impairment indicators whose
    * means are the per-1000 prevalences the paper's speeches report
    * (Table II). Prevalence rises sharply with age, with borough effects.
    */
  def acsNY(spark: SparkSession, sf: Double, seed: Long = 0): DataFrame = {
    val (borough, bIdx) = cat(boroughs, seed)
    val (age, gIdx) = cat(ageGroups, seed + 1)
    val (sex, _) = cat(sexes, seed + 2)
    // Base rates per target (teen / adult / elder), borough multiplier.
    val ageRate = Map(
      "hearing" -> Seq(0.004, 0.015, 0.110),
      "visual" -> Seq(0.003, 0.017, 0.080),
      "cognitive" -> Seq(0.020, 0.035, 0.070),
      "ambulatory" -> Seq(0.005, 0.040, 0.220),
      "selfcare" -> Seq(0.004, 0.015, 0.080),
      "independent" -> Seq(0.003, 0.030, 0.150))
    val bMult = bIdx * 0.10 + 0.8 // 0.8 .. 1.2 across boroughs
    val cols = acsTargets.zipWithIndex.map { case (t, i) =>
      val rate = element_at(
        array(ageRate(t).map(lit): _*), gIdx.cast(IntegerType) + 1) * bMult *
        (lit(1.0) + cellEffect(0.5, borough, sex, lit(t)))
      when(rand(seed + 10 + i) < rate, 1.0).otherwise(0.0).as(t)
    }
    spark.range(n(40_000L, sf)).select(
      Seq(borough.as("borough"), age.as("age_group"), sex.as("sex")) ++ cols: _*)
  }

  // --------------------------------------------------------- Stack Overflow

  val countries: Seq[String] =
    Seq("US", "India", "Germany", "UK", "Canada", "France", "Brazil",
        "Poland", "Australia", "Netherlands")
  val edLevels: Seq[String] =
    Seq("none", "bachelor", "master", "doctorate", "bootcamp")
  val devTypes: Seq[String] =
    Seq("backend", "frontend", "fullstack", "mobile", "data", "devops",
        "embedded", "qa")
  val genders: Seq[String] = Seq("man", "woman", "nonbinary")
  val soAges: Seq[String] = Seq("18-24", "25-34", "35-44", "45-54", "55+")
  val orgSizes: Seq[String] =
    Seq("1", "2-9", "10-99", "100-499", "500-999", "1000-4999", "5000+")
  val employments: Seq[String] = Seq("fulltime", "parttime", "freelance", "student")
  val soTargets: Seq[String] =
    Seq("competence", "optimism", "job_sat", "salary", "years_code", "work_week")

  /** Stack Overflow developer survey: 7 dims, 6 numeric targets — the most
    * dimensions, hence the most facts per data subset (exact optimization
    * times out here first, as in §VIII-B).
    */
  def stackOverflow(spark: SparkSession, sf: Double, seed: Long = 0): DataFrame = {
    val (country, cIdx) = cat(countries, seed)
    val (ed, eIdx) = cat(edLevels, seed + 1)
    val (dev, dIdx) = cat(devTypes, seed + 2)
    val (gender, _) = cat(genders, seed + 3)
    val (age, aIdx) = cat(soAges, seed + 4)
    val (org, oIdx) = cat(orgSizes, seed + 5)
    val (emp, mIdx) = cat(employments, seed + 6)
    def clamp10(c: Column): Column = least(lit(10.0), greatest(lit(1.0), round(c, 1)))
    spark.range(n(90_000L, sf)).select(
      country.as("country"), ed.as("ed_level"), dev.as("dev_type"),
      gender.as("gender"), age.as("age_group"), org.as("org_size"),
      emp.as("employment"),
      // Ratings: mild monotone main effects plus dominant pair-cell
      // structure (country×dev-type etc.) — the many-comparable-facts
      // profile that makes the Stack Overflow scenario the hardest for
      // exact optimization, as in the paper.
      clamp10(lit(5.0) + aIdx * 0.2 + eIdx * 0.1 +
        checkerEffect(4.0, cIdx, dIdx) + checkerEffect(4.0, cIdx, oIdx) +
        (rand(seed + 10) - 0.5) * 2).as("competence"),
      clamp10(lit(7.0) - aIdx * 0.2 - cIdx * 0.05 +
        checkerEffect(4.0, dIdx, oIdx) + checkerEffect(4.0, cIdx, eIdx) +
        (rand(seed + 11) - 0.5) * 2).as("optimism"),
      clamp10(lit(5.0) + oIdx * 0.15 + dIdx * 0.1 +
        checkerEffect(4.0, cIdx, mIdx) + checkerEffect(4.0, dIdx, oIdx) +
        (rand(seed + 12) - 0.5) * 2).as("job_sat"),
      round(lit(30_000.0) * (lit(1.0) + aIdx * 0.4 + eIdx * 0.25) *
        when(cIdx === 0, 2.5).when(cIdx === 1, 0.4).otherwise(1.0) *
        (rand(seed + 13) * 0.6 + 0.7), 0).as("salary"),
      round(aIdx * 8 + rand(seed + 14) * 6, 1).as("years_code"),
      round(lit(40.0) + when(mIdx === 1, -15.0).when(mIdx === 3, -20.0)
        .otherwise(0.0) + (rand(seed + 15) - 0.5) * 10, 1).as("work_week"),
    )
  }

  // ------------------------------------------------------------- primaries

  val candidates: Seq[String] =
    Seq("Biden", "Sanders", "Warren", "Buttigieg", "Harris", "Klobuchar",
        "Yang", "Bloomberg")
  val states: Seq[String] =
    Seq("IA", "NH", "NV", "SC", "CA", "TX", "NY", "FL", "MA", "MI",
        "PA", "OH", "WI", "MN", "VA")
  val pollMonths: Seq[String] = Seq("Sep", "Oct", "Nov", "Dec", "Jan", "Feb")
  val pollsterGrades: Seq[String] = Seq("A", "B", "C", "D")
  val populations: Seq[String] = Seq("lv", "rv", "adults")

  /** Democratic-primaries polling: 5 dims, 1 target (poll share in %).
    * More base rows than ACS so the materialized sizes order as in Table I
    * (Primaries 6 MB > ACS 2 MB).
    */
  def primaries(spark: SparkSession, sf: Double, seed: Long = 0): DataFrame = {
    val (cand, cIdx) = cat(candidates, seed)
    val (state, sIdx) = cat(states, seed + 1)
    val (month, mIdx) = cat(pollMonths, seed + 2)
    val (grade, _) = cat(pollsterGrades, seed + 3)
    val (pop, _) = cat(populations, seed + 4)
    val base = element_at(
      array(Seq(27.0, 19.0, 15.0, 8.0, 7.0, 4.0, 3.0, 5.0).map(lit): _*),
      cIdx.cast(IntegerType) + 1)
    val share = base +
      when(cIdx === 1 && sIdx === 1, 8.0).otherwise(0.0) + // Sanders in NH
      when(cIdx === 0 && sIdx === 3, 10.0).otherwise(0.0) + // Biden in SC
      (mIdx - 2.5) * when(cIdx === 7, 1.5).otherwise(0.0) + // Bloomberg rising
      (rand(seed + 5) - 0.5) * 8.0
    spark.range(n(120_000L, sf)).select(
      cand.as("candidate"), state.as("state"), month.as("poll_month"),
      grade.as("pollster_grade"), pop.as("population"),
      greatest(lit(0.0), round(share, 1)).as("pct"),
    )
  }

  // -------------------------------------------------------------- registry

  val Flights: DatasetSpec = DatasetSpec("Flights",
    Seq("airline", "season", "day_part", "month", "origin_region", "carrier_class"),
    Seq("delay", "cancelled"), 5_800_000L, flights(_, _, _))

  val AcsNY: DatasetSpec = DatasetSpec("ACS NY",
    Seq("borough", "age_group", "sex"), acsTargets, 40_000L, acsNY(_, _, _))

  val StackOverflow: DatasetSpec = DatasetSpec("Stack Overflow",
    Seq("country", "ed_level", "dev_type", "gender", "age_group", "org_size",
        "employment"),
    soTargets, 90_000L, stackOverflow(_, _, _))

  val Primaries: DatasetSpec = DatasetSpec("Primaries",
    Seq("candidate", "state", "poll_month", "pollster_grade", "population"),
    Seq("pct"), 120_000L, primaries(_, _, _))

  val all: Seq[DatasetSpec] = Seq(AcsNY, StackOverflow, Flights, Primaries)
}
