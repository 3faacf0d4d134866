package repro.data

import org.apache.spark.sql.functions._
import repro.SparkSpec

/** Sanity tests for the synthetic dataset generators (Table I stand-ins). */
class VoiceDataSpec extends SparkSpec {

  private lazy val flights = VoiceData.flights(spark, 0.002).cache()
  private lazy val acs = VoiceData.acsNY(spark, 0.1).cache()
  private lazy val so = VoiceData.stackOverflow(spark, 0.05).cache()
  private lazy val primaries = VoiceData.primaries(spark, 0.1).cache()

  test("flights has the 6 dims + 2 targets schema") {
    assert(flights.columns.toSeq == Seq("airline", "season", "day_part", "month",
      "origin_region", "carrier_class", "delay", "cancelled"))
  }

  test("flights dimension values come from the documented domains") {
    val rows = flights.select("airline", "season", "origin_region").distinct().collect()
    rows.foreach { r =>
      assert(VoiceData.airlines.contains(r.getString(0)))
      assert(VoiceData.seasons.contains(r.getString(1)))
      assert(VoiceData.regions.contains(r.getString(2)))
    }
  }

  test("flights month and season are independent dimensions (both fully covered)") {
    assert(flights.select("month").distinct().count() == 12)
    assert(flights.select("season").distinct().count() == 4)
  }

  test("flights winter delays exceed summer delays (correlated target)") {
    val bySeason = flights.groupBy("season").agg(avg("delay").as("d"))
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(bySeason("Winter") > bySeason("Summer") + 5)
  }

  test("flights winter cancellations exceed summer cancellations") {
    val bySeason = flights.groupBy("season").agg(avg("cancelled").as("c"))
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(bySeason("Winter") > bySeason("Summer"))
  }

  test("flights delay is non-negative") {
    assert(flights.where(col("delay") < 0).count() == 0)
  }

  test("flights cancelled is a 0/1 indicator") {
    val vals = flights.select("cancelled").distinct().collect().map(_.getDouble(0)).toSet
    assert(vals.subsetOf(Set(0.0, 1.0)))
  }

  test("flights generation is deterministic in (sf, seed)") {
    val a = VoiceData.flights(spark, 0.0005).agg(sum("delay")).collect()(0).getDouble(0)
    val b = VoiceData.flights(spark, 0.0005).agg(sum("delay")).collect()(0).getDouble(0)
    assert(a == b)
  }

  test("flights seed changes the draw") {
    val a = VoiceData.flights(spark, 0.0005, 0).agg(sum("delay")).collect()(0).getDouble(0)
    val b = VoiceData.flights(spark, 0.0005, 99).agg(sum("delay")).collect()(0).getDouble(0)
    assert(a != b)
  }

  test("acs has the 3 dims + 6 targets schema") {
    assert(acs.columns.toSeq ==
      Seq("borough", "age_group", "sex") ++ VoiceData.acsTargets)
  }

  test("acs impairment indicators are 0/1") {
    VoiceData.acsTargets.foreach { t =>
      val vals = acs.select(t).distinct().collect().map(_.getDouble(0)).toSet
      assert(vals.subsetOf(Set(0.0, 1.0)), t)
    }
  }

  test("acs visual impairment rises sharply with age (Table II premise)") {
    val byAge = acs.groupBy("age_group").agg(avg("visual").as("v"))
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(byAge("elder") > byAge("adult"))
    assert(byAge("adult") > byAge("teen"))
  }

  test("acs covers all five boroughs") {
    val bs = acs.select("borough").distinct().collect().map(_.getString(0)).toSet
    assert(bs == VoiceData.boroughs.toSet)
  }

  test("stack overflow has the 7 dims + 6 targets schema") {
    assert(so.columns.length == 13)
    assert(so.columns.take(7).toSeq == VoiceData.StackOverflow.dims)
    assert(so.columns.drop(7).toSeq == VoiceData.soTargets)
  }

  test("stack overflow ratings stay in [1, 10]") {
    Seq("competence", "optimism", "job_sat").foreach { t =>
      val mm = so.agg(min(t), max(t)).collect()(0)
      assert(mm.getDouble(0) >= 1.0 && mm.getDouble(1) <= 10.0, t)
    }
  }

  test("stack overflow competence grows with age band") {
    val byAge = so.groupBy("age_group").agg(avg("competence").as("c"))
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(byAge("55+") > byAge("18-24"))
  }

  test("stack overflow optimism declines with age band") {
    val byAge = so.groupBy("age_group").agg(avg("optimism").as("o"))
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(byAge("18-24") > byAge("55+"))
  }

  test("primaries has the 5 dims + 1 target schema") {
    assert(primaries.columns.toSeq == VoiceData.Primaries.dims :+ "pct")
  }

  test("primaries poll share is non-negative") {
    assert(primaries.where(col("pct") < 0).count() == 0)
  }

  test("primaries front-runner leads the field on average") {
    val byCand = primaries.groupBy("candidate").agg(avg("pct").as("p"))
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(byCand("Biden") > byCand("Yang"))
  }

  test("row counts scale with the scale factor") {
    val small = VoiceData.primaries(spark, 0.01).count()
    val large = VoiceData.primaries(spark, 0.1).count()
    assert(large > small * 5)
  }

  test("dataset registry covers all four datasets with matching dims") {
    assert(VoiceData.all.map(_.name).toSet ==
      Set("ACS NY", "Stack Overflow", "Flights", "Primaries"))
    VoiceData.all.foreach { spec =>
      val df = spec.df(spark, 0.001)
      spec.dims.foreach(d => assert(df.columns.contains(d), s"${spec.name}/$d"))
      spec.targets.foreach(t => assert(df.columns.contains(t), s"${spec.name}/$t"))
    }
  }

  test("facts-per-subset ordering: StackOverflow > Flights > ACS (§VIII-B)") {
    import repro.core.FactGen
    import repro.system.Encoding
    def factCount(spec: VoiceData.DatasetSpec, sf: Double): Int = {
      val table = Encoding.fromDataFrame(spec.df(spark, sf), spec.dims, spec.targets)
      FactGen.build(table.relationFor(spec.targets.head, Nil), 2).numFacts
    }
    val soF = factCount(VoiceData.StackOverflow, 0.05)
    val flF = factCount(VoiceData.Flights, 0.002)
    val acsF = factCount(VoiceData.AcsNY, 0.1)
    assert(soF > flF, s"so=$soF flights=$flF")
    assert(flF > acsF, s"flights=$flF acs=$acsF")
  }
}
