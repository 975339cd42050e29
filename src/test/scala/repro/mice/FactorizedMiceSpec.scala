package repro.mice

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.data.{Flight, Missingness}
import repro.ring.{CofactorSchema, DimSpec}

/** Factorized MICE over normalized data must impute the same cells as Low
  * over the materialized join (missing values live in the fact table only, as
  * in §6.3), with near-identical values under deterministic models.
  */
class FactorizedMiceSpec extends SparkSpec {

  private lazy val flights = Flight.flights(spark, 4000).cache()
  private lazy val airports = Flight.airports(spark, seed = 303 + 900)
    .toDF("origin_id", "o_lat", "o_lon", "o_elev", "o_region").cache()
  private lazy val carriers = Flight.carriers(spark, seed = 303 + 901).cache()

  private val factSchema = MiceSchema(
    cont = Seq("distance", "airtime", "depdelay", "arrdelay", "taxiout"),
    cat = Seq("diverted"),
    targets = Seq("distance", "depdelay", "diverted"))

  private lazy val dims = Seq(
    DimSpec("airports", airports, Seq("origin_id"),
      CofactorSchema(Seq("o_lat", "o_elev"), Seq("o_region"))),
    DimSpec("carriers", carriers, Seq("carrier_id"), CofactorSchema(Seq("cr_speed"), Nil)),
  )

  private lazy val holeyFact =
    Missingness.mcar(flights, factSchema.targets, 0.15, seed = 3).cache()

  private val cfg = MiceConfig(iterations = 2, stochastic = false, seed = 1)

  test("factorized MICE imputes every missing fact value") {
    val r = FactorizedMice.impute(holeyFact, factSchema, dims, cfg)
    assert(r.imputed.count() == flights.count())
    for (t <- factSchema.targets) assert(r.imputed.filter(col(t).isNull).count() == 0)
  }

  test("factorized MICE keeps key and complete columns untouched") {
    val r = FactorizedMice.impute(holeyFact, factSchema, dims, cfg)
    val a = r.imputed.select(sum("airtime"), sum("origin_id")).head()
    val b = flights.select(sum("airtime"), sum("origin_id")).head()
    assert(math.abs(a.getDouble(0) - b.getDouble(0)) < 1e-4)
    assert(a.getLong(1) == b.getLong(1))
  }

  test("factorized MICE matches Low over the materialized join") {
    val joinedHoley = holeyFact.join(airports, "origin_id").join(carriers, "carrier_id")
    val joinedSchema = MiceSchema(
      cont = factSchema.cont ++ Seq("o_lat", "o_elev", "cr_speed"),
      cat = factSchema.cat ++ Seq("o_region"),
      targets = factSchema.targets)
    val mat = MiceLow.impute(joinedHoley, joinedSchema, cfg)
    val fact = FactorizedMice.impute(holeyFact, factSchema, dims, cfg)
    for (t <- Seq("distance", "depdelay")) {
      val a = mat.imputed.select(sum(col(t).cast("double"))).head().getDouble(0)
      val b = fact.imputed.select(sum(col(t).cast("double"))).head().getDouble(0)
      assert(math.abs(a - b) < 2e-2 * (1 + math.abs(a)), s"$t: joined=$a factorized=$b")
    }
    val accA = mat.imputed.select(sum("diverted")).head().getLong(0)
    val accB = fact.imputed.select(sum("diverted")).head().getLong(0)
    assert(math.abs(accA - accB) <= 0.05 * flights.count(), s"diverted: $accA vs $accB")
  }

  test("timing fields are populated") {
    val r = FactorizedMice.impute(holeyFact, factSchema, dims, MiceConfig(1, stochastic = false))
    assert(r.preprocessSecs > 0 && r.roundSecs.size == 1)
    assert(r.breakdown.contains("dim_partials") && r.breakdown.contains("delta_cofactor"))
  }
}
