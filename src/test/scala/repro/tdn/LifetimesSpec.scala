package repro.tdn

import repro.{Oracle, SparkSpec}
import org.apache.spark.sql.functions._

class LifetimesSpec extends SparkSpec {

  test("Fixed assigner returns the window length for every edge") {
    val a = Lifetimes.Fixed(7)
    assert((0L until 100L).forall(a(_) == 7))
    assert(a.maxLifetime == 7)
  }

  test("Fixed assigner rejects non-positive windows") {
    intercept[IllegalArgumentException](Lifetimes.Fixed(0))
  }

  test("Infinite assigner outlives any finite horizon") {
    val a = Lifetimes.Infinite()
    assert(a(0L) > 1000000)
  }

  test("Geometric assigner is deterministic in (seed, edgeIndex)") {
    val a = Lifetimes.Geometric(0.1, 100, seed = 5L)
    val b = Lifetimes.Geometric(0.1, 100, seed = 5L)
    assert((0L until 200L).map(a(_)) == (0L until 200L).map(b(_)))
  }

  test("Geometric assigner respects bounds 1..L") {
    val a = Lifetimes.Geometric(0.01, 50, seed = 1L)
    val ls = (0L until 2000L).map(a(_))
    assert(ls.forall(l => l >= 1 && l <= 50))
    assert(ls.contains(50)) // truncation actually hits with p=0.01
  }

  test("Geometric assigner rejects out-of-range p") {
    intercept[IllegalArgumentException](Lifetimes.Geometric(0.0, 10, 1L))
    intercept[IllegalArgumentException](Lifetimes.Geometric(1.0, 10, 1L))
  }

  test("Geometric mean is close to 1/p when truncation is loose") {
    val p = 0.2
    val a = Lifetimes.Geometric(p, 1000, seed = 9L)
    val n = 20000
    val mean = (0L until n.toLong).map(a(_)).sum.toDouble / n
    assert(math.abs(mean - 1.0 / p) < 0.15, s"mean=$mean expected ~${1 / p}")
  }

  test("larger p concentrates lifetimes on smaller values") {
    val small = Lifetimes.Geometric(0.02, 1000, 3L)
    val big   = Lifetimes.Geometric(0.3, 1000, 3L)
    val n     = 5000
    val meanSmall = (0L until n.toLong).map(small(_)).sum.toDouble / n
    val meanBig   = (0L until n.toLong).map(big(_)).sum.toDouble / n
    assert(meanBig < meanSmall)
  }

  test("Spark geometric column stays within 1..L and matches the local mean") {
    import spark.implicits._
    val p = 0.1
    val l = 500
    val df = spark.range(20000).toDF("id")
      .withColumn("lifetime", Lifetimes.geometricColumn(p, l, seed = 42L))
    val stats = df.agg(
      min($"lifetime").as("mn"), max($"lifetime").as("mx"), avg($"lifetime").as("mean"),
    ).collect()(0)
    assert(stats.getInt(0) >= 1)
    assert(stats.getInt(1) <= l)
    val mean = stats.getDouble(2)
    assert(math.abs(mean - 1.0 / p) < 0.5, s"mean=$mean expected ~${1 / p}")
  }

  test("Spark geometric histogram matches the geometric pmf (DuckDB-checked counts)") {
    import spark.implicits._
    val p = 0.5
    val df = spark.range(40000).toDF("id")
      .withColumn("lifetime", Lifetimes.geometricColumn(p, 100, seed = 7L))
      .select($"lifetime")
    // Pr(l=1)=0.5, Pr(l=2)=0.25 — check within 3 sigma.
    val n  = 40000.0
    val c1 = df.filter($"lifetime" === 1).count()
    val c2 = df.filter($"lifetime" === 2).count()
    assert(math.abs(c1 - n * 0.5) < 3 * math.sqrt(n * 0.25), s"c1=$c1")
    assert(math.abs(c2 - n * 0.25) < 3 * math.sqrt(n * 0.1875), s"c2=$c2")
    // The aggregation itself is DuckDB-checked.
    val sparkAgg = df.groupBy($"lifetime").agg(count(lit(1)).as("n")).filter($"lifetime" <= 3)
    Oracle.assertEquivalent(
      sparkAgg,
      "SELECT lifetime, count(*) AS n FROM lifetimes WHERE CAST(lifetime AS INT) <= 3 GROUP BY lifetime",
      "lifetimes" -> df,
    )
  }

  test("withGeometricLifetimes appends a lifetime column to an interaction frame") {
    import spark.implicits._
    val df = Seq((0, 1, 2), (1, 2, 3)).toDF("ts", "src", "dst")
    val out = Lifetimes.withGeometricLifetimes(df, 0.3, 10, 1L)
    assert(out.columns.toSeq == Seq("ts", "src", "dst", "lifetime"))
    val ls = out.select("lifetime").collect().map(_.getInt(0))
    assert(ls.forall(l => l >= 1 && l <= 10))
  }
}
