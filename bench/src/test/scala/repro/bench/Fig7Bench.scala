package repro.bench

import repro.SparkSpec
import repro.exp.Fig7Exp

/** Reproduces Fig. 7: cross-region latencies (Windows corpus). Shape:
  * everything slows with distance; AIRPHANT's slowdown factor is the
  * mildest among the fast engines (paper: 2.4x/6.5x vs Lucene 3.3x/8.2x,
  * SQLite 3.2x/8.0x).
  */
class Fig7Bench extends SparkSpec {

  private lazy val rows = Fig7Exp.run(spark)

  private def slowdown(regionSubstr: String, engine: String): Double =
    rows.find(r => r.region.contains(regionSubstr) && r.engine.startsWith(engine))
      .get.slowdownVsIowa

  test("Fig 7 prints") {
    println(Fig7Exp.render(rows))
    assert(rows.size == 3 * 5)
  }

  test("every engine slows as the VM moves away from the bucket") {
    rows.filter(_.region.contains("Iowa")).foreach(r => assert(r.slowdownVsIowa == 1.0))
    Seq("London", "Singapore").foreach { reg =>
      rows.filter(_.region.contains(reg)).foreach { r =>
        assert(r.slowdownVsIowa > 1.2, s"$reg/${r.engine}: ${r.slowdownVsIowa}")
      }
    }
    rows.groupBy(_.engine).foreach { case (e, byEngine) =>
      val lon = byEngine.find(_.region.contains("London")).get.slowdownVsIowa
      val sing = byEngine.find(_.region.contains("Singapore")).get.slowdownVsIowa
      assert(sing > lon, s"$e: Singapore $sing not beyond London $lon")
    }
  }

  test("Airphant degrades no worse than the dependent-read engines") {
    Seq("London", "Singapore").foreach { reg =>
      val air = slowdown(reg, "Airphant")
      assert(air <= slowdown(reg, "Lucene") + 0.3, s"$reg vs Lucene")
      assert(air <= slowdown(reg, "SQLite") + 0.3, s"$reg vs SQLite")
    }
  }

  test("cross-region slowdowns are in the paper's ballpark") {
    // Paper (Windows): Airphant 2.4x London, 6.5x Singapore. Our region
    // multipliers are calibrated to those observations, so the measured
    // slowdowns should land within a loose band around them.
    val lon = slowdown("London", "Airphant")
    val sing = slowdown("Singapore", "Airphant")
    assert(lon > 1.5 && lon < 4.5, s"London slowdown $lon")
    assert(sing > 3.5 && sing < 10.0, s"Singapore slowdown $sing")
  }
}
