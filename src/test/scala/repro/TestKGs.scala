package repro

import repro.kg.KG
import repro.synth.KGBench

/** Shared, lazily-built small KGs for the unit suites. The test JVM hosts
  * one SparkSession for the whole run (see build.sbt), so these are built
  * once and cached across suites.
  */
object TestKGs {
  /** Unit-test scale: 1/10 of bench scale = 1/10000 of the paper's KGs. */
  val UnitScale = 0.1

  lazy val mag: KG  = KGBench.generate(SparkSpec.shared, KGBench.MAG, UnitScale).cached()
  lazy val yago: KG = KGBench.generate(SparkSpec.shared, KGBench.YAGO, UnitScale).cached()
  lazy val dblp: KG = KGBench.generate(SparkSpec.shared, KGBench.DBLP, UnitScale).cached()
  lazy val wiki: KG = KGBench.generate(SparkSpec.shared, KGBench.WIKIKG2, 0.5).cached()
  lazy val yago3: KG = KGBench.generate(SparkSpec.shared, KGBench.YAGO3, 0.5).cached()
}
