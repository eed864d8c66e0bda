package repro.core

import org.scalatest.funsuite.AnyFunSuite

class EdaConfigSpec extends AnyFunSuite {

  test("defaults carry every registered key") {
    assert(EdaConfig.defaults.keySet == EdaConfig.registry.keySet)
  }
  test("default hist.bins is 50 (Figure 1's default)") {
    assert(EdaConfig.default.int("hist.bins") == 50)
  }
  test("user override wins over default") {
    val cfg = EdaConfig.from(Map("hist.bins" -> 200))
    assert(cfg.int("hist.bins") == 200)
    assert(cfg.int("bar.topk") == 10) // untouched default
  }
  test("unknown key is rejected with the known-keys list") {
    val e = intercept[IllegalArgumentException](EdaConfig.from(Map("hist.bin" -> 10)))
    assert(e.getMessage.contains("hist.bin"))
    assert(e.getMessage.contains("hist.bins"))
  }
  test("int accessor accepts Int and Long") {
    assert(EdaConfig.from(Map("hist.bins" -> 25L)).int("hist.bins") == 25)
  }
  test("int accessor rejects non-integral values") {
    intercept[IllegalArgumentException](
      EdaConfig.from(Map("hist.bins" -> 1.5)).int("hist.bins"))
  }
  test("double accessor accepts Int") {
    assert(EdaConfig.from(Map("insight.skew.threshold" -> 2)).double("insight.skew.threshold") == 2.0)
  }
  test("long accessor") {
    assert(EdaConfig.default.long("corr.maxrows") == 200000L)
  }
  test("strings accessor reads corr.methods") {
    assert(EdaConfig.default.strings("corr.methods") == Seq("pearson", "spearman", "kendall"))
  }
  test("strings accessor allows overriding the method list") {
    val cfg = EdaConfig.from(Map("corr.methods" -> Seq("pearson")))
    assert(cfg.strings("corr.methods") == Seq("pearson"))
  }
  test("how-to guide lists keys by prefix with current values") {
    val cfg = EdaConfig.from(Map("hist.bins" -> 75))
    val ht = EdaConfig.howTo(Seq("hist.bins"), cfg)
    assert(ht.size == 1)
    assert(ht.head.contains("\"hist.bins\": 75"))
    assert(ht.head.contains("number of bins"))
  }
  test("how-to guide with multiple prefixes is sorted by key") {
    val ht = EdaConfig.howTo(Seq("grid2d"), EdaConfig.default)
    assert(ht.size == 2 && ht.head.contains("grid2d.xbins") || ht.head.contains("grid2d.x"))
    assert(ht == ht.sorted)
  }
  test("every registry entry has a nonempty description") {
    EdaConfig.registry.foreach { case (k, (_, desc)) =>
      assert(desc.nonEmpty, s"missing description for $k")
    }
  }
}
