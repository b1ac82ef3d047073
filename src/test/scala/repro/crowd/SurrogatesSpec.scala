package repro.crowd

import repro.CrowdSpec

/** The surrogate datasets must match the paper's Table 6 statistics exactly:
  * rows, columns, cells, answers-per-task, and the §6.1 datatype mix.
  */
class SurrogatesSpec extends CrowdSpec {

  test("Celebrity: 174 rows x 7 cols = 1218 cells, 5 answers per task") {
    val cfg = Surrogates.celebrityConfig()
    assert(cfg.numRows == 174)
    assert(cfg.columns.size == 7)
    assert(cfg.numRows * cfg.columns.size == 1218)
    assert(cfg.answersPerTask == 5)
  }

  test("Celebrity: 3 categorical + 4 continuous attributes (name, nationality, ethnicity cat)") {
    val cfg = Surrogates.celebrityConfig()
    val cat = cfg.columns.filter(_.isCategorical).map(_.name)
    assert(cat == Seq("name", "nationality", "ethnicity"))
    assert(cfg.columns.filterNot(_.isCategorical).map(_.name) ==
      Seq("age", "height", "notability", "facial"))
  }

  test("Restaurant: 203 rows x 5 cols = 1015 cells, 4 answers per task") {
    val cfg = Surrogates.restaurantConfig()
    assert(cfg.numRows == 203)
    assert(cfg.columns.size == 5)
    assert(cfg.numRows * cfg.columns.size == 1015)
    assert(cfg.answersPerTask == 4)
  }

  test("Restaurant: aspect/attribute/sentiment categorical, start/end continuous") {
    val cfg = Surrogates.restaurantConfig()
    assert(cfg.columns.filter(_.isCategorical).map(_.name) ==
      Seq("aspect", "attribute", "sentiment"))
    assert(cfg.columns.filterNot(_.isCategorical).map(_.name) ==
      Seq("startTarget", "endTarget"))
  }

  test("Emotion: 100 rows x 7 cols = 700 cells, 10 answers per task, all continuous") {
    val cfg = Surrogates.emotionConfig()
    assert(cfg.numRows == 100)
    assert(cfg.columns.size == 7)
    assert(cfg.numRows * cfg.columns.size == 700)
    assert(cfg.answersPerTask == 10)
    assert(cfg.columns.forall(!_.isCategorical))
  }

  test("Emotion: six emotions in [0,100], valence in [-100,100] (paper §6.1)") {
    val cfg = Surrogates.emotionConfig()
    cfg.columns.take(6).foreach { c => assert(c.lo == 0 && c.hi == 100) }
    val valence = cfg.columns.last
    assert(valence.name == "valence" && valence.lo == -100 && valence.hi == 100)
  }

  test("materialized Celebrity matches Table 6 answer counts") {
    val ds = Surrogates.celebrity(spark)
    assert(ds.truth.count() == 1218)
    assert(ds.answers.count() == 1218 * 5)
  }

  test("materialized Restaurant matches Table 6 answer counts") {
    val ds = Surrogates.restaurant(spark)
    assert(ds.truth.count() == 1015)
    assert(ds.answers.count() == 1015 * 4)
  }

  test("materialized Emotion matches Table 6 answer counts") {
    val ds = Surrogates.emotion(spark)
    assert(ds.truth.count() == 700)
    assert(ds.answers.count() == 700 * 10)
  }

  test("surrogates are reproducible across instantiations") {
    val a = new CrowdSim(Surrogates.celebrityConfig()).allAnswers
    val b = new CrowdSim(Surrogates.celebrityConfig()).allAnswers
    assert(a == b)
  }

  test("different seeds give different answer sets") {
    val a = new CrowdSim(Surrogates.restaurantConfig(seed = 1)).allAnswers
    val b = new CrowdSim(Surrogates.restaurantConfig(seed = 2)).allAnswers
    assert(a != b)
  }

  test("all() returns the three datasets in paper order") {
    assert(Surrogates.all(spark).map(_.name) == Seq("Celebrity", "Restaurant", "Emotion"))
  }
}
