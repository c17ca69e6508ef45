package repro.jobs

import org.scalatest.funsuite.AnyFunSuite

class JobsSpec extends AnyFunSuite {

  test("datasetByName resolves every registered dataset") {
    for (cfg <- repro.bipartite.SynthBipartite.all) {
      assert(JobSession.datasetByName(cfg.name) eq cfg)
    }
  }

  test("datasetByName rejects unknown names with a helpful message") {
    val e = intercept[IllegalArgumentException](JobSession.datasetByName("nope"))
    assert(e.getMessage.contains("youtube-s"))
  }

  test("CaseStudy runs end to end and finds mixed-attribute SSFBCs") {
    // The case-study job is pure-local; running main covers the §V-C
    // mechanism analogue (see DESIGN.md §2).
    CaseStudy.main(Array.empty)
  }
}
