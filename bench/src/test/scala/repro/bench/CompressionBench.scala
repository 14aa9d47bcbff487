package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval._

/** REST comparison on sub-Porto (the paper's Fig. 9c setting; kept as a
  * bench because REST is a named comparator — figures are out of scope). */
class CompressionBench extends AnyFunSuite {

  test("Compression ratios on sub-Porto incl. REST") {
    val rows = CompressionEval.run(Seq(200.0, 400.0, 600.0, 800.0, 1000.0))
    println(CompressionEval.render(rows))
    println(BenchData.paperBlock("Fig. 9c shape",
      Seq("at 200–600m PPQ-basic compresses ~2x REST; the gap narrows as deviation grows",
          "REST's ratio hinges on how well the reference set matches the data —",
          "matched refs are its best case, cold refs the general one")))
    for (r <- rows) {
      // The mechanism the paper describes: REST collapses when the
      // reference set does not represent the data; PPQ does not.
      assert(r.restCold < r.restMatched,
        s"cold ${r.restCold} should trail matched ${r.restMatched}")
      assert(r.ppqABasic > 1.0 && r.ppqSBasic > 1.0)
    }
    // At the tightest deviation PPQ-basic beats general-case REST (the
    // paper's 200–600m regime); the gap narrows as the deviation grows
    // because pointwise matching gets easier for REST.
    val tight = rows.head
    assert(tight.ppqABasic > tight.restCold || tight.ppqSBasic > tight.restCold,
      s"PPQ ${tight.ppqABasic}/${tight.ppqSBasic} vs cold REST ${tight.restCold}")
    assert(rows.last.restCold / rows.last.ppqSBasic >= rows.head.restCold / rows.head.ppqSBasic * 0.9,
      "REST should close the gap as the deviation grows")
    // Every method's ratio improves (weakly) with allowed deviation.
    assert(rows.last.ppqABasic >= rows.head.ppqABasic)
    assert(rows.last.restMatched >= rows.head.restMatched * 0.8)
  }
}
