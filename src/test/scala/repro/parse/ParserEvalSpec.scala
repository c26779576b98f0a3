package repro.parse

import repro.{Oracle, SparkSpec}

class ParserEvalSpec extends SparkSpec {

  import spark.implicits._

  test("grouping accuracy is 1.0 for a perfect assignment") {
    val truth  = Seq((1L, 10), (2L, 10), (3L, 20)).toDF("lineId", "trueId")
    val assign = Seq((1L, 0), (2L, 0), (3L, 1)).toDF("lineId", "templateId")
    assert(ParserEval.groupingAccuracy(assign, truth) == 1.0)
  }

  test("grouping accuracy penalizes a split group") {
    val truth  = Seq((1L, 10), (2L, 10), (3L, 10), (4L, 20)).toDF("lineId", "trueId")
    val assign = Seq((1L, 0), (2L, 0), (3L, 5), (4L, 1)).toDF("lineId", "templateId")
    // lines 1,2,3 all wrong (their groups don't match the true set); 4 right
    assert(math.abs(ParserEval.groupingAccuracy(assign, truth) - 0.25) < 1e-9)
  }

  test("grouping accuracy penalizes a merged group") {
    val truth  = Seq((1L, 10), (2L, 20), (3L, 30)).toDF("lineId", "trueId")
    val assign = Seq((1L, 0), (2L, 0), (3L, 1)).toDF("lineId", "templateId")
    assert(math.abs(ParserEval.groupingAccuracy(assign, truth) - (1.0 / 3)) < 1e-9)
  }

  test("grouping accuracy of empty input is 0") {
    val empty = Seq.empty[(Long, Int)].toDF("lineId", "templateId")
    val truth = Seq.empty[(Long, Int)].toDF("lineId", "trueId")
    assert(ParserEval.groupingAccuracy(empty, truth) == 0.0)
  }

  test("grouping accuracy agrees with a DuckDB SQL oracle") {
    val truth  = Seq((1L, 10), (2L, 10), (3L, 10), (4L, 20), (5L, 20), (6L, 30))
      .toDF("lineId", "trueId")
    val assign = Seq((1L, 0), (2L, 0), (3L, 7), (4L, 1), (5L, 1), (6L, 2))
      .toDF("lineId", "templateId")
    val acc = ParserEval.groupingAccuracy(assign, truth)
    val sparkSide = Seq(("acc", acc)).toDF("metric", "value")
    Oracle.assertEquivalent(
      sparkSide,
      """
      WITH j AS (SELECT a.lineId, a.templateId, t.trueId
                 FROM assign a JOIN truth t ON a.lineId = t.lineId),
           p AS (SELECT templateId, COUNT(*) predN FROM j GROUP BY templateId),
           r AS (SELECT trueId, COUNT(*) trueN FROM j GROUP BY trueId),
           q AS (SELECT j.templateId, j.trueId, COUNT(*) pairN
                 FROM j GROUP BY j.templateId, j.trueId)
      SELECT 'acc' AS metric,
             CAST(COALESCE(SUM(CASE WHEN q.pairN = p.predN AND q.pairN = r.trueN
                                    THEN q.pairN ELSE 0 END), 0) AS DOUBLE)
             / (SELECT COUNT(*) FROM j) AS value
      FROM q JOIN p ON q.templateId = p.templateId
             JOIN r ON q.trueId = r.trueId
      """,
      "assign" -> assign, "truth" -> truth,
    )
  }

  test("lineTokenScore: perfect match scores 1") {
    assert(ParserEval.lineTokenScore("a <*> c", "a <*> c") == 1.0)
  }

  test("lineTokenScore: static mismatch scores that token 0") {
    assert(math.abs(ParserEval.lineTokenScore("a x c", "a b c") - 2.0 / 3) < 1e-9)
  }

  test("lineTokenScore: variable recovered only by wildcard") {
    assert(math.abs(ParserEval.lineTokenScore("a 42 c", "a <*> c") - 2.0 / 3) < 1e-9)
    assert(ParserEval.lineTokenScore("a <*> c", "a <*>, c") == 1.0) // punctuation-attached slot
  }

  test("lineTokenScore: truth longer than prediction") {
    assert(math.abs(ParserEval.lineTokenScore("a b", "a b c d") - 0.5) < 1e-9)
  }

  test("lineTokenScore: empty truth scores 0") {
    assert(ParserEval.lineTokenScore("a b", "") == 0.0)
  }

  test("tokenAccuracy averages per-line scores (Eq. 1)") {
    val perLine = Seq(
      (1L, "a b c", "a b c"),   // 1.0
      (2L, "a x c", "a b c"),   // 2/3
      (3L, "<*> b", "<*> b"),   // 1.0
    ).toDF("lineId", "predTemplate", "trueTemplate")
    val expect = (1.0 + 2.0 / 3 + 1.0) / 3
    assert(math.abs(ParserEval.tokenAccuracy(perLine) - expect) < 1e-9)
  }

  test("tokenAccuracy of empty frame is 0") {
    val perLine = Seq.empty[(Long, String, String)].toDF("lineId", "predTemplate", "trueTemplate")
    assert(ParserEval.tokenAccuracy(perLine) == 0.0)
  }
}
