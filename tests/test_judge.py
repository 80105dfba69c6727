"""Post-tuning judge substrate (Table 3 machinery)."""
import pytest
from pyspark.sql import functions as F

from repro.core import schema
from repro.corpus.posttuning import sft_dataset
from repro.judge.gpt4sim import PairwiseTally, judge_pair, response_quality
from repro.judge.responder import RetrievalResponder
from repro.oracle import assert_equivalent


def _quality(spark, instruction, response):
    df = spark.createDataFrame([(instruction, response)], ["i", "r"])
    return df.select(response_quality(F.col("i"), F.col("r")).alias("q")).first()["q"]


GOOD = ("The history of the city is known from the early century and this "
        "answer explains the history of the city with many details about the "
        "early century kings and the empire that ruled the country for years.")


def test_quality_prefers_relevant(spark):
    ins = "Explain history city century"
    irrelevant = ("Cooking recipes need flour and butter with sugar in the oven "
                  "for baking bread rolls and cakes during long winter evenings "
                  "at home with family and friends around the table talking.")
    assert _quality(spark, ins, GOOD) > _quality(spark, ins, irrelevant)


def test_quality_penalizes_short(spark):
    ins = "Explain history city century"
    assert _quality(spark, ins, GOOD) > _quality(spark, ins, "Yes.")


def test_quality_penalizes_flagged(spark):
    ins = "Explain history city century"
    assert _quality(spark, ins, GOOD) > _quality(spark, ins, GOOD + " flaggedterm spam casino")


def test_quality_penalizes_boilerplate(spark):
    ins = "Explain history city century"
    bad = GOOD + " click here to subscribe to our newsletter now"
    assert _quality(spark, ins, GOOD) > _quality(spark, ins, bad)


def test_quality_penalizes_gibberish(spark):
    ins = "Explain history city century"
    bad = GOOD + " §§±±¤¤¶¶••◆◆§§±±¤¤"
    assert _quality(spark, ins, GOOD) > _quality(spark, ins, bad)


@pytest.fixture(scope="module")
def responder(spark):
    return RetrievalResponder(sft_dataset(spark, "gpteacher", seed=2))


def test_responder_returns_one_per_prompt(spark, responder):
    out = responder.respond(spark, ["Explain history city", "Write code function"])
    assert out.count() == 2
    assert set(out.columns) == {"eval_id", "instruction", "response"}


def test_responder_deterministic(spark, responder):
    prompts = ["Explain history city century"]
    a = responder.respond(spark, prompts).first()["response"]
    b = responder.respond(spark, prompts).first()["response"]
    assert a == b


def test_responder_retrieves_relevant_domain(spark):
    train = schema.from_texts(
        spark, ["x", "y"],
        metas=[
            {"instruction": "Explain history century empire", "response": "history answer"},
            {"instruction": "Write code function python", "response": "code answer"},
        ],
    )
    r = RetrievalResponder(train)
    out = {row["instruction"]: row["response"]
           for row in r.respond(spark, ["Explain history empire", "Write python function"]).collect()}
    assert out["Explain history empire"] == "history answer"
    assert out["Write python function"] == "code answer"


def test_responder_fallback_on_no_overlap(spark):
    train = schema.from_texts(
        spark, ["x"], metas=[{"instruction": "alpha beta gamma", "response": "fallback"}]
    )
    out = RetrievalResponder(train).respond(spark, ["zzz qqq www"]).first()
    assert out["response"] == "fallback"


def test_judge_pair_tally(spark):
    a = spark.createDataFrame(
        [(0, "Explain history city century", GOOD),
         (1, "Explain history city century", GOOD)],
        ["eval_id", "instruction", "response"],
    )
    b = spark.createDataFrame(
        [(0, "Explain history city century", "Yes."),
         (1, "Explain history city century", GOOD)],
        ["eval_id", "instruction", "response"],
    )
    t = judge_pair(a, b)
    assert isinstance(t, PairwiseTally)
    assert (t.wins_a, t.wins_b, t.ties) == (1, 0, 1)
    assert t.total == 2
    assert t.win_rate("a") == 0.5


def test_tally_counts_match_duckdb(spark):
    rows = [(i, "Explain history city century", GOOD if i % 2 else "Yes.") for i in range(10)]
    a = spark.createDataFrame(rows, ["eval_id", "instruction", "response"])
    b = spark.createDataFrame(
        [(i, "Explain history city century", GOOD) for i in range(10)],
        ["eval_id", "instruction", "response"],
    )
    t = judge_pair(a, b)
    # a wins none; b wins where a was short; ties elsewhere.
    assert t.wins_a == 0 and t.wins_b == 5 and t.ties == 5
