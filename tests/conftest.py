"""Shared fixtures for the test suite (the SparkSession comes from the
root conftest). Everything here is tiny — SF-equivalents well under
test-scale guidance — so individual tests stay sub-second."""
from __future__ import annotations

import pytest

from repro.core import schema

CLEAN = [
    "The quick brown fox jumps over the lazy dog. It was a good day in the world of people and time.",
    "History of the city is known from the early century when the king and the empire were at war over land.",
    "She looked out of the window into the dark night and thought about the light in his eyes and the dream.",
    "The court found that the plaintiff filed the motion against the defendant pursuant to the statute order.",
    "Patients in the clinical study showed that the treatment dose reduced the disease symptoms in most cells.",
]

NOISY = [
    "aaaaaaaaaaaaaaaaaaaaaaaaaaaaaaaa",
    "<div><p>Hello &amp; welcome</p></div> visit http://spam.example.com or mail bob@spam.example.com now!!!",
    "click here to subscribe to our newsletter now accept all cookies to continue",
    "x",
    "buy now buy now buy now buy now buy now buy now buy now buy now !!!!!!!!!!!!",
    "flaggedterm spam casino jackpot flaggedterm spam casino jackpot and nothing else",
    "§§§±±±¤¤¤ zk9f2 qq0x mmv8 2kkzj 9qq2m xx91j wv8n2 kkq0z jf92x",
]


@pytest.fixture(scope="session")
def clean_df(spark):
    return schema.from_texts(spark, CLEAN, metas=[{"language": "EN"}] * len(CLEAN))


@pytest.fixture(scope="session")
def noisy_df(spark):
    return schema.from_texts(spark, NOISY, metas=[{"language": "EN"}] * len(NOISY))


@pytest.fixture(scope="session")
def mixed_df(spark):
    texts = CLEAN + NOISY
    return schema.from_texts(spark, texts, metas=[{"language": "EN"}] * len(texts))


@pytest.fixture(scope="session")
def dup_df(spark):
    texts = CLEAN + [CLEAN[0], CLEAN[1], CLEAN[0].replace(".", "!", 1)]
    return schema.from_texts(spark, texts)


def texts_of(df):
    return schema.texts_of(df)


def stats_of(df, key):
    return [r[0] for r in df.select(schema.stat(key)).collect()]
