"""Benchmark fixtures: moderately sized corpora shared across benches
(generated once per session). Scales chosen so the whole benchmark
suite completes in minutes while still exercising shuffle paths."""
import pytest

from repro.corpus import components as C


@pytest.fixture(scope="session")
def books_df(spark):
    df = C.component(spark, "books", 2e-6).cache()
    df.count()
    return df


@pytest.fixture(scope="session")
def arxiv_df(spark):
    df = C.component(spark, "arxiv", 2e-6).cache()
    df.count()
    return df


@pytest.fixture(scope="session")
def cc_df(spark):
    df = C.component(spark, "commoncrawl", 2e-6).cache()
    df.count()
    return df
