"""Shared fixtures: the tiny dataset's dynamic stream, pandas + Spark."""
import pytest

from repro.streams import datasets, generator


@pytest.fixture(scope="session")
def tiny_stream_pdf():
    """The 'tiny' dataset's fully dynamic stream (pandas, deterministic)."""
    stream, _ = datasets.make_stream("tiny", seed=0)
    return stream


@pytest.fixture(scope="session")
def tiny_spec():
    return datasets.DATASETS["tiny"]


@pytest.fixture(scope="session")
def tiny_stream_sdf(spark, tiny_stream_pdf):
    """The tiny stream as a cached Spark DataFrame."""
    df = generator.to_spark(spark, tiny_stream_pdf).cache()
    df.count()
    yield df
    df.unpersist()
