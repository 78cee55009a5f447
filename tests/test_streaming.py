"""Tests for the Structured Streaming VOS operator (repro.core.streaming).

The invariant: whatever micro-batch boundaries the engine picks, the
assembled bit array is bit-exact equal to the batch (and hence the
sequential) build — xor order-independence made operational.
"""
import os

import numpy as np
import pytest

from repro.core import streaming, vos
from repro.streams import generator

PARAMS = vos.VOSParams(k=64, m=4096, seed=7)


class TestPackingHelpers:
    @pytest.mark.parametrize("m,b", [(4096, 16), (4096, 64), (100, 7), (64, 64)])
    def test_bucket_slots_cover_m(self, m, b):
        assert streaming.bucket_slots(m, b) * b >= m

    def test_popcount(self):
        words = np.array([0b1011, 0], dtype=np.uint64)
        assert streaming._popcount(words) == 3

    def test_n_words(self):
        assert streaming._n_words(1) == 1
        assert streaming._n_words(64) == 1
        assert streaming._n_words(65) == 2


class TestBucketedPositions:
    def test_partitioning_is_cyclic(self, spark, tiny_stream_pdf):
        sdf = generator.to_spark(spark, tiny_stream_pdf.head(200))
        out = streaming.bucketed_positions(sdf, PARAMS, 16).toPandas()
        assert ((out["pos"] % 16) == out["bucket"]).all()
        assert ((out["pos"] // 16) == out["local"]).all()


@pytest.mark.parametrize("n_buckets", [8, 64])
class TestStreamEqualsBatch:
    def test_single_drain(self, spark, tiny_stream_pdf, tmp_path, n_buckets):
        indir = tmp_path / "in"
        indir.mkdir()
        tiny_stream_pdf.to_parquet(indir / "all.parquet")
        name = f"vos_t1_{n_buckets}"
        q = streaming.start_query(
            spark, str(indir), str(tmp_path / "ck"), PARAMS,
            n_buckets=n_buckets, query_name=name,
        )
        try:
            q.processAllAvailable()
            A, beta = streaming.assemble_bit_array(spark, name, PARAMS, n_buckets)
        finally:
            q.stop()
        T = int(tiny_stream_pdf["t"].max())
        A_batch, betas = vos.build_bit_arrays(
            generator.to_spark(spark, tiny_stream_pdf), PARAMS, [T]
        )
        assert (A == A_batch[0]).all()
        assert beta == pytest.approx(betas[0])

    def test_incremental_batches(self, spark, tiny_stream_pdf, tmp_path, n_buckets):
        """Drain after each file drop; every intermediate state must
        equal the batch build of that prefix."""
        T = int(tiny_stream_pdf["t"].max())
        cuts = [T // 3, 2 * T // 3, T]
        indir = tmp_path / "in"
        indir.mkdir()
        name = f"vos_t2_{n_buckets}"
        q = streaming.start_query(
            spark, str(indir), str(tmp_path / "ck"), PARAMS,
            n_buckets=n_buckets, query_name=name,
        )
        sdf_full = generator.to_spark(spark, tiny_stream_pdf)
        try:
            lo = 0
            for bi, hi in enumerate(cuts):
                chunk = tiny_stream_pdf[
                    (tiny_stream_pdf["t"] > lo) & (tiny_stream_pdf["t"] <= hi)
                ]
                chunk.to_parquet(indir / f"b{bi}.parquet")
                lo = hi
                q.processAllAvailable()
                A, beta = streaming.assemble_bit_array(spark, name, PARAMS, n_buckets)
                A_batch, betas = vos.build_bit_arrays(sdf_full, PARAMS, [hi])
                assert (A == A_batch[0]).all(), f"prefix t<={hi}"
                assert beta == pytest.approx(betas[0])
        finally:
            q.stop()


class TestAssemble:
    def test_empty_table_gives_zero_array(self, spark, tmp_path):
        indir = tmp_path / "in"
        indir.mkdir()
        name = "vos_empty"
        q = streaming.start_query(
            spark, str(indir), str(tmp_path / "ck"), PARAMS, query_name=name
        )
        try:
            q.processAllAvailable()
            A, beta = streaming.assemble_bit_array(spark, name, PARAMS)
            assert A.sum() == 0 and beta == 0.0
        finally:
            q.stop()
