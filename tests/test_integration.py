"""End-to-end integration: dedup → build → query → oracle-checked truth.

Follows the paper's full pipeline on one corpus: de-duplicate a corpus
with injected near-duplicates, index the surviving files with both BIGSI
and RAMBO through the distributed construction path, then answer a mixed
query workload and check it against the exact DuckDB-verified ground
truth.
"""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core.bigsi import BigsiIndex
from repro.core.eval import (
    GroundTruth,
    distributed_query,
    ground_truth_pairs,
    measure,
    query_workload,
)
from repro.core.rambo import RamboIndex
from repro.dedup.lsh import dedup_files
from repro.oracle import assert_equivalent
from tests.conftest import DUPED, K


@pytest.fixture(scope="module")
def pipeline(spark, duped_kmers):
    """Dedup the corpus, then index the surviving files with both systems."""
    res = dedup_files(duped_kmers, num_perms=48, rows_per_band=4, threshold=0.9)
    kept = [int(x) for x in res.kept]
    clean = duped_kmers.where(F.col("file_id").isin(kept)).cache()
    clean.count()
    # Re-id files densely 0..K-1 as an index build expects.
    remap = {fid: i for i, fid in enumerate(kept)}
    mapping = spark.createDataFrame(
        [(fid, i) for fid, i in remap.items()], ["file_id", "new_id"]
    )
    dense = (
        clean.join(F.broadcast(mapping), "file_id")
        .select(F.col("new_id").alias("file_id"), "code")
        .cache()
    )
    dense.count()
    n = len(kept)
    bigsi = BigsiIndex.build(dense, n, m=16384, eta=3)
    rambo = RamboIndex.build(dense, n, m=65536, eta=3, num_partitions=8, num_repetitions=3)
    truth = GroundTruth.from_pairs_df(dense)
    return {"n": n, "kmers": dense, "bigsi": bigsi, "rambo": rambo, "truth": truth, "res": res}


class TestPipeline:
    def test_dedup_removed_injected_duplicates(self, pipeline):
        assert pipeline["n"] <= DUPED.n_files - DUPED.n_duplicates + 2
        assert pipeline["n"] >= DUPED.n_originals - 5

    def test_both_indexes_zero_fn_low_fp(self, pipeline):
        q = query_workload(pipeline["truth"], 500, K, seed=13)
        for name in ("bigsi", "rambo"):
            m = measure(pipeline[name], q, pipeline["truth"], n_files=pipeline["n"])
            assert m.false_negatives == 0, name
            assert m.fp_rate < 0.05, name

    def test_distributed_query_against_oracle(self, spark, pipeline):
        """The distributed query path must contain the DuckDB-exact answers
        and agree with the driver engines."""
        truth = pipeline["truth"]
        codes = np.concatenate(
            [truth.codes[:: max(1, len(truth.codes) // 40)][:40]]
        )
        exact = ground_truth_pairs(spark, pipeline["kmers"], codes)
        assert_equivalent(
            exact,
            """
            SELECT k.code AS code, k.file_id AS file_id
            FROM kmers k JOIN (SELECT DISTINCT code FROM queries) q USING (code)
            """,
            kmers=pipeline["kmers"],
            queries=__import__("pandas").DataFrame({"code": codes}),
        )
        exact_pairs = set(map(tuple, exact.toPandas()[["code", "file_id"]].to_numpy()))
        for name in ("bigsi", "rambo"):
            got = distributed_query(spark, pipeline[name], codes).toPandas()
            got_pairs = set(map(tuple, got[["code", "file_id"]].to_numpy()))
            assert exact_pairs <= got_pairs, name

    def test_rambo_candidates_consistent_with_bigsi(self, pipeline):
        """Both engines share Bloom seeds, so RAMBO's decode can only keep
        files whose merged filter fired — never inventing files BIGSI-style
        columns would reject at the same load is not guaranteed, but the
        exact true set is always contained in both."""
        truth = pipeline["truth"]
        for c in truth.codes[:100]:
            want = set(truth.lookup(int(c)).tolist())
            assert want <= set(pipeline["bigsi"].query(int(c)).tolist())
            assert want <= set(pipeline["rambo"].query(int(c)).tolist())

    def test_memory_and_width_tradeoff(self, pipeline):
        """RAMBO's query structure is narrower (fewer columns); its matrix
        may be taller — the paper's time-vs-memory trade."""
        assert pipeline["rambo"].ncols < pipeline["bigsi"].ncols
