"""Smoke tests for every jobs/ entrypoint at reduced scale."""
import importlib.util
import os
import sys
from argparse import Namespace

import pytest

JOBS_DIR = os.path.join(os.path.dirname(__file__), "..", "jobs")


def load_job(name: str):
    sys.path.insert(0, os.path.abspath(JOBS_DIR))
    try:
        spec = importlib.util.spec_from_file_location(
            name, os.path.join(JOBS_DIR, f"{name}.py")
        )
        mod = importlib.util.module_from_spec(spec)
        spec.loader.exec_module(mod)
        return mod
    finally:
        sys.path.pop(0)


SWEEP_ARGS = Namespace(scale=0.01, n_queries=150, save_rows=None, rows_csv=None)


@pytest.mark.parametrize(
    "name",
    [
        "fig5_query_tradeoff_3480",
        "fig6_query_tradeoff_2500",
        "fig7_memory_3480",
        "fig8_memory_2500",
    ],
)
def test_figure_jobs_run_scaled(spark, name, tmp_path):
    job = load_job(name)
    args = Namespace(
        scale=0.01, n_queries=150, save_rows=str(tmp_path / "rows.csv"), rows_csv=None
    )
    out = job.run(spark, args)
    assert "bigsi" in out and "rambo" in out and "ratio_B/R" in out
    # Reload path must reproduce the tables without recomputation.
    args2 = Namespace(scale=0.01, n_queries=150, save_rows=None, rows_csv=str(tmp_path / "rows.csv"))
    assert job.run(spark, args2).splitlines()[2:] == out.splitlines()[2:]


def test_scaling_job(spark):
    job = load_job("scaling_nfiles")
    out = job.run(
        spark,
        Namespace(n_files=[20, 40], eta=3, bits_factor=8.0, n_queries=100),
    )
    assert "speedup" in out
    assert "N=   20" in out and "N=   40" in out


def test_dedup_job(spark):
    job = load_job("dedup_corpus")
    out = job.run(
        spark,
        Namespace(
            n_files=30, dup_fraction=0.2, num_perms=24, rows_per_band=4,
            threshold=0.9, seed=7,
        ),
    )
    assert "files before dedup:        30" in out
    assert "files after dedup" in out


def test_build_and_query_jobs(spark, tmp_path):
    build = load_job("build_index")
    query = load_job("query_index")
    for system in ("bigsi", "rambo"):
        path = str(tmp_path / f"{system}.npz")
        out = build.run(
            spark,
            Namespace(
                system=system, out=path, n_files=25, m=4096, eta=3,
                num_partitions=5, num_repetitions=2, seed=0,
            ),
        )
        assert os.path.exists(path)
        assert f"built {system} index" in out
        qout = query.run(
            spark, Namespace(index=path, kmers=None, n_random=5, seed=1)
        )
        assert qout.count("file(s)") == 5


def test_query_job_with_explicit_kmers(spark, tmp_path):
    build = load_job("build_index")
    query = load_job("query_index")
    path = str(tmp_path / "b.npz")
    build.run(
        spark,
        Namespace(system="bigsi", out=path, n_files=25, m=4096, eta=3,
                  num_partitions=5, num_repetitions=2, seed=0),
    )
    qout = query.run(
        spark, Namespace(index=path, kmers=["A" * 31, "ACGT" * 7 + "ACG"], n_random=0, seed=0)
    )
    assert qout.count("file(s)") == 2
