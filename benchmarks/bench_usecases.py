"""Benchmarks for the use-case harnesses (Tables E3–E5), including the
Spark-parallel dump path (one round — each call is a full Spark job)."""
import pytest

from repro.sci_data import rtm_snapshot
from repro.usecases.data_dump import dump_snapshot
from repro.usecases.insitu import budgeted_allocation, per_snapshot_models
from repro.usecases.memory_target import plan_and_compress

SHAPE = (16, 48, 48)


@pytest.fixture(scope="module")
def snap():
    return rtm_snapshot(2000, SHAPE)


def test_memory_plan_and_compress(benchmark, snap):
    benchmark(plan_and_compress, snap, 3.0)


def test_insitu_allocation(benchmark):
    snaps = {t: rtm_snapshot(t, SHAPE) for t in (1000, 2000, 3000)}
    models = per_snapshot_models(snaps, "lorenzo", seed=0)
    benchmark(budgeted_allocation, models, 2.0)


@pytest.mark.parametrize("method", ["tae", "model"])
def test_dump_snapshot_spark(benchmark, spark, tmp_path, method, snap):
    benchmark.pedantic(
        dump_snapshot,
        args=(spark, snap, 2000, str(tmp_path), method),
        kwargs={"n_partitions": 4, "target_psnr_db": 50.0},
        rounds=2,
        iterations=1,
    )
