"""Spark integration tests: chunk round-trips, executor-side UDFs vs local
computation, and Spark SQL aggregations checked against the DuckDB oracle."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import sci_data
from repro.compressor import pipeline
from repro.core.model import RatioQualityModel
from repro.oracle import assert_equivalent
from repro.sparklayer import (
    array_to_chunks,
    chunk_to_array,
    chunks_to_arrays,
    estimate_metrics,
    measure_metrics,
    sample_reports,
)


@pytest.fixture(scope="module")
def chunks_df(spark):
    d = sci_data.generate("SCALE", "PRES", "test")
    return array_to_chunks(spark, "SCALE", "PRES", d, n_chunks=3).cache()


@pytest.fixture(scope="module")
def metrics_df(spark, chunks_df):
    est = estimate_metrics(chunks_df, ["lorenzo", "interp"], [1e-3, 1e-2], seed=1)
    meas = measure_metrics(chunks_df, ["lorenzo", "interp"], [1e-3, 1e-2])
    return est.unionByName(meas).cache()


def test_chunk_roundtrip_exact(spark, chunks_df):
    d = sci_data.generate("SCALE", "PRES", "test")
    arrs = chunks_to_arrays(chunks_df)
    rebuilt = np.concatenate([arrs[("SCALE", "PRES", i)] for i in range(3)], axis=0)
    np.testing.assert_array_equal(rebuilt, d)


def test_chunk_schema(chunks_df):
    assert set(chunks_df.columns) == {
        "dataset", "field", "chunk_id", "dims", "dtype", "values",
    }
    row = chunks_df.first()
    arr = chunk_to_array(row.asDict())
    assert arr.dtype == np.float32


def test_chunking_single_chunk(spark):
    d = sci_data.generate("Brown", "pressure", "test")
    df = array_to_chunks(spark, "Brown", "pressure", d, n_chunks=1)
    assert df.count() == 1
    np.testing.assert_array_equal(chunk_to_array(df.first().asDict()), d)


def test_estimate_udf_matches_local(spark, chunks_df):
    """Executor-side model == driver-side model, chunk by chunk."""
    pdf = estimate_metrics(chunks_df, ["lorenzo"], [1e-2], seed=5).toPandas()
    arrs = chunks_to_arrays(chunks_df)
    for _, r in pdf.iterrows():
        arr = arrs[(r["dataset"], r["field"], int(r["chunk_id"]))]
        local = RatioQualityModel(arr, "lorenzo", seed=5)
        est = local.estimate(local.abs_bound(1e-2))
        assert r["bitrate_huff"] == pytest.approx(est["bitrate_huff"], rel=1e-9)
        assert r["psnr"] == pytest.approx(est["psnr"], rel=1e-9)


def test_measure_udf_matches_local(spark, chunks_df):
    pdf = measure_metrics(chunks_df, ["lorenzo"], [1e-2]).toPandas()
    arrs = chunks_to_arrays(chunks_df)
    for _, r in pdf.iterrows():
        arr = arrs[(r["dataset"], r["field"], int(r["chunk_id"]))]
        d = np.asarray(arr, np.float64)
        m = pipeline.measure(arr, "lorenzo", 1e-2 * float(d.max() - d.min()))
        assert r["bitrate_huff"] == pytest.approx(m["bitrate_huff"], rel=1e-9)


def test_metric_row_counts(metrics_df):
    # 3 chunks × 2 predictors × 2 ebs × 2 kinds
    assert metrics_df.count() == 24


def test_sample_reports_udf(spark, chunks_df):
    pdf = sample_reports(chunks_df, "lorenzo", rate=0.01, seed=0).toPandas()
    assert len(pdf) == 3
    # test-scale chunks are ~2.3k points, so the sampling floor dominates;
    # bench-scale fidelity (paper's 0.12%) is checked in the Table II run
    assert (pdf["sample_err"] < 0.15).all()


# ---------------------------------------------------------------------------
# Oracle-checked Spark SQL aggregations (the relational layer of the repro)
# ---------------------------------------------------------------------------
def test_mean_bitrate_per_group_vs_oracle(spark, metrics_df):
    out = (
        metrics_df.groupBy("predictor", "kind", "eb_rel")
        .agg(
            F.avg("bitrate_huff").alias("mean_bitrate"),
            F.count(F.lit(1)).alias("n"),
        )
    )
    assert_equivalent(
        out,
        """
        SELECT predictor, kind, eb_rel,
               avg(bitrate_huff) AS mean_bitrate,
               count(*) AS n
        FROM metrics GROUP BY predictor, kind, eb_rel
        """,
        metrics=metrics_df,
    )


def test_est_meas_join_vs_oracle(spark, metrics_df):
    """The Table II inner join (estimates ⋈ measurements) through the
    shuffle path, checked against DuckDB."""
    est = metrics_df.filter(F.col("kind") == "est").select(
        "dataset", "field", "chunk_id", "predictor", "eb_rel",
        F.col("bitrate_huff").alias("est_b"),
    )
    meas = metrics_df.filter(F.col("kind") == "meas").select(
        "dataset", "field", "chunk_id", "predictor", "eb_rel",
        F.col("bitrate_huff").alias("meas_b"),
    )
    joined = est.join(meas, ["dataset", "field", "chunk_id", "predictor", "eb_rel"]).select(
        "dataset", "field", "chunk_id", "predictor", "eb_rel",
        (F.col("est_b") / F.col("meas_b")).alias("ratio"),
    )
    assert_equivalent(
        joined,
        """
        SELECT e.dataset, e.field, e.chunk_id, e.predictor, e.eb_rel,
               e.bitrate_huff / m.bitrate_huff AS ratio
        FROM (SELECT * FROM metrics WHERE kind = 'est') e
        JOIN (SELECT * FROM metrics WHERE kind = 'meas') m
        USING (dataset, field, chunk_id, predictor, eb_rel)
        """,
        metrics=metrics_df,
    )


def test_best_predictor_per_chunk_vs_oracle(spark, metrics_df):
    """Use-case-1 selection as SQL: per (chunk, eb), the predictor with the
    highest estimated PSNR."""
    est = metrics_df.filter(F.col("kind") == "est")
    out = (
        est.groupBy("chunk_id", "eb_rel")
        .agg(F.max_by("predictor", "psnr").alias("best_predictor"))
    )
    assert_equivalent(
        out,
        """
        SELECT chunk_id, eb_rel, arg_max(predictor, psnr) AS best_predictor
        FROM metrics WHERE kind = 'est' GROUP BY chunk_id, eb_rel
        """,
        metrics=metrics_df,
    )


def test_weighted_field_bitrate_vs_oracle(spark, metrics_df):
    """Points-weighted per-field bit-rate (chunks differ in size)."""
    meas = metrics_df.filter((F.col("kind") == "meas") & (F.col("predictor") == "lorenzo"))
    out = meas.groupBy("dataset", "field", "eb_rel").agg(
        (
            F.sum(F.col("bitrate_huff") * F.col("n_points")) / F.sum("n_points")
        ).alias("wmean_bitrate")
    )
    assert_equivalent(
        out,
        """
        SELECT dataset, field, eb_rel,
               sum(bitrate_huff * n_points) / sum(n_points) AS wmean_bitrate
        FROM metrics
        WHERE kind = 'meas' AND predictor = 'lorenzo'
        GROUP BY dataset, field, eb_rel
        """,
        metrics=metrics_df,
    )


def test_udf_determinism(spark, chunks_df):
    a = estimate_metrics(chunks_df, ["lorenzo"], [1e-3], seed=9).toPandas()
    b = estimate_metrics(chunks_df, ["lorenzo"], [1e-3], seed=9).toPandas()
    a = a.sort_values("chunk_id").reset_index(drop=True)
    b = b.sort_values("chunk_id").reset_index(drop=True)
    pd.testing.assert_frame_equal(
        a.drop(columns="seconds"), b.drop(columns="seconds")
    )
