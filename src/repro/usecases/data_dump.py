"""§V-F: overall data-management (dumping) performance — parallel-HDF5
stand-in on Spark.

Each RTM snapshot is split across ``n_partitions`` chunks (one per "MPI
rank"); inside executors each chunk is compressed and written to its own
binary file on the shared local filesystem (the per-rank collective-write
role of parallel HDF5). Three methods, as in Fig. 14:

* **traditional** — one static offline error bound for every snapshot (the
  worst-case bound from an offline study; its cost is not part of dumping);
* **tae** — in-situ trial-and-error: each rank test-compresses its chunk at
  5 candidate error bounds, measures PSNR, picks the cheapest bound meeting
  the target, then compresses for real (experimenting time = optimization);
* **model** — ours: each rank builds the ratio-quality model (1% sample)
  and inverts it for the PSNR target, then compresses once.

Per-phase wall time of a snapshot is the **max over ranks** (the parallel
barrier), as in an MPI collective dump.
"""
from __future__ import annotations

import os
import struct
import time
from typing import Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

from .. import analysis
from ..compressor import pipeline
from ..core.model import RatioQualityModel
from ..sci_data import rtm_snapshot
from ..sparklayer.chunks import array_to_chunks, chunk_to_array

__all__ = [
    "DUMP_SCHEMA",
    "dump_snapshot",
    "run_dump_study",
    "read_partition_file",
    "offline_worstcase_abs_eb",
    "candidate_abs_ebs",
    "CANDIDATE_SCALES",
]

#: The in-situ TAE candidate bound scales. The paper's candidates are five
#: shared ABSOLUTE bounds spanning four decades (ABS 1e-4 … 1e-8); ours are
#: these factors times one global reference range (the first snapshot's),
#: fixed for the whole run — shared absolute bounds are what expose the
#: per-snapshot heterogeneity the in-situ methods exploit, and the
#: factor-10 spacing is the "limited error bound granularity" the paper
#: holds against TAE.
CANDIDATE_SCALES: tuple[float, ...] = (3e-2, 3e-3, 3e-4, 3e-5, 3e-6)


def candidate_abs_ebs(reference_range: float) -> tuple[float, ...]:
    """The five shared absolute candidate bounds for a dump run."""
    return tuple(s * reference_range for s in CANDIDATE_SCALES)

DUMP_SCHEMA = T.StructType(
    [
        T.StructField("t", T.IntegerType(), False),
        T.StructField("method", T.StringType(), False),
        T.StructField("chunk_id", T.IntegerType(), False),
        T.StructField("opt_seconds", T.DoubleType(), False),
        T.StructField("compress_seconds", T.DoubleType(), False),
        T.StructField("io_seconds", T.DoubleType(), False),
        T.StructField("nbytes", T.LongType(), False),
        T.StructField("eb_abs", T.DoubleType(), False),
        T.StructField("psnr", T.DoubleType(), False),
        T.StructField("mse", T.DoubleType(), False),
        T.StructField("n_points", T.LongType(), False),
        T.StructField("vmin", T.DoubleType(), False),
        T.StructField("vmax", T.DoubleType(), False),
    ]
)

_MAGIC = b"RQD1"


def _write_partition(path: str, c: pipeline.CompressedField) -> int:
    """Serialize one compressed chunk (header + codes as int32 + side data).

    A real deployment would write the Huffman bitstream; serializing the
    code array keeps the file self-describing for the round-trip check while
    the *accounted* size (``nbytes``, what the ratio uses) remains the
    Huffman+lossless size. I/O time is measured on the actual write.
    """
    codes = c.codes.astype(np.int32)
    extras = c.extras.get("anchors", c.extras.get("coefs"))
    extra_bytes = extras.astype(np.float32).tobytes() if extras is not None else b""
    with open(path, "wb") as f:
        f.write(_MAGIC)
        f.write(struct.pack("<d", c.eb_abs))
        f.write(struct.pack("<B", len(c.shape)))
        for s in c.shape:
            f.write(struct.pack("<I", s))
        name = c.predictor.encode()
        f.write(struct.pack("<B", len(name)))
        f.write(name)
        f.write(struct.pack("<Q", codes.size))
        f.write(struct.pack("<Q", len(extra_bytes)))
        f.write(extra_bytes)
        f.write(codes.tobytes())
        f.flush()
        os.fsync(f.fileno())
    return os.path.getsize(path)


def read_partition_file(path: str) -> np.ndarray:
    """Decompress a partition file written by :func:`_write_partition`."""
    from ..compressor.predictors import get_predictor

    with open(path, "rb") as f:
        assert f.read(4) == _MAGIC, "bad magic"
        (eb,) = struct.unpack("<d", f.read(8))
        (nd,) = struct.unpack("<B", f.read(1))
        shape = tuple(struct.unpack("<I", f.read(4))[0] for _ in range(nd))
        (ln,) = struct.unpack("<B", f.read(1))
        predictor = f.read(ln).decode()
        (ncodes,) = struct.unpack("<Q", f.read(8))
        (nextra,) = struct.unpack("<Q", f.read(8))
        extra = np.frombuffer(f.read(nextra), dtype=np.float32)
        codes = np.frombuffer(f.read(4 * ncodes), dtype=np.int32)
    pred = get_predictor(predictor)
    extras: dict = {}
    if predictor == "interp":
        from ..compressor.predictors import _anchor_stride

        s0 = _anchor_stride(shape)
        ashape = tuple(len(range(0, n, s0)) for n in shape)
        extras = {"anchors": extra.reshape(ashape)}
    elif predictor == "regression":
        extras = {"coefs": extra.reshape(-1, 1 + min(len(shape), 3))}
    return pred.decompress(codes.astype(np.int64), shape, eb, extras)


def dump_snapshot(
    spark: SparkSession,
    data: np.ndarray,
    t: int,
    outdir: str,
    method: str,
    target_psnr_db: float = 56.0,
    predictor: str = "lorenzo",
    n_partitions: int = 8,
    traditional_abs_eb: float | None = None,
    candidates_abs: Sequence[float] | None = None,
    io_bytes_per_second: float | None = None,
    global_range: float | None = None,
) -> pd.DataFrame:
    """Dump one snapshot with one method → per-chunk timing rows.

    ``io_bytes_per_second`` (optional) models a per-rank parallel-filesystem
    bandwidth budget: the write path sleeps until ``nbytes/bandwidth`` has
    elapsed. A local SSD with a warm page cache writes these laptop-scale
    partitions in microseconds, which would erase the I/O term that
    dominates the paper's Fig. 14 (their Lustre baseline dump is 29.4 s);
    the throttle restores the paper's regime where dumped *bytes* translate
    into dump *time* (see DESIGN.md §2).
    """
    os.makedirs(outdir, exist_ok=True)
    chunks = array_to_chunks(spark, "RTM", str(t), data, n_chunks=n_partitions)
    chunks = chunks.repartition(n_partitions)
    snap_range = float(
        np.asarray(data, np.float64).max() - np.asarray(data, np.float64).min()
    )
    if candidates_abs is None:
        candidates_abs = candidate_abs_ebs(snap_range)
    cand = tuple(sorted(candidates_abs, reverse=True))
    trad_abs = traditional_abs_eb
    # the quality floor is snapshot-level PSNR (as in the paper); each rank
    # knows the snapshot's global range (an allreduce in an MPI code) and
    # keeps its partition's MSE within the implied budget
    gr = float(global_range) if global_range is not None else snap_range
    mse_budget = gr * gr * 10.0 ** (-target_psnr_db / 10.0)

    def run(batches):
        for pdf in batches:
            rows = []
            for _, row in pdf.iterrows():
                arr = chunk_to_array(row)
                cid = int(row["chunk_id"])
                t_opt = 0.0
                if method == "traditional":
                    if trad_abs is None:
                        raise ValueError("traditional method needs traditional_abs_eb")
                    eb = trad_abs
                elif method == "tae":
                    t0 = time.perf_counter()
                    eb = cand[-1]  # fallback: strictest candidate
                    for eb_try in cand:  # largest (cheapest) first
                        c = pipeline.compress(arr, predictor, eb_try)
                        rec = pipeline.decompress(c)
                        mse = float(np.mean((np.asarray(arr, np.float64) - rec) ** 2))
                        if mse <= mse_budget:
                            eb = eb_try
                            break
                    t_opt = time.perf_counter() - t0
                elif method == "model":
                    t0 = time.perf_counter()
                    model = RatioQualityModel(arr, predictor, seed=t + cid)
                    # ~20% MSE headroom absorbs model-estimation error
                    # (cf. the 20% bit-rate headroom of use-case 2)
                    eb = model.error_bound_for_mse(0.8 * mse_budget)
                    t_opt = time.perf_counter() - t0
                else:
                    raise ValueError(f"unknown method {method!r}")
                t0 = time.perf_counter()
                c = pipeline.compress(arr, predictor, eb)
                nbytes = c.nbytes_lossless
                t_comp = time.perf_counter() - t0
                path = os.path.join(outdir, f"t{t}_{method}_p{cid}.bin")
                t0 = time.perf_counter()
                _write_partition(path, c)
                t_io = time.perf_counter() - t0
                if io_bytes_per_second is not None:
                    budget = nbytes / io_bytes_per_second
                    if budget > t_io:
                        time.sleep(budget - t_io)
                        t_io = budget
                rec = pipeline.decompress(c)
                a64 = np.asarray(arr, np.float64)
                rows.append(
                    dict(
                        t=t,
                        method=method,
                        chunk_id=cid,
                        opt_seconds=t_opt,
                        compress_seconds=t_comp,
                        io_seconds=t_io,
                        nbytes=int(nbytes),
                        eb_abs=float(eb),
                        psnr=analysis.psnr(arr, rec),
                        mse=float(np.mean((a64 - rec) ** 2)),
                        n_points=int(arr.size),
                        vmin=float(a64.min()),
                        vmax=float(a64.max()),
                    )
                )
            yield pd.DataFrame(rows)

    return chunks.mapInPandas(run, schema=DUMP_SCHEMA).toPandas()


def offline_worstcase_abs_eb(
    timesteps: Sequence[int],
    shape: tuple[int, int, int],
    target_psnr_db: float,
    predictor: str = "lorenzo",
    candidates_abs: Sequence[float] | None = None,
) -> float:
    """The traditional method's offline study: the largest shared absolute
    candidate bound that meets the PSNR target on **every** snapshot
    (Liebig's barrel — the lowest-amplitude snapshot dictates the bound)."""
    if candidates_abs is None:
        d0 = rtm_snapshot(timesteps[0], shape)
        candidates_abs = candidate_abs_ebs(float(d0.max() - d0.min()))
    ok = set(candidates_abs)
    for t in timesteps:
        d = rtm_snapshot(t, shape)
        for eb in list(ok):
            m = pipeline.measure(d, predictor, eb, with_ssim=False)
            if m["psnr"] < target_psnr_db:
                ok.discard(eb)
    return max(ok) if ok else min(candidates_abs)


def run_dump_study(
    spark: SparkSession,
    timesteps: Sequence[int],
    shape: tuple[int, int, int],
    outdir: str,
    target_psnr_db: float = 56.0,
    predictor: str = "lorenzo",
    n_partitions: int = 8,
    io_bytes_per_second: float | None = None,
) -> pd.DataFrame:
    """Fig. 14: dump every snapshot with all three methods; per-snapshot
    per-phase time = max over ranks; also times the no-compression
    baseline. Quality is judged at snapshot level (the paper's PSNR), by
    recombining per-rank MSE/extrema."""
    d0 = rtm_snapshot(timesteps[0], shape)
    cands = candidate_abs_ebs(float(d0.max() - d0.min()))
    trad_abs = offline_worstcase_abs_eb(
        timesteps, shape, target_psnr_db, predictor, cands
    )
    records = []
    for t in timesteps:
        data = rtm_snapshot(int(t), shape)
        # uncompressed baseline: parallel raw write of the full snapshot
        raw_path = os.path.join(outdir, f"t{t}_raw.bin")
        os.makedirs(outdir, exist_ok=True)
        t0 = time.perf_counter()
        with open(raw_path, "wb") as f:
            f.write(np.ascontiguousarray(data).tobytes())
            f.flush()
            os.fsync(f.fileno())
        raw_io = time.perf_counter() - t0
        if io_bytes_per_second is not None:
            # per-rank bandwidth model: ranks write their raw share in parallel
            raw_io = max(raw_io, data.nbytes / n_partitions / io_bytes_per_second)
        for method in ("traditional", "tae", "model"):
            pdf = dump_snapshot(
                spark,
                data,
                int(t),
                outdir,
                method,
                target_psnr_db=target_psnr_db,
                predictor=predictor,
                n_partitions=n_partitions,
                traditional_abs_eb=trad_abs,
                candidates_abs=cands,
                io_bytes_per_second=io_bytes_per_second,
            )
            # snapshot-level PSNR from per-rank pieces
            mse = float((pdf["mse"] * pdf["n_points"]).sum() / pdf["n_points"].sum())
            vrange = float(pdf["vmax"].max() - pdf["vmin"].min())
            snap_psnr = (
                float("inf") if mse == 0 else 10 * np.log10(vrange * vrange / mse)
            )
            records.append(
                dict(
                    t=int(t),
                    method=method,
                    opt_seconds=float(pdf["opt_seconds"].max()),
                    compress_seconds=float(pdf["compress_seconds"].max()),
                    io_seconds=float(pdf["io_seconds"].max()),
                    total_seconds=float(
                        pdf["opt_seconds"].max()
                        + pdf["compress_seconds"].max()
                        + pdf["io_seconds"].max()
                    ),
                    nbytes=int(pdf["nbytes"].sum()),
                    snapshot_psnr=snap_psnr,
                    raw_io_seconds=raw_io,
                    traditional_abs_eb=trad_abs,
                )
            )
    return pd.DataFrame(records)
