"""Distributed dataflow for the multi-source framework (DESIGN.md §3).

Executors play the data sources, the driver plays the data center:

- :func:`overlap_topk_sql` — OJSP as a pure Spark SQL *spatial join
  operator* (query cells ⋈ corpus cells → distinct-count → window top-k);
  the relational reference the index algorithms are checked against.
- :func:`build_distributed_index` — `applyInPandas` per ``source_id``
  builds each source's DITS-L inside its own task and persists it; the
  returned root summaries are "each source sends its root node to the data
  center", from which the driver builds DITS-G.
- :func:`distributed_overlap_search` / :func:`distributed_coverage_search`
  — DITS-G prunes candidate sources on the driver, the *clipped* query
  ships to per-source `mapInPandas` tasks which run the local search
  algorithms, and results aggregate back with DataFrame ops.
"""
from __future__ import annotations

import os
import pickle

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F

from .core.coverage import _pick_best, find_connect_set
from .core.dits_global import GlobalNode, RootSummary, build_global_index, candidate_sources
from .core.framework import clip_cells_to_summary, delta_to_deg, query_lonlat_geom
from .core.node import DatasetNode
from .core.overlap import query_node_from_cells
from .core.update import DitsLocalIndex
from .grid import Bounds


def overlap_topk_sql(
    spark: SparkSession,
    query_cells_df: DataFrame,
    corpus_cells_df: DataFrame,
    k: int,
    exclude: tuple[int, ...] = (),
) -> DataFrame:
    """OJSP as one Catalyst plan over (source_id, dataset_id, cell) rows.

    Returns (source_id, dataset_id, overlap), the global top-k under the
    repo-wide (-overlap, dataset_id) order, overlap > 0.
    """
    q = query_cells_df.select("cell").distinct()
    scored = (
        corpus_cells_df.join(q, "cell")
        .groupBy("source_id", "dataset_id")
        .agg(F.countDistinct("cell").alias("overlap"))
    )
    if exclude:
        scored = scored.filter(~F.col("dataset_id").isin(*[int(e) for e in exclude]))
    w = Window.orderBy(F.desc("overlap"), F.asc("dataset_id"))
    return (
        scored.withColumn("rank", F.row_number().over(w))
        .filter(F.col("rank") <= k)
        .drop("rank")
    )


_INDEX_CACHE: dict[str, DitsLocalIndex] = {}


def _load_index(path: str) -> DitsLocalIndex:
    idx = _INDEX_CACHE.get(path)
    if idx is None:
        with open(path, "rb") as fh:
            idx = pickle.load(fh)
        _INDEX_CACHE[path] = idx
    return idx


def build_distributed_index(
    cells_df: DataFrame,
    bounds: Bounds,
    theta: int,
    f: int,
    out_dir: str,
) -> tuple[GlobalNode, dict[str, RootSummary], dict[str, str]]:
    """Build every source's DITS-L inside Spark tasks; DITS-G on the driver.

    ``cells_df``: (source_id, dataset_id, cell) rows. Returns the global
    index, {source_id: RootSummary} and {source_id: pickle path}.
    """
    os.makedirs(out_dir, exist_ok=True)
    schema = (
        "source_id string, n_datasets long, gx0 double, gy0 double, "
        "gx1 double, gy1 double, path string"
    )

    def build(pdf: pd.DataFrame) -> pd.DataFrame:
        sid = str(pdf["source_id"].iloc[0])
        datasets = {
            int(did): np.unique(g["cell"].to_numpy(dtype=np.int64))
            for did, g in pdf.groupby("dataset_id")
        }
        idx = DitsLocalIndex(datasets, theta, f)
        path = os.path.join(out_dir, f"{sid}.pkl")
        with open(path, "wb") as fh:
            pickle.dump(idx, fh)
        r = idx.root.rect
        return pd.DataFrame(
            [
                {
                    "source_id": sid,
                    "n_datasets": len(datasets),
                    "gx0": float(r[0]),
                    "gy0": float(r[1]),
                    "gx1": float(r[2]),
                    "gy1": float(r[3]),
                    "path": path,
                }
            ]
        )

    rows = cells_df.groupBy("source_id").applyInPandas(build, schema).collect()
    summaries = {
        r["source_id"]: RootSummary.from_grid_rect(
            r["source_id"],
            np.array([r["gx0"], r["gy0"], r["gx1"], r["gy1"]]),
            bounds,
            theta,
            r["n_datasets"],
        )
        for r in rows
    }
    paths = {r["source_id"]: r["path"] for r in rows}
    groot = build_global_index(sorted(summaries.values(), key=lambda s: s.source_id))
    return groot, summaries, paths


def distributed_overlap_search(
    spark: SparkSession,
    groot: GlobalNode,
    summaries: dict[str, RootSummary],
    paths: dict[str, str],
    query_cells: np.ndarray,
    k: int,
    bounds: Bounds,
    theta: int,
    exclude: tuple[int, ...] = (),
) -> list[tuple[int, int]]:
    """OJSP over the distributed index; equals the driver-side framework."""
    query_cells = np.unique(np.asarray(query_cells, dtype=np.int64))
    rect, o, r = query_lonlat_geom(query_cells, bounds, theta)
    cands = candidate_sources(groot, rect, o, r, -1.0)
    tasks = []
    for s in cands:
        clipped = clip_cells_to_summary(query_cells, s, 0.0, bounds, theta)
        if len(clipped):
            tasks.append((s.source_id, paths[s.source_id], [int(c) for c in clipped]))
    if not tasks:
        return []
    tasks_df = spark.createDataFrame(
        pd.DataFrame(tasks, columns=["source_id", "path", "cells"])
    ).repartition(len(tasks), "source_id")
    excl = frozenset(int(e) for e in exclude)

    def run(batches):
        for pdf in batches:
            out = []
            for row in pdf.itertuples(index=False):
                idx = _load_index(row.path)
                qn = query_node_from_cells(np.asarray(row.cells, dtype=np.int64), theta)
                for did, ov in idx.search_overlap(qn, k, excl):
                    out.append((did, ov))
            yield pd.DataFrame(out, columns=["dataset_id", "overlap"])

    res = tasks_df.mapInPandas(run, "dataset_id long, overlap long")
    w = Window.orderBy(F.desc("overlap"), F.asc("dataset_id"))
    top = (
        res.withColumn("rank", F.row_number().over(w))
        .filter(F.col("rank") <= k)
        .drop("rank")
        .collect()
    )
    return [(int(r["dataset_id"]), int(r["overlap"])) for r in top]


def distributed_coverage_search(
    spark: SparkSession,
    groot: GlobalNode,
    summaries: dict[str, RootSummary],
    paths: dict[str, str],
    query_cells: np.ndarray,
    delta: float,
    k: int,
    bounds: Bounds,
    theta: int,
    exclude: tuple[int, ...] = (),
) -> list[tuple[int, int]]:
    """CJSP greedy: one Spark job per iteration (the paper's round trips)."""
    covered = {int(c) for c in np.asarray(query_cells, dtype=np.int64)}
    taken = set(int(e) for e in exclude)
    result: list[tuple[int, int]] = []
    pad = delta_to_deg(delta, bounds, theta)
    for _ in range(k):
        merged = np.fromiter(covered, dtype=np.int64)
        rect, o, r = query_lonlat_geom(merged, bounds, theta)
        cands = candidate_sources(groot, rect, o, r, pad)
        tasks = []
        for s in cands:
            clipped = clip_cells_to_summary(merged, s, pad, bounds, theta)
            if len(clipped):
                tasks.append(
                    (s.source_id, paths[s.source_id], [int(c) for c in clipped])
                )
        if not tasks:
            break
        tasks_df = spark.createDataFrame(
            pd.DataFrame(tasks, columns=["source_id", "path", "cells"])
        ).repartition(len(tasks), "source_id")
        taken_now = frozenset(taken)

        def run(batches):
            for pdf in batches:
                out = []
                for row in pdf.itertuples(index=False):
                    idx = _load_index(row.path)
                    cells = np.asarray(row.cells, dtype=np.int64)
                    merged_node = DatasetNode(-1, cells, theta)
                    found: list[DatasetNode] = []
                    find_connect_set(idx.root, merged_node, delta, found)
                    best, tau = _pick_best(
                        found, {int(c) for c in cells}, set(taken_now)
                    )
                    if best is not None:
                        out.append((row.source_id, best.id, tau))
                yield pd.DataFrame(out, columns=["source_id", "dataset_id", "gain"])

        rows = tasks_df.mapInPandas(
            run, "source_id string, dataset_id long, gain long"
        ).collect()
        best = None  # (gain, id, source)
        for row in rows:
            g, did = int(row["gain"]), int(row["dataset_id"])
            if best is None or g > best[0] or (g == best[0] and did < best[1]):
                best = (g, did, row["source_id"])
        if best is None:
            break
        gain, did, sid = best
        cells_won = _load_index(paths[sid])._nodes[did].cells
        covered.update(int(c) for c in cells_won)
        taken.add(did)
        result.append((did, gain))
    return result
