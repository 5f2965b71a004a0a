"""Spark layer: Flood layout as partitioning/sort + data-skipping scans.

Results are oracle-checked against DuckDB over the same input
(repro.oracle.assert_equivalent), and the layout's structural invariants
(cell clustering, within-partition sort order, skipping effectiveness)
are asserted on the materialized DataFrame.
"""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.indexes.flood import Layout
from repro.oracle import assert_equivalent
from repro.sparkglue.layout import (CELL_COL, apply_flood_layout,
                                    cell_runs_for_query, learn_boundaries)
from repro.sparkglue.scan import (distributed_breakdown, flood_scan,
                                  skipped_fraction)

DIM_COLS = ["l_orderkey", "l_quantity", "l_discount", "l_extendedprice"]
LAYOUT = Layout(order=[0, 1, 2, 3], cols=[8, 4, 4])  # sort dim: extendedprice


@pytest.fixture(scope="module")
def li_pdf():
    return synth_data.lineitem_pdf(sf=0.005, seed=0)


@pytest.fixture(scope="module")
def laid(spark, li_pdf):
    df = spark.createDataFrame(li_pdf)
    sfl = learn_boundaries(df, LAYOUT, DIM_COLS, sample_rows=20_000)
    out = apply_flood_layout(df, sfl, num_partitions=8).cache()
    out.count()  # materialize
    yield out, sfl
    out.unpersist()


QUERIES = [
    {"l_quantity": (10.0, 20.0)},
    {"l_orderkey": (100.0, 900.0)},
    {"l_orderkey": (500.0, 2000.0), "l_discount": (0.02, 0.05)},
    {"l_quantity": (1.0, 5.0), "l_extendedprice": (1000.0, 30000.0)},
    {"l_discount": (0.05, 0.05)},  # equality
    {"l_orderkey": (100.0, 200.0), "l_quantity": (5.0, 25.0),
     "l_extendedprice": (900.0, 50000.0)},
]


def _sql_where(bounds):
    return " AND ".join(
        f"({c} >= {lo} AND {c} <= {hi})" for c, (lo, hi) in bounds.items()
    )


@pytest.mark.parametrize("bounds", QUERIES)
def test_count_matches_duckdb_oracle(laid, li_pdf, bounds):
    df, sfl = laid
    got = flood_scan(df, sfl, bounds).agg(F.count("*").alias("cnt"))
    assert_equivalent(
        got,
        f"SELECT count(*) AS cnt FROM lineitem WHERE {_sql_where(bounds)}",
        lineitem=li_pdf,
    )


@pytest.mark.parametrize("bounds", QUERIES[:3])
def test_sum_matches_duckdb_oracle(laid, li_pdf, bounds):
    df, sfl = laid
    got = flood_scan(df, sfl, bounds).agg(
        F.round(F.sum("l_extendedprice"), 2).alias("s")
    )
    assert_equivalent(
        got,
        "SELECT round(sum(l_extendedprice), 2) AS s FROM lineitem "
        f"WHERE {_sql_where(bounds)}",
        lineitem=li_pdf,
    )


def test_row_level_equivalence(laid, li_pdf):
    """Full matching-row set (not just aggregates) equals DuckDB's."""
    df, sfl = laid
    bounds = {"l_orderkey": (100.0, 300.0), "l_quantity": (10.0, 40.0)}
    got = (
        flood_scan(df, sfl, bounds)
        .select("l_orderkey", "l_linenumber", "l_quantity", "l_extendedprice")
    )
    assert_equivalent(
        got,
        "SELECT l_orderkey, l_linenumber, l_quantity, l_extendedprice "
        f"FROM lineitem WHERE {_sql_where(bounds)}",
        lineitem=li_pdf,
    )


def test_layout_clusters_cells(laid):
    """Each cell id must live in exactly one partition-contiguous run:
    sortWithinPartitions(cell, sort) ⇒ cells sorted inside partitions."""
    df, _ = laid

    def check(pdf_iter):
        for pdf in pdf_iter:
            cells = pdf[CELL_COL].to_numpy()
            ok = bool((np.diff(cells) >= 0).all()) if len(cells) else True
            yield pd.DataFrame({"ok": [ok]})

    res = df.mapInPandas(check, schema="ok boolean").collect()
    assert all(r["ok"] for r in res)


def test_sort_dim_ordered_within_cells(laid):
    df, sfl = laid

    def check(pdf_iter):
        for pdf in pdf_iter:
            ok = True
            for _, grp in pdf.groupby(CELL_COL):
                v = grp[sfl.sort_col].to_numpy()
                if (np.diff(v) < 0).any():
                    ok = False
            yield pd.DataFrame({"ok": [ok]})

    res = df.mapInPandas(check, schema="ok boolean").collect()
    assert all(r["ok"] for r in res)


def test_selective_query_skips_most_rows(laid):
    df, sfl = laid
    frac = skipped_fraction(df, sfl, {"l_orderkey": (100.0, 300.0)})
    assert frac > 0.5  # 8 columns on orderkey → ≥ 7/8 of cells skippable


def test_unselective_query_skips_nothing(laid):
    df, sfl = laid
    assert skipped_fraction(df, sfl, {}) == 0.0


def test_distributed_breakdown_counts(laid, li_pdf):
    df, sfl = laid
    bounds = {"l_orderkey": (100.0, 500.0), "l_quantity": (10.0, 30.0)}
    r = distributed_breakdown(df, sfl, bounds)
    m = (
        (li_pdf["l_orderkey"] >= 100) & (li_pdf["l_orderkey"] <= 500)
        & (li_pdf["l_quantity"] >= 10) & (li_pdf["l_quantity"] <= 30)
    )
    assert r["n_matched"] == int(m.sum())
    assert r["n_matched"] <= r["n_scanned"] <= len(li_pdf)
    assert r["scan_overhead"] >= 1.0


def test_cell_runs_merge_contiguous():
    layout = Layout(order=[0, 1, 2], cols=[4, 4])
    sfl_boundaries = {0: np.array([1.0, 2.0, 3.0]), 1: np.array([1.0, 2.0, 3.0])}
    from repro.sparkglue.layout import SparkFloodLayout

    sfl = SparkFloodLayout(layout=layout, dim_cols=["a", "b", "c"],
                           boundaries=sfl_boundaries)
    # no filters → one run covering all 16 cells
    assert cell_runs_for_query(sfl, {}) == [(0, 15)]
    # filter selecting b in one column → 4 disjoint runs
    runs = cell_runs_for_query(sfl, {"b": (0.0, 0.5)})
    assert runs == [(0, 0), (4, 4), (8, 8), (12, 12)]
    # filter on the leading dim → one contiguous run
    runs = cell_runs_for_query(sfl, {"a": (0.0, 1.5)})
    assert runs == [(0, 7)]


def test_flatten_false_uses_equal_width(spark, li_pdf):
    df = spark.createDataFrame(li_pdf)
    lay = Layout(order=[0, 1, 2, 3], cols=[4, 2, 2], flatten=False)
    sfl = learn_boundaries(df, lay, DIM_COLS, sample_rows=5000)
    b = sfl.boundaries[0]
    widths = np.diff(np.concatenate(([li_pdf["l_orderkey"].min()], b,
                                     [li_pdf["l_orderkey"].max()])))
    assert widths.std() / widths.mean() < 0.1
