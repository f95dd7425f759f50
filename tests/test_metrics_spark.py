"""Spark metric aggregations vs numpy reference and the DuckDB oracle."""

import numpy as np
import pandas as pd
import pytest

from repro import synth_data
from repro.metrics import sql as msql
from repro.metrics.reference import gini, nakamoto, shannon_entropy
from repro.metrics.spark_metrics import (
    decentralization_by_window,
    entropy_by_window,
    gini_by_window,
    nakamoto_by_window,
    per_window_counts,
)
from repro.oracle import assert_equivalent


def _credits_pdf(kind: str, seed: int, n_windows: int = 6, n_rows: int = 4_000):
    """Producer-credit rows (window_id, miner) with zipf or uniform miners."""
    g = np.random.default_rng(seed)
    if kind == "zipf":
        ranks = np.arange(1, 81)
        w = 1.0 / ranks**1.3
        w /= w.sum()
        miners = g.choice(ranks, size=n_rows, p=w)
    elif kind == "uniform":
        miners = g.integers(1, 81, n_rows)
    else:  # "concentrated": one dominant miner per window
        miners = np.where(g.random(n_rows) < 0.6, 1, g.integers(2, 20, n_rows))
    return pd.DataFrame(
        {
            "window_id": g.integers(0, n_windows, n_rows).astype(np.int64),
            "miner": np.char.add("m", miners.astype(str)),
        }
    )


KINDS = ["zipf", "uniform", "concentrated"]


@pytest.fixture(scope="module")
def credit_frames(spark):
    out = {}
    for kind in KINDS:
        for seed in (0, 1):
            pdf = _credits_pdf(kind, seed)
            out[(kind, seed)] = (pdf, spark.createDataFrame(pdf))
    return out


# ---------------------------------------------------------------------------
# Spark vs numpy reference
# ---------------------------------------------------------------------------

@pytest.mark.parametrize("kind", KINDS)
@pytest.mark.parametrize("seed", [0, 1])
def test_all_metrics_match_reference(credit_frames, kind, seed):
    pdf, sdf = credit_frames[(kind, seed)]
    got = (
        decentralization_by_window(sdf, "window_id")
        .toPandas()
        .set_index("window_id")
        .sort_index()
    )
    for wid, grp in pdf.groupby("window_id"):
        c = grp.miner.value_counts().to_numpy()
        row = got.loc[wid]
        assert row["gini"] == pytest.approx(gini(c), abs=1e-9)
        assert row["entropy"] == pytest.approx(shannon_entropy(c), abs=1e-9)
        assert int(row["nakamoto"]) == nakamoto(c)
        assert int(row["n_miners"]) == len(c)
        assert int(row["n_credits"]) == len(grp)


@pytest.mark.parametrize("kind", KINDS)
def test_single_metric_helpers_agree_with_combined(credit_frames, kind):
    _, sdf = credit_frames[(kind, 0)]
    counts = per_window_counts(sdf, "window_id")
    combined = decentralization_by_window(sdf, "window_id").toPandas().set_index("window_id")
    g = gini_by_window(counts, "window_id").toPandas().set_index("window_id")
    e = entropy_by_window(counts, "window_id").toPandas().set_index("window_id")
    n = nakamoto_by_window(counts, "window_id").toPandas().set_index("window_id")
    for wid in combined.index:
        assert combined.loc[wid, "gini"] == pytest.approx(g.loc[wid, "gini"], abs=1e-12)
        assert combined.loc[wid, "entropy"] == pytest.approx(e.loc[wid, "entropy"], abs=1e-12)
        assert combined.loc[wid, "nakamoto"] == n.loc[wid, "nakamoto"]


# ---------------------------------------------------------------------------
# Spark vs DuckDB oracle (same SQL on both engines)
# ---------------------------------------------------------------------------

@pytest.mark.parametrize("kind", KINDS)
@pytest.mark.parametrize("seed", [0, 1])
def test_counts_vs_oracle(credit_frames, kind, seed):
    pdf, sdf = credit_frames[(kind, seed)]
    got = per_window_counts(sdf, "window_id")
    assert_equivalent(got, msql.counts_sql("bp", "window_id"), bp=pdf)


@pytest.mark.parametrize("kind", KINDS)
@pytest.mark.parametrize("seed", [0, 1])
def test_gini_vs_oracle(credit_frames, kind, seed):
    pdf, sdf = credit_frames[(kind, seed)]
    got = gini_by_window(per_window_counts(sdf, "window_id"), "window_id")
    assert_equivalent(got, msql.gini_sql("bp", "window_id"), bp=pdf)


@pytest.mark.parametrize("kind", KINDS)
@pytest.mark.parametrize("seed", [0, 1])
def test_entropy_vs_oracle(credit_frames, kind, seed):
    pdf, sdf = credit_frames[(kind, seed)]
    got = entropy_by_window(per_window_counts(sdf, "window_id"), "window_id")
    assert_equivalent(got, msql.entropy_sql("bp", "window_id"), bp=pdf)


@pytest.mark.parametrize("kind", KINDS)
@pytest.mark.parametrize("seed", [0, 1])
def test_nakamoto_vs_oracle(credit_frames, kind, seed):
    pdf, sdf = credit_frames[(kind, seed)]
    got = nakamoto_by_window(per_window_counts(sdf, "window_id"), "window_id")
    assert_equivalent(got, msql.nakamoto_sql("bp", "window_id"), bp=pdf)


def test_spark_sql_text_runs_on_spark_too(spark, credit_frames):
    """The shared SQL is genuinely portable: run it through Spark SQL and
    compare with the DataFrame implementation."""
    pdf, sdf = credit_frames[("zipf", 0)]
    sdf.createOrReplaceTempView("bp_view")
    via_sql = spark.sql(msql.gini_sql("bp_view", "window_id")).toPandas()
    via_df = (
        gini_by_window(per_window_counts(sdf, "window_id"), "window_id").toPandas()
    )
    merged = via_sql.merge(via_df, on="window_id", suffixes=("_sql", "_df"))
    assert len(merged) == len(via_df)
    assert np.allclose(merged["gini_sql"], merged["gini_df"], atol=1e-9)


# ---------------------------------------------------------------------------
# boundary behaviour
# ---------------------------------------------------------------------------

@pytest.mark.parametrize(
    "dist,expected",
    [
        ({"a": 51, "b": 49}, 1),
        ({"a": 50, "b": 50}, 2),
        ({"a": 25, "b": 25, "c": 25, "d": 25}, 3),
        ({"a": 100}, 1),
    ],
)
def test_spark_nakamoto_threshold_exact(spark, dist, expected):
    rows = [("w", m) for m, c in dist.items() for _ in range(c)]
    sdf = spark.createDataFrame(pd.DataFrame(rows, columns=["window_id", "miner"]))
    got = nakamoto_by_window(per_window_counts(sdf, "window_id"), "window_id").collect()
    assert got[0]["nakamoto"] == expected


def test_spark_gini_with_heavy_ties(spark):
    """row_number tie-breaking must not change the Gini value."""
    pdf = pd.DataFrame(
        {"window_id": 0, "miner": [f"m{i}" for i in range(40)]}
    )  # all counts equal 1
    sdf = spark.createDataFrame(pdf)
    got = gini_by_window(per_window_counts(sdf, "window_id"), "window_id").collect()
    assert got[0]["gini"] == pytest.approx(0.0, abs=1e-12)


def test_metrics_on_synth_data_keys(spark):
    """Tie-in with the provided synth_data generators: zipf-distributed
    keys must measure as materially less equal than uniform keys."""
    z = synth_data.zipf_keys(spark, n=5_000, n_keys=200, alpha=1.4, seed=7)
    u = synth_data.uniform_keys(spark, n=5_000, n_keys=200, seed=7)
    from pyspark.sql import functions as F

    def as_credits(df):
        return df.select(F.lit(0).alias("window_id"), F.col("k").cast("string").alias("miner"))

    gz = decentralization_by_window(as_credits(z), "window_id").collect()[0]
    gu = decentralization_by_window(as_credits(u), "window_id").collect()[0]
    assert gz["gini"] > gu["gini"] + 0.1
    assert gz["entropy"] < gu["entropy"]
    assert gz["nakamoto"] < gu["nakamoto"]
