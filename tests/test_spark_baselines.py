"""Spark baselines (standard CP, first-order HIVM) vs oracle/engines."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.bench.queries import hop3_full, hop3_proj
from repro.core.engine import CrownEngine
from repro.oracle import assert_equivalent
from repro.spark.baseline_cp import SparkStandardCP
from repro.spark.crown_spark import SparkCrown
from repro.spark.hivm_spark import SparkFirstOrderHIVM
from repro.streams.sequences import Update
from repro.synth_data import graph_edges_pdf
from tests.test_spark_crown import atom_filters_for, batched_graph_events


@pytest.mark.parametrize("engine_cls", [SparkStandardCP, SparkFirstOrderHIVM])
def test_batch_deltas_match_core(spark, engine_cls):
    from collections import Counter

    bq = hop3_full()
    cq = bq.cq
    eng = engine_cls(spark, cq, atom_filters=atom_filters_for(cq))
    core = CrownEngine(cq)
    for batch in batched_graph_events(n_batches=3, per_batch=30, seed=11):
        net = Counter()
        for s, a, b in batch:
            for sg, t in core.apply(Update("G", (a, b), s > 0)):
                net[t] += sg
        sd = spark.createDataFrame(pd.DataFrame(batch, columns=["sign", "a", "b"]))
        rows = eng.process_batch({"G": sd}).collect()
        got_p = {tuple(r[x] for x in cq.output) for r in rows if r["sign"] > 0}
        got_m = {tuple(r[x] for x in cq.output) for r in rows if r["sign"] < 0}
        assert got_p == {t for t, c in net.items() if c > 0}
        assert got_m == {t for t, c in net.items() if c < 0}


def test_spark_cp_vs_duckdb(spark):
    bq = hop3_full()
    g = graph_edges_pdf(sf=0.002, seed=6)
    eng = SparkStandardCP(spark, bq.cq, atom_filters=atom_filters_for(bq.cq))
    eng.process_batch(
        {"G": spark.createDataFrame(g.assign(sign=1)[["sign", "src", "dst"]])}
    )
    assert_equivalent(eng.full_result(), bq.sql, G=g)


def test_spark_cp_state_superlinear(spark):
    """The baseline materializes the quadratic intermediate view —
    exactly what Fig. 12 attributes its slowdown to."""
    bq = hop3_proj()
    n = 25
    edges = [(i, 0) for i in range(1, n + 1)] + [(0, n + j) for j in range(1, n + 1)]
    cp = SparkStandardCP(spark, bq.cq)
    crown = SparkCrown(spark, bq.cq)
    sd = pd.DataFrame([(1, a, b) for a, b in edges], columns=["sign", "a", "b"])
    cp.process_batch({"G": spark.createDataFrame(sd)})
    crown.process_batch({"G": spark.createDataFrame(sd)})
    assert cp.state_rows() > n * n  # the n² view is materialized
    assert crown.state_rows() < 20 * len(edges)


def test_hivm_vs_duckdb(spark):
    bq = hop3_proj()
    g = graph_edges_pdf(sf=0.001, seed=8)
    eng = SparkFirstOrderHIVM(spark, bq.cq)
    eng.process_batch(
        {"G": spark.createDataFrame(g.assign(sign=1)[["sign", "src", "dst"]])}
    )
    assert_equivalent(eng.full_result(), bq.sql, G=g)
