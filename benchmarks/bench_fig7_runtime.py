"""Fig. 7 — total processing time per query × engine (centralized).

Reduced-scale version of jobs/fig7_runtime.py: FIFO window streams on
the synthetic power-law graph / SNB-lite, one benchmark round per
(query, engine). The paper's shape: CROWN beats Flink (standard CP),
DBToaster (HIVM) and Trill (delta-only CP) on every query, with the
largest gaps on the hop queries whose intermediates explode.
"""
import pytest

from repro.bench.harness import graph_stream, run_engine, snb_stream
from repro.bench.queries import GRAPH_QUERIES, SNB_QUERIES
from repro.core.baseline_cp import StandardCPEngine
from repro.core.engine import CrownEngine
from repro.core.hivm import FirstOrderHIVMEngine
from repro.cq.ghd import dumbbell_ghd

ENGINES = ["crown", "flink_cp", "dbtoaster_hivm", "trill_delta"]
QUERIES = ["3hop_full", "3hop_proj", "4hop_proj", "star", "snb_q1"]


def make_engine(name, bq):
    if name == "crown":
        if bq.cyclic:
            return dumbbell_ghd(bq.cq, post_filter=bq.post_filter)
        return CrownEngine(bq.cq, post_filter=bq.post_filter)
    if name == "flink_cp":
        return StandardCPEngine(bq.cq, post_filter=bq.post_filter)
    if name == "dbtoaster_hivm":
        return FirstOrderHIVMEngine(bq.cq, post_filter=bq.post_filter)
    if name == "trill_delta":
        return StandardCPEngine(bq.cq, post_filter=bq.post_filter, delta_only=True)
    raise KeyError(name)


def load(query):
    if query.startswith("snb"):
        return SNB_QUERIES[query](), snb_stream(sf=0.01, window_days=90)
    return GRAPH_QUERIES[query](), graph_stream(sf=0.004, window=500)


@pytest.mark.parametrize("engine", ENGINES)
@pytest.mark.parametrize("query", QUERIES)
def test_fig7_runtime(benchmark, query, engine):
    bq, seq = load(query)

    def once():
        eng = make_engine(engine, bq)
        return run_engine(eng, seq, engine, query)

    res = benchmark.pedantic(once, rounds=1, iterations=1)
    benchmark.extra_info.update(
        updates=res.updates, deltas=res.deltas, space=res.space_rows
    )
    assert not res.failed
