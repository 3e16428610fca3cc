"""Fig. 11 — per-update delta latency: CROWN vs Trill proxy.

Paper shape: CROWN's average latency is low and *stable* over the
stream; Trill's (standard CP delta streams) is higher and keeps
growing as its materialized views fill up.
"""
import pytest

from repro.bench.harness import graph_stream, run_engine
from repro.bench.queries import hop3_full
from repro.core.baseline_cp import StandardCPEngine
from repro.core.engine import CrownEngine


@pytest.mark.parametrize("engine", ["crown", "trill_delta"])
def test_fig11_latency(benchmark, engine):
    bq = hop3_full()
    seq = graph_stream(sf=0.004, window=500)

    def once():
        eng = (
            CrownEngine(bq.cq)
            if engine == "crown"
            else StandardCPEngine(bq.cq, delta_only=True)
        )
        return run_engine(eng, seq, engine, "3hop_full", record_latency=True)

    res = benchmark.pedantic(once, rounds=1, iterations=1)
    lat = res.latencies
    half = len(lat) // 2
    first = sum(lat[:half]) / max(1, half)
    second = sum(lat[half:]) / max(1, len(lat) - half)
    benchmark.extra_info.update(
        avg_ms=round(res.avg_latency_ms, 4),
        p99_ms=round(res.p99_latency_ms, 4),
        first_half_ms=round(first, 4),
        second_half_ms=round(second, 4),
    )
    if engine == "crown":
        # stability: the second half is not dramatically slower
        assert second < 20 * max(first, 1e-4)
