"""Fig. 8 — average processing time vs scale factor (SNB Q1).

Paper shape: CROWN's per-update cost is flat in the scale factor; the
baselines grow with data size (their views/delta joins scale with |D|).
"""
import pytest

from repro.bench.harness import run_engine, snb_stream
from repro.bench.queries import snb_q1
from repro.core.baseline_cp import StandardCPEngine
from repro.core.engine import CrownEngine

SFS = [0.005, 0.01, 0.02]


@pytest.mark.parametrize("engine", ["crown", "flink_cp"])
@pytest.mark.parametrize("sf", SFS)
def test_fig8_scale(benchmark, sf, engine):
    bq = snb_q1()
    seq = snb_stream(sf=sf, window_days=90)

    def once():
        eng = (
            CrownEngine(bq.cq)
            if engine == "crown"
            else StandardCPEngine(bq.cq)
        )
        return run_engine(eng, seq, engine, f"snb_q1@sf{sf}")

    res = benchmark.pedantic(once, rounds=1, iterations=1)
    benchmark.extra_info.update(
        updates=res.updates, avg_update_us=round(res.avg_update_us, 2)
    )
