"""Table 1 — query-processing engine feature matrix (regenerated)."""
import _common  # noqa: F401  (sys.path setup)

from repro.bench.harness import print_table
from repro.bench.queries import hop4_proj
from repro.core.baseline_cp import StandardCPEngine
from repro.core.engine import CrownEngine
from repro.core.hivm import FirstOrderHIVMEngine


def main() -> None:
    bq = hop4_proj()
    rows = [
        CrownEngine.capabilities(),
        StandardCPEngine(bq.cq).capabilities(),
        FirstOrderHIVMEngine(bq.cq).capabilities(),
        StandardCPEngine(bq.cq, delta_only=True).capabilities(),
    ]
    for r in rows:
        for k in ("distributed", "full_enumeration", "delta_enumeration"):
            r[k] = "yes" if r[k] else "no"
    print_table(
        "Table 1: engine features",
        rows,
        ["system", "distributed", "full_enumeration", "delta_enumeration", "updates", "internal"],
    )


if __name__ == "__main__":
    main()
