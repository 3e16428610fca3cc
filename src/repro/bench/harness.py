"""Timing harness and workload builders for the §8 experiments.

Builds FIFO window streams from the synthetic graph / SNB-lite tables
(the paper's constructions: count-window ``[t_e, t_e+w]`` for edges,
time-window ``t- = t+ + w days`` for SNB) and runs any tuple engine
over them, recording wall-clock, per-update latency and state size.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import pandas as pd

from repro.streams.sequences import (
    UpdateSequence,
    fifo_window_sequence,
    insertion_only_sequence,
    time_window_sequence,
)
from repro.synth_data import graph_edges_pdf, snb_tables_pdf

# SNB stream column orders must match the atom attribute orders in
# repro.bench.queries (positional mapping stream → atom).
SNB_STREAM_COLS = {
    "person": ["p_personid", "p_firstname", "p_lastname"],
    "knows": ["k_person1id", "k_person2id"],
    "tag": ["t_tagid", "t_name"],
    "message": ["m_messageid", "m_creatorid", "m_c_replyof"],
    "message_tag": ["mt_messageid", "mt_tagid"],
}
SNB_TS_COL = {"knows": "k_ts", "message": "m_ts", "message_tag": "mt_ts"}


def graph_stream(
    *, sf: float = 0.01, window: int | None = None, seed: int = 7, limit: int | None = None
) -> UpdateSequence:
    """FIFO count-window stream (or insertion-only when window=None)."""
    pdf = graph_edges_pdf(sf=sf, seed=seed)
    if limit is not None:
        pdf = pdf.head(limit)
    rows = [("G", (int(r.src), int(r.dst))) for r in pdf.itertuples(index=False)]
    if window is None:
        return insertion_only_sequence(rows)
    return fifo_window_sequence(rows, window)


def vertex_rows(pdf: pd.DataFrame) -> list[tuple[str, tuple]]:
    verts = sorted(set(pdf.src) | set(pdf.dst))
    return [("V", (int(v),)) for v in verts]


def snb_stream(*, sf: float = 0.01, window_days: float = 60.0, seed: int = 11) -> UpdateSequence:
    """Time-window FIFO stream over the dynamic SNB relations; static
    relations (person, tag) are insertion-only preloads at t=-inf."""
    tables = snb_tables_pdf(sf=sf, seed=seed)
    rows: list[tuple[str, tuple, float]] = []
    for stream in ("knows", "message", "message_tag"):
        cols = SNB_STREAM_COLS[stream]
        ts = SNB_TS_COL[stream]
        for r in tables[stream].itertuples(index=False):
            vals = []
            for c in cols:
                v = getattr(r, c)
                if isinstance(v, float) and pd.isna(v):
                    v = None
                elif isinstance(v, float) and c.endswith("id"):
                    v = int(v)
                vals.append(int(v) if isinstance(v, (int,)) else v)
            rows.append((stream, tuple(vals), float(getattr(r, ts))))
    seq = time_window_sequence(rows, window_days)
    static: list = []
    for stream in ("person", "tag"):
        for r in tables[stream].itertuples(index=False):
            vals = tuple(
                int(v) if isinstance(v, (int, float)) and not isinstance(v, str) else v
                for v in r
            )
            static.append((stream, vals))
    pre = insertion_only_sequence(static)
    return UpdateSequence(pre.updates + seq.updates)


@dataclass
class RunResult:
    engine: str
    query: str
    updates: int = 0
    deltas: int = 0
    seconds: float = 0.0
    avg_latency_ms: float = 0.0
    p99_latency_ms: float = 0.0
    space_rows: int = 0
    failed: str = ""
    latencies: list = field(default_factory=list, repr=False)

    @property
    def avg_update_us(self) -> float:
        return 1e6 * self.seconds / max(1, self.updates)


def run_engine(
    engine,
    seq: UpdateSequence,
    name: str,
    query: str,
    time_limit_s: float | None = None,
    record_latency: bool = False,
    consumer=None,
) -> RunResult:
    """Replay ``seq`` through ``engine.apply``; optional delta consumer."""
    res = RunResult(engine=name, query=query)
    lat: list[float] = []
    t0 = time.perf_counter()
    try:
        for u in seq:
            s = time.perf_counter() if record_latency else 0.0
            deltas = engine.apply(u)
            if record_latency:
                lat.append((time.perf_counter() - s) * 1000)
            if consumer is not None:
                consumer.feed(deltas)
            res.updates += 1
            res.deltas += len(deltas)
            if time_limit_s is not None and time.perf_counter() - t0 > time_limit_s:
                res.failed = "time_limit"
                break
    except MemoryError as e:
        res.failed = f"oom_guard: {e}"
    res.seconds = time.perf_counter() - t0
    if lat:
        lat_sorted = sorted(lat)
        res.avg_latency_ms = sum(lat) / len(lat)
        res.p99_latency_ms = lat_sorted[int(0.99 * (len(lat_sorted) - 1))]
        res.latencies = lat
    if hasattr(engine, "space"):
        res.space_rows = engine.space()
    return res


def print_table(title: str, rows: list[dict], cols: list[str]) -> str:
    """Fixed-width table for job output and EXPERIMENTS.md."""
    widths = {c: max(len(c), *(len(str(r.get(c, ""))) for r in rows)) for c in cols}
    lines = [title, " | ".join(c.ljust(widths[c]) for c in cols)]
    lines.append("-+-".join("-" * widths[c] for c in cols))
    for r in rows:
        lines.append(" | ".join(str(r.get(c, "")).ljust(widths[c]) for c in cols))
    out = "\n".join(lines)
    print(out, flush=True)
    return out
