"""HyperCube-partitioned CROWN — the distributed mode (§8.1).

The paper dispatches tuples "in a load-balanced fashion … borrowing
from massively parallel algorithms, such as HyperCube". For a
free-connex tree with root attributes ``g``, every query result has a
``g``-value, so sharding the stream by ``hash(g) mod p`` and
replicating atoms that do not contain ``g`` yields ``p`` independent
CROWN instances whose delta streams are provably disjoint and whose
union is exactly the global delta stream.

Spark mapping: the dispatch plan is a DataFrame transformation
(explode per atom → route), and each shard replays its sub-stream
inside ``applyInPandas`` with a :class:`CrownEngine` as the per-group
state — the sanctioned PySpark stand-in for a custom stateful
operator (DESIGN.md § layering).
"""
from __future__ import annotations

import json
import time
import zlib
from typing import Callable

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.cq.join_tree import JoinTree, best_tree
from repro.cq.query import CQ

OUT_SCHEMA = (
    "pid long, updates long, deltas long, millis double, payload string"
)


def _stable_hash(vals: tuple) -> int:
    """Deterministic across executors (unlike str hash)."""
    return zlib.crc32(repr(vals).encode())


def dispatch_plan(
    cq: CQ, tree: JoinTree, updates: pd.DataFrame, p: int
) -> pd.DataFrame:
    """Explode a stream (seq, stream, sign, v0..vk) into per-atom rows
    routed to partitions: atoms containing the root attributes hash on
    them; others are replicated to every partition."""
    root_attrs = list(tree.node(tree.root).attrs)
    rows: list[tuple] = []
    vcols = [c for c in updates.columns if c.startswith("v")]
    for rec in updates.itertuples(index=False):
        seq, stream, sign = rec.seq, rec.stream, rec.sign
        vals = tuple(getattr(rec, c) for c in vcols)
        for atom in cq.atoms_of_stream(stream):
            n = len(atom.attrs)
            tvals = vals[:n]
            pos = [atom.attrs.index(a) for a in root_attrs if a in atom.attrs]
            if len(pos) == len(root_attrs) and root_attrs:
                pids = [_stable_hash(tuple(tvals[i] for i in pos)) % p]
            else:
                pids = list(range(p))
            for pid in pids:
                rows.append((pid, seq, atom.name, sign, *vals))
    return pd.DataFrame(
        rows, columns=["pid", "seq", "atom", "sign", *vcols]
    )


class PartitionedCrown:
    """p independent CROWN shards behind one Spark job."""

    def __init__(
        self,
        spark: SparkSession,
        cq: CQ,
        p: int,
        tree: JoinTree | None = None,
        decoders: dict[str, Callable[[list], tuple]] | None = None,
    ) -> None:
        self.spark = spark
        self.cq = cq
        self.p = p
        self.tree = tree if tree is not None else best_tree(cq)
        self.decoders = decoders or {}

    def run_stream(
        self, updates: pd.DataFrame, collect_deltas: bool = False
    ) -> pd.DataFrame:
        """Replay a full update stream distributed; returns per-shard
        (updates, deltas, millis[, payload]) rows.

        ``updates`` columns: seq, stream, sign, v0..vk (stringly-typed
        values; ``decoders`` map atom-name → row decoder).
        """
        plan = dispatch_plan(self.cq, self.tree, updates, self.p)
        cq, tree, decoders = self.cq, self.tree, self.decoders
        arity = {r.name: len(r.attrs) for r in cq.relations}

        def run_shard(key, pdf: pd.DataFrame) -> pd.DataFrame:  # pragma: no cover
            from repro.core.engine import CrownEngine

            pdf = pdf.sort_values("seq")
            eng = CrownEngine(cq, tree)
            n_up, n_delta = 0, 0
            payload: list = []
            t0 = time.perf_counter()
            vcols = [c for c in pdf.columns if c.startswith("v")]
            for rec in pdf.itertuples(index=False):
                atom = rec.atom
                raw = [getattr(rec, c) for c in vcols][: arity[atom]]
                dec = decoders.get(atom)
                t = dec(raw) if dec else tuple(raw)
                deltas = eng.apply_atom(atom, t, rec.sign > 0)
                n_up += 1
                n_delta += len(deltas)
                if collect_deltas:
                    payload.extend([s, list(v)] for s, v in deltas)
            ms = (time.perf_counter() - t0) * 1000
            return pd.DataFrame(
                {
                    "pid": [key[0]],
                    "updates": [n_up],
                    "deltas": [n_delta],
                    "millis": [ms],
                    "payload": [json.dumps(payload) if collect_deltas else ""],
                }
            )

        sdf = self.spark.createDataFrame(plan)
        out = (
            sdf.repartition(self.p, "pid")
            .groupBy("pid")
            .applyInPandas(run_shard, schema=OUT_SCHEMA)
        )
        return out.toPandas()
