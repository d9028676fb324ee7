"""Partial evaluation: local partial matches per fragment (Definition 5).

Each site evaluates the full query ``Q`` on its fragment ``F_k`` and emits
every *local partial match* (PM): a partial homomorphism ``f : V^Q →
vertices(F_k) ∪ {NULL}`` satisfying the paper's six conditions, notably

- (4) at least one crossing edge is matched,
- (5) a query vertex mapped to an *internal* vertex has **all** its incident
  query edges matched by data edges, and
- (6) internally-mapped query vertices are weakly connected through
  internally-mapped vertices.

The enumerator seeds one search per (crossing edge, compatible query edge)
pair and then performs *forced expansion*: any unmatched query edge with an
internally-bound endpoint must be matched (condition 5), branching over the
incident data edges. Expansion never starts from an extended vertex, which
makes condition 6 hold by construction; it is also complete because a
fragment stores no edge between two extended vertices, so every matched
edge of any valid PM is incident to an internal vertex and hence forced.
Duplicate discoveries from different seeds are deduplicated.

The distributed run maps this enumerator over fragments with
``groupBy("frag").applyInPandas`` — the dataflow image of "each site
computes its PMs in parallel".
"""
from __future__ import annotations

import zlib
from collections import defaultdict
from typing import Iterable, Sequence

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.types import (
    ArrayType,
    IntegerType,
    LongType,
    StringType,
    StructField,
    StructType,
)

from repro.core.query import Query, is_var, var_col


def cmap_entry(qe_idx: int, s: str, p: str, o: str) -> str:
    """Canonical string for one crossing-edge→query-edge mapping."""
    return f"{qe_idx}##{s}|{p}|{o}"


def candidate_bit(v: str, bitlen: int) -> int:
    """Stable hash used by Algorithm 4's candidate bit vectors."""
    return zlib.crc32(v.encode()) % bitlen


class _LocalMatcher:
    """Backtracking PM enumerator for one fragment."""

    def __init__(
        self,
        rows: Iterable[tuple[str, str, str, int, int]],
        frag: int,
        query: Query,
        ext_bits: dict[str, int] | None = None,
        bitlen: int = 4096,
    ):
        self.query = query
        self.frag = frag
        self.ext_bits = ext_bits
        self.bitlen = bitlen
        self.home: dict[str, int] = {}
        self.out_idx: dict[str, list[tuple[str, str]]] = defaultdict(list)
        self.in_idx: dict[str, list[tuple[str, str]]] = defaultdict(list)
        self.edge_set: set[tuple[str, str, str]] = set()
        self.crossing: list[tuple[str, str, str]] = []
        for s, p, o, sf, of in rows:
            self.home[s] = sf
            self.home[o] = of
            key = (s, p, o)
            if key in self.edge_set:
                continue
            self.edge_set.add(key)
            self.out_idx[s].append((p, o))
            self.in_idx[o].append((p, s))
            if sf != of:
                self.crossing.append(key)
        self._local_ok_cache: dict[tuple[int, str], bool] = {}
        self.n = query.n_vertices
        self.results: dict[tuple, dict] = {}

    # -- binding feasibility ---------------------------------------------

    def _local_ok(self, vi: int, u: str) -> bool:
        """Internal-vertex signature filter: condition 5 means an internal
        binding must be extensible along every incident query edge, so a
        vertex lacking a required (direction, predicate[, constant endpoint])
        can be rejected before any search. This is the gStore-style local
        candidate filter (always on, in every engine variant)."""
        key = (vi, u)
        hit = self._local_ok_cache.get(key)
        if hit is not None:
            return hit
        ok = True
        for e in self.query.incident_edges(vi):
            for here, there, idx_map in (
                (e.si, e.oi, self.out_idx),
                (e.oi, e.si, self.in_idx),
            ):
                if here != vi:
                    continue
                other = self.query.vertices[there]
                p = e.p
                found = False
                for p2, w in idx_map.get(u, ()):
                    if not is_var(p) and p2 != p:
                        continue
                    if not is_var(other) and w != other:
                        continue
                    found = True
                    break
                if not found:
                    ok = False
                break  # self-loops: checking one side suffices per edge pass
            if not ok:
                break
        self._local_ok_cache[key] = ok
        return ok

    def _can_bind(self, vi: int, u: str) -> bool:
        term = self.query.vertices[vi]
        if not is_var(term):
            if u != term:
                return False
        if self.home.get(u) == self.frag:
            return self._local_ok(vi, u)
        # extended vertex: only Algorithm 4's global bit filter applies
        if self.ext_bits is not None and is_var(term):
            bits = self.ext_bits.get(term)
            if bits is not None and not (bits >> candidate_bit(u, self.bitlen)) & 1:
                return False
        return True

    def _is_internal(self, u: str) -> bool:
        return self.home.get(u) == self.frag

    # -- search -----------------------------------------------------------

    def run(self) -> list[dict]:
        q = self.query
        for s, p, o in self.crossing:
            for e in q.edges:
                if not is_var(e.p) and e.p != p:
                    continue
                f: list[str | None] = [None] * self.n
                pv: dict[str, str] = {}
                if not self._can_bind(e.si, s) or not self._can_bind(e.oi, o):
                    continue
                f[e.si] = s
                f[e.oi] = o
                if e.si == e.oi and s != o:
                    continue
                if is_var(e.p):
                    pv[e.p] = p
                self._expand(f, pv, {e.idx: (s, p, o)})
        return list(self.results.values())

    def _next_forced(self, f, matched) -> int | None:
        for e in self.query.edges:
            if e.idx in matched:
                continue
            a, b = f[e.si], f[e.oi]
            if (a is not None and self._is_internal(a)) or (
                b is not None and self._is_internal(b)
            ):
                return e.idx
        return None

    def _expand(self, f, pv, matched) -> None:
        idx = self._next_forced(f, matched)
        if idx is None:
            self._finalize(f, pv, matched)
            return
        e = self.query.edges[idx]
        a, b = f[e.si], f[e.oi]
        if a is not None and self._is_internal(a):
            options = self.out_idx.get(a, ())
            fixed_other, other_vi, mk = b, e.oi, lambda p2, w: (a, p2, w)
        else:
            options = self.in_idx.get(b, ())
            fixed_other, other_vi, mk = a, e.si, lambda p2, w: (w, p2, b)
        want_p = pv.get(e.p) if is_var(e.p) else e.p
        for p2, w in options:
            if want_p is not None and p2 != want_p:
                continue
            if fixed_other is not None:
                if w != fixed_other:
                    continue
            elif not self._can_bind(other_vi, w):
                continue
            f2 = f if fixed_other is not None else list(f)
            if fixed_other is None:
                f2[other_vi] = w
            pv2 = pv
            if is_var(e.p) and e.p not in pv:
                pv2 = dict(pv)
                pv2[e.p] = p2
            m2 = dict(matched)
            m2[e.idx] = mk(p2, w)
            self._expand(f2, pv2, m2)

    def _finalize(self, f, pv, matched) -> None:
        q = self.query
        for e in q.edges:  # condition 3: unmatched edges need an extended or
            if e.idx in matched:  # NULL endpoint on both sides
                continue
            a, b = f[e.si], f[e.oi]
            if a is not None and self._is_internal(a):
                return
            if b is not None and self._is_internal(b):
                return
        cross_entries = []
        for idx, (s, p, o) in matched.items():
            if (
                self.home[s] != self.home[o]
            ):  # crossing edge of this fragment's view
                cross_entries.append(cmap_entry(idx, s, p, o))
        if not cross_entries:  # condition 4
            return
        cross_entries.sort()
        key = (tuple(f), tuple(sorted(pv.items())), tuple(cross_entries))
        if key in self.results:
            return
        sign = 0
        for i, u in enumerate(f):
            if u is not None and self._is_internal(u):
                sign |= 1 << i
        rec = {f"m_{i}": f[i] for i in range(self.n)}
        for v in q.pred_vars:
            rec[f"pv_{var_col(v)}"] = pv.get(v)
        rec["frag"] = self.frag
        rec["sign"] = sign
        rec["cmap"] = cross_entries
        self.results[key] = rec


def pm_columns(query: Query) -> list[str]:
    """Column layout of the PM DataFrame for ``query``."""
    return (
        ["frag", "sign", "cmap"]
        + [f"m_{i}" for i in range(query.n_vertices)]
        + [f"pv_{var_col(v)}" for v in query.pred_vars]
    )


def pm_schema(query: Query) -> StructType:
    fields = [
        StructField("frag", IntegerType()),
        StructField("sign", LongType()),
        StructField("cmap", ArrayType(StringType())),
    ]
    fields += [
        StructField(f"m_{i}", StringType()) for i in range(query.n_vertices)
    ]
    fields += [
        StructField(f"pv_{var_col(v)}", StringType()) for v in query.pred_vars
    ]
    return StructType(fields)


def enumerate_local_pms(
    rows: Sequence[tuple[str, str, str, int, int]],
    frag: int,
    query: Query,
    ext_bits: dict[str, int] | None = None,
    bitlen: int = 4096,
) -> list[dict]:
    """Enumerate all PMs of one fragment (driver-side entry, used in tests)."""
    return _LocalMatcher(rows, frag, query, ext_bits, bitlen).run()


def compute_pms(
    fragment_edges: DataFrame,
    query: Query,
    *,
    ext_bits: dict[str, int] | None = None,
    bitlen: int = 4096,
) -> DataFrame:
    """Distributed partial evaluation: one matcher per fragment.

    ``fragment_edges`` is the replicated Def-1 view
    ``(frag, s, p, o, s_frag, o_frag)``; the output is one row per local
    partial match with the :func:`pm_columns` layout.
    """
    cols = pm_columns(query)
    schema = pm_schema(query)

    def run_fragment(key: tuple, pdf: pd.DataFrame) -> pd.DataFrame:
        frag = int(key[0])
        rows = list(
            zip(pdf["s"], pdf["p"], pdf["o"], pdf["s_frag"], pdf["o_frag"])
        )
        recs = enumerate_local_pms(rows, frag, query, ext_bits, bitlen)
        if not recs:
            return pd.DataFrame({c: pd.Series(dtype="object") for c in cols})
        out = pd.DataFrame(recs)
        return out[cols]

    return fragment_edges.groupBy("frag").applyInPandas(run_fragment, schema)
