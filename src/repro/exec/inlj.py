"""GDBMS-style executor: left-deep index nested loop joins over adjacency lists.

This is the repo's stand-in for GraphflowDB/Neo4j (and for the plan style of
GR-Fusion / GQ-Fast) used as the comparison point in §7.2.2 and §7.3.2. The
paper describes their execution as:

1. scan and filter a seed node table;
2. EXTEND each bound tuple through the adjacency list index (random lookups
   into a large index keyed by node ID) — an index nested loop join;
3. read the properties of the joined edge/node records *after* the join
   (random access into the base tables) and only then run their filters.

We reproduce exactly that shape: the seed is a full scan + filter; EXTEND is a
broadcast-CSR ragged gather inside ``mapInPandas`` (lookups happen per bound
tuple, intermediate tuples are materialized *before* edge filters run);
property reads are RID joins against the full base table — never SIP-pruned,
which is the structural disadvantage the paper measures against.

The binding order is auto-derived greedily (seed = most selective node, then
cheapest extension), with ``spec.graph_seed`` / ``spec.graph_order`` overrides
mirroring the paper's hand-picked GraphflowDB orders.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import LongType, StructField, StructType

from repro.core.catalog import RID, Catalog
from repro.core.rid_index import RIDIndex
from repro.exec.executor import ExecMetrics, ExecOutcome, finish
from repro.plan.optimizer import filtered_cardinalities
from repro.plan.spec import JoinEdge, QuerySpec, aliases_in, cols_of, qualify


@dataclass
class _Bind:
    """How one alias gets bound: 'scan' (seed), 'extend' (INLJ through an
    adjacency index; may co-bind the destination entity), 'lookup' (follow a
    materialized FK pointer from an already-read alias), or 'value' (fallback
    hash join on the raw key — used only when no index/pointer exists)."""

    alias: str
    kind: str
    via: str | None = None  # bound alias we come from
    index_key: tuple[str, tuple[str, ...]] | None = None  # for 'extend'
    dst: str | None = None  # co-bound destination alias for 'extend'
    # For 'lookup': the materialized RID col on `via` to follow. For 'extend'
    # over an FK–FK edge: the materialized RID col on `via` that holds the
    # shared node ID used as the adjacency-index key (None = via's own RID).
    rid_col: str | None = None
    edge: JoinEdge | None = None  # for 'value'
    consumed: tuple[JoinEdge, ...] = ()


def _derive_order(spec: QuerySpec, catalog: Catalog) -> list[_Bind]:
    cards = filtered_cardinalities(spec, catalog)
    seed = spec.graph_seed or min(sorted(spec.aliases), key=lambda a: cards[a])
    binds = [_Bind(alias=seed, kind="scan")]
    bound = {seed}
    consumed: set[int] = set()
    forced = list(spec.graph_order) if spec.graph_order else None

    def edge_id(e: JoinEdge) -> int:
        return spec.joins.index(e)

    while len(bound) < len(spec.aliases):
        candidates: list[tuple[float, str, _Bind]] = []
        for e in spec.joins:
            if edge_id(e) in consumed:
                continue
            for x, xc, b, bc in (
                (e.left_alias, e.left_cols, e.right_alias, e.right_cols),
                (e.right_alias, e.right_cols, e.left_alias, e.left_cols),
            ):
                if x in bound or b not in bound:
                    continue
                found = catalog.find_predefined(
                    spec.table_of(x), xc, spec.table_of(b), bc
                )
                if found is not None:
                    pj, f_side = found
                    if f_side == "a" and catalog.rid_index(pj.f_table, pj.fk_cols):
                        # x is F with an adjacency index keyed by b: EXTEND.
                        deg = catalog.table(pj.f_table).n_rows / max(
                            1, catalog.table(pj.p_table).n_rows
                        )
                        dst, extra = _find_dst(spec, catalog, x, xc, bound, consumed, edge_id)
                        candidates.append(
                            (
                                1.0 + deg,
                                x,
                                _Bind(
                                    alias=x, kind="extend", via=b,
                                    index_key=(pj.f_table, pj.fk_cols), dst=dst,
                                    consumed=tuple([e] + extra),
                                ),
                            )
                        )
                        continue
                    if f_side == "b":
                        # b carries a materialized pointer to x: follow it.
                        candidates.append(
                            (
                                0.5,
                                x,
                                _Bind(alias=x, kind="lookup", via=b,
                                      rid_col=pj.rid_col, consumed=(e,)),
                            )
                        )
                        continue
                # FK–FK edge (both sides FKs to the same entity, e.g.
                # k1.person2id = k2.person1id): the bound side's materialized
                # RID is the shared node ID — EXTEND through x's adjacency
                # index keyed on that node, exactly a GDBMS multi-hop.
                pj_x = catalog.predefined.get((spec.table_of(x), tuple(xc)))
                pj_b = catalog.predefined.get((spec.table_of(b), tuple(bc)))
                if (
                    pj_x is not None
                    and pj_b is not None
                    and (pj_x.p_table, pj_x.pk_cols) == (pj_b.p_table, pj_b.pk_cols)
                    and catalog.rid_index(pj_x.f_table, pj_x.fk_cols) is not None
                ):
                    deg = catalog.table(pj_x.f_table).n_rows / max(
                        1, catalog.table(pj_x.p_table).n_rows
                    )
                    dst, extra = _find_dst(spec, catalog, x, xc, bound, consumed, edge_id)
                    candidates.append(
                        (
                            1.0 + deg,
                            x,
                            _Bind(alias=x, kind="extend", via=b,
                                  index_key=(pj_x.f_table, pj_x.fk_cols), dst=dst,
                                  rid_col=pj_b.rid_col, consumed=tuple([e] + extra)),
                        )
                    )
                    continue
                candidates.append(
                    (1e12 + cards[x], x, _Bind(alias=x, kind="value", via=b,
                                               edge=e, consumed=(e,)))
                )
        if not candidates:
            raise ValueError(f"cannot derive a graph plan for {spec.name}")
        if forced:
            nxt = next(a for a in forced if a not in bound)
            pool = [c for c in candidates if c[1] == nxt]
            if not pool:
                raise ValueError(f"graph_order alias {nxt} not reachable in {spec.name}")
            candidates = pool
        _, _, chosen = min(candidates, key=lambda c: (c[0], c[1]))
        binds.append(chosen)
        bound.add(chosen.alias)
        if chosen.dst:
            bound.add(chosen.dst)
        consumed |= {edge_id(e) for e in chosen.consumed}
    return binds


def _find_dst(spec, catalog, f_alias, fk_cols, bound, consumed, edge_id):
    """If the extended index payload matches F's other spec edge, the EXTEND
    co-binds the destination entity (edge + neighbour IDs in one list)."""
    ext_pj = catalog.index_ext_target.get((spec.table_of(f_alias), tuple(fk_cols)))
    if ext_pj is None:
        return None, []
    for e2 in spec.edges_of(f_alias):
        if edge_id(e2) in consumed:
            continue
        for x, xc, b, bc in (
            (e2.left_alias, e2.left_cols, e2.right_alias, e2.right_cols),
            (e2.right_alias, e2.right_cols, e2.left_alias, e2.left_cols),
        ):
            if x != f_alias or b in bound:
                continue
            if tuple(xc) == ext_pj.fk_cols and spec.table_of(b) == ext_pj.p_table:
                return b, [e2]
    return None, []


def _extend_df(
    spark: SparkSession,
    df: DataFrame,
    src_col: str,
    idx: RIDIndex,
    f_col: str,
    dst_col: str | None,
) -> DataFrame:
    """EXTEND: per-tuple adjacency-list lookup (ragged gather over broadcast CSR).

    Output is yielded in bounded slices: a hub-heavy batch can explode by the
    average degree squared across consecutive extends, and emitting it as one
    Arrow batch exhausts the JVM's direct-memory pool. Slicing keeps peak
    memory flat without changing the (bag) semantics.
    """
    bc = spark.sparkContext.broadcast(idx)
    fields = list(df.schema.fields) + [StructField(f_col, LongType())]
    if dst_col:
        fields.append(StructField(dst_col, LongType()))
    schema = StructType(fields)
    out_chunk = 65_536

    def gen(batches):
        index = bc.value
        for pdf in batches:
            src = pdf[src_col].to_numpy(dtype=np.int64) if len(pdf) else np.empty(0, np.int64)
            rep, f_rids, ext = index.extend(src)
            for lo in range(0, len(rep), out_chunk) if len(rep) else ():
                hi = lo + out_chunk
                out = pdf.iloc[rep[lo:hi]].copy()
                out[f_col] = f_rids[lo:hi]
                if dst_col:
                    out[dst_col] = ext[lo:hi]
                yield out
            if len(rep) == 0:
                out = pdf.iloc[rep].copy()
                out[f_col] = f_rids
                if dst_col:
                    out[dst_col] = ext
                yield out

    return df.mapInPandas(gen, schema)


class GraphExecutor:
    """Executes query specs with GDBMS-style left-deep INLJ plans."""

    def __init__(self, spark: SparkSession, catalog: Catalog):
        self.spark = spark
        self.catalog = catalog

    def _props_needed(self, spec: QuerySpec, binds: list[_Bind]) -> dict[str, set[str]]:
        need: dict[str, set[str]] = {a: set() for a in spec.aliases}
        exprs = [e for e, _ in spec.select] + list(spec.filters)
        for e in exprs:
            for a in spec.aliases:
                need[a] |= cols_of(e, a)
        consumed = {id_ for b in binds for id_ in (spec.joins.index(e) for e in b.consumed)}
        for i, e in enumerate(spec.joins):
            if i not in consumed:  # enforced as a post-hoc filter — needs both sides
                need[e.left_alias] |= set(e.left_cols)
                need[e.right_alias] |= set(e.right_cols)
        for b in binds:
            if b.rid_col is not None:  # lookup / FK–FK extend read via's pointer col
                need[b.via].add(b.rid_col)
            if b.kind == "value":
                need[b.alias] |= set(
                    b.edge.left_cols if b.edge.left_alias == b.alias else b.edge.right_cols
                )
                need[b.via] |= set(
                    b.edge.left_cols if b.edge.left_alias == b.via else b.edge.right_cols
                )
        return need

    def _scan(self, spec: QuerySpec, alias: str, cols: set[str], metrics: ExecMetrics,
              with_filters: bool = True) -> DataFrame:
        t = self.catalog.table(spec.table_of(alias))
        use = sorted(cols | {RID})
        df = t.df.select([F.col(c).alias(f"{alias}__{c}") for c in use])
        if with_filters:
            for f in spec.scan_filters(alias):
                df = df.filter(F.expr(qualify(f, spec.aliases)))
        metrics.scanned[alias] = t.n_rows  # no SIP: GDBMS scans/reads it all
        metrics.table_rows[alias] = t.n_rows
        return df

    def execute(self, spec: QuerySpec, collect: bool = True) -> ExecOutcome:
        binds = _derive_order(spec, self.catalog)
        metrics = ExecMetrics(plan=" -> ".join(
            f"{b.kind}({b.alias}{'+' + b.dst if b.dst else ''})" for b in binds
        ))
        props = self._props_needed(spec, binds)
        read: set[str] = set()
        df: DataFrame | None = None

        def prop_read(cur: DataFrame, alias: str) -> DataFrame:
            scan = self._scan(spec, alias, props[alias], metrics)
            read.add(alias)
            return cur.join(
                scan, F.col(f"__rid_{alias}") == F.col(f"{alias}__{RID}"), "inner"
            )

        for b in binds:
            if b.kind == "scan":
                df = self._scan(spec, b.alias, props[b.alias], metrics)
                df = df.withColumn(f"__rid_{b.alias}", F.col(f"{b.alias}__{RID}"))
                read.add(b.alias)
            elif b.kind == "extend":
                idx = self.catalog.rid_index(*b.index_key)
                if b.rid_col is not None:  # FK–FK hop: key on via's pointer col
                    src = f"{b.via}__{b.rid_col}"
                    df = df.filter(F.col(src).isNotNull())
                else:
                    src = f"__rid_{b.via}"
                df = _extend_df(
                    self.spark, df, src, idx,
                    f"__rid_{b.alias}", f"__rid_{b.dst}" if b.dst else None,
                )
                if props[b.alias] or spec.scan_filters(b.alias):
                    df = prop_read(df, b.alias)
                if b.dst and (props[b.dst] or spec.scan_filters(b.dst)):
                    df = prop_read(df, b.dst)
            elif b.kind == "lookup":
                src = f"{b.via}__{b.rid_col}"
                df = df.withColumn(f"__rid_{b.alias}", F.col(src)).filter(
                    F.col(f"__rid_{b.alias}").isNotNull()
                )
                if props[b.alias] or spec.scan_filters(b.alias):
                    df = prop_read(df, b.alias)
            else:  # value-join fallback
                scan = self._scan(spec, b.alias, props[b.alias], metrics)
                e = b.edge
                cond = None
                for lc, rc in zip(e.left_cols, e.right_cols):
                    c = F.col(f"{e.left_alias}__{lc}") == F.col(f"{e.right_alias}__{rc}")
                    cond = c if cond is None else cond & c
                df = df.join(scan, cond, "inner")
                df = df.withColumn(f"__rid_{b.alias}", F.col(f"{b.alias}__{RID}"))
                read.add(b.alias)

        # Enforce any spec edges not consumed by the traversal.
        consumed = {spec.joins.index(e) for b in binds for e in b.consumed}
        for i, e in enumerate(spec.joins):
            if i in consumed:
                continue
            for lc, rc in zip(e.left_cols, e.right_cols):
                df = df.filter(
                    F.col(f"{e.left_alias}__{lc}") == F.col(f"{e.right_alias}__{rc}")
                )
        out = finish(df, spec)
        result = out.toPandas() if collect else None
        return ExecOutcome(result=result, metrics=metrics, df=None if collect else out)
