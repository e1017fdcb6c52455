"""Driver-side semijoin-reduction propagation for SIP mask computation.

The paper's SJoin operators gather build-side RIDs at hash-join build time —
inside the engine, at negligible cost. A Spark reproduction that re-executed
every build subtree just to collect RIDs would pay one extra Spark job per
SJoin (hundreds of ms of fixed scheduler latency each), drowning the effect
being measured. Instead, the executor computes each SJoin's passed RID set in
the driver by propagating per-scan filter results through the predefined-join
structure:

- every filtered scan contributes its exact qualifying RID set (evaluated on
  the catalog's pandas copy — the same rows a hash-join build would read);
- sets propagate across predefined edges: ``P-set given F-set`` follows F's
  materialized RID column (forward, needs only RID materialization);
  ``F-set given P-set`` goes through the RID index (a reverse semijoin, so it
  is gated on the reverse-semijoin ablation flag); FK–FK edges compose both;
- propagation intersects to a fixpoint, always yielding a *superset* of the
  rows the paper's exact operator would pass. Supersets are safe: the RID
  equi-join still enforces the real predicate (the same argument that makes
  Bloom-filter SIP sound).

The passed information is therefore identical in kind to the paper's (dense
RID sets derived from predefined joins), only its computation is hoisted out
of the dataflow so that Spark executes one fused job per query.
"""
from __future__ import annotations

import numpy as np

from repro.core.catalog import RID, Catalog
from repro.plan.spec import QuerySpec


def _edge_maps(spec: QuerySpec, catalog: Catalog, aliases: set[str], allow_reverse: bool):
    """Yield (from_alias, to_alias, fn) propagation maps for edges inside
    ``aliases``. ``fn`` maps a RID array of ``from`` to a RID array of ``to``."""
    maps = []
    for e in spec.joins:
        if not ({e.left_alias, e.right_alias} <= aliases):
            continue
        for xa, xc, ya, yc in (
            (e.left_alias, e.left_cols, e.right_alias, e.right_cols),
            (e.right_alias, e.right_cols, e.left_alias, e.left_cols),
        ):
            # Derive xa's set FROM ya's set.
            found = catalog.find_predefined(
                spec.table_of(xa), tuple(xc), spec.table_of(ya), tuple(yc)
            )
            if found is not None:
                pj, f_side = found
                if f_side == "a":
                    # xa is F: F-set from P-set through the RID index (reverse).
                    idx = catalog.rid_index(pj.f_table, pj.fk_cols)
                    if idx is not None and allow_reverse:
                        maps.append((ya, xa, _via_index(idx)))
                else:
                    # xa is P: P-set from F-set through F's materialized column.
                    col = catalog.table(spec.table_of(ya)).pdf[pj.rid_col]
                    maps.append((ya, xa, _via_column(col.to_numpy(dtype="float64",
                                                                  na_value=np.nan))))
                continue
            pj_x = catalog.predefined.get((spec.table_of(xa), tuple(xc)))
            pj_y = catalog.predefined.get((spec.table_of(ya), tuple(yc)))
            if (
                pj_x is not None
                and pj_y is not None
                and (pj_x.p_table, pj_x.pk_cols) == (pj_y.p_table, pj_y.pk_cols)
            ):
                # FK–FK: ya's pointer column gives shared P-RIDs; xa's index
                # (reverse step) maps them to xa rows.
                idx = catalog.rid_index(pj_x.f_table, pj_x.fk_cols)
                if idx is not None and allow_reverse:
                    col = catalog.table(spec.table_of(ya)).pdf[pj_y.rid_col]
                    maps.append((ya, xa, _via_column_then_index(
                        col.to_numpy(dtype="float64", na_value=np.nan), idx)))
    return maps


def _via_index(idx):
    def fn(rids: np.ndarray) -> np.ndarray:
        return np.unique(idx.lookup_many(rids))

    return fn


def _via_column(col: np.ndarray):
    def fn(rids: np.ndarray) -> np.ndarray:
        vals = col[rids]
        return np.unique(vals[~np.isnan(vals)]).astype(np.int64)

    return fn


def _via_column_then_index(col: np.ndarray, idx):
    def fn(rids: np.ndarray) -> np.ndarray:
        vals = col[rids]
        p = np.unique(vals[~np.isnan(vals)]).astype(np.int64)
        return np.unique(idx.lookup_many(p))

    return fn


def propagate(
    init: dict[str, np.ndarray | None],
    spec: QuerySpec,
    catalog: Catalog,
    allow_reverse: bool = True,
    max_rounds: int | None = None,
) -> dict[str, np.ndarray | None]:
    """Fixpoint semijoin propagation over the aliases in ``init``.

    ``init[a]`` is the exact RID set of alias ``a``'s scan after its pushed
    filters, or None for "all rows". Returns tightened sets (None where no
    information reached an alias). Monotone: sets only shrink, so the loop
    terminates; ``max_rounds`` defaults to #aliases (enough for any tree).
    """
    aliases = set(init)
    maps = _edge_maps(spec, catalog, aliases, allow_reverse)
    sets = dict(init)
    rounds = max_rounds if max_rounds is not None else max(2, len(aliases))
    for _ in range(rounds):
        changed = False
        for src, dst, fn in maps:
            s = sets[src]
            if s is None:
                continue
            derived = fn(s)
            cur = sets[dst]
            new = derived if cur is None else np.intersect1d(cur, derived,
                                                             assume_unique=True)
            if cur is None or len(new) < len(cur):
                sets[dst] = new
                changed = True
        if not changed:
            break
    return sets
