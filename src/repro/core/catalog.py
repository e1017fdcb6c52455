"""Catalog: columnar tables with dense RIDs, predefined joins, RID indices.

This is the repo's stand-in for the storage layer the paper extends (§3):

- every registered table gets a dense, system-level ``_rid`` column
  (``0..N-1``) — the virtual row-ID column of a columnar RDBMS;
- ``predefine_join(F, fk, P, pk)`` is the ``PREDEFINE JOIN`` command: it
  materializes a hidden ``_rid_<P>__<fk>`` column on *F* holding the RID of
  the matching *P* row (a system-level pointer, like a GDBMS edge);
- ``build_rid_index`` builds the CSR RID index (optionally extended, §5.2).

Tables are loaded as pandas (deterministic generators), RID-materialized in
pandas (a single vectorized merge per predefinition), then ``finalize(spark)``
turns each into a cached Spark DataFrame that all executors scan. The
*original* (pre-RID) pandas frames are kept for the DuckDB oracle.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.rid_index import RIDIndex

RID = "_rid"
DEFAULT_ZONE_SIZE = 2048


def rid_col_name(p_table: str, fk_cols: tuple[str, ...]) -> str:
    """Name of the hidden materialized-RID column on F for a predefined join."""
    return f"_rid_{p_table}__{'_'.join(fk_cols)}"


@dataclass(frozen=True)
class PredefinedJoin:
    """A user-predefined FK→PK equality join from table F to table P."""

    f_table: str
    fk_cols: tuple[str, ...]
    p_table: str
    pk_cols: tuple[str, ...]

    @property
    def rid_col(self) -> str:
        return rid_col_name(self.p_table, self.fk_cols)


@dataclass
class Table:
    """A registered base table: pandas source + (after finalize) cached Spark DF."""

    name: str
    pdf: pd.DataFrame  # with _rid and materialized rid columns
    pdf_original: pd.DataFrame  # as registered — what the oracle sees
    zone_size: int
    rid_cols: dict[tuple[str, ...], str] = field(default_factory=dict)
    df: DataFrame | None = None

    @property
    def n_rows(self) -> int:
        return len(self.pdf)

    @property
    def user_columns(self) -> list[str]:
        return list(self.pdf_original.columns)


class Catalog:
    """Registry of tables, predefined joins, and RID indices."""

    def __init__(self, spark: SparkSession, zone_size: int = DEFAULT_ZONE_SIZE):
        self.spark = spark
        self.zone_size = zone_size
        self.tables: dict[str, Table] = {}
        self.predefined: dict[tuple[str, tuple[str, ...]], PredefinedJoin] = {}
        self.indices: dict[tuple[str, tuple[str, ...]], RIDIndex] = {}
        # For extended indices, which predefined join the ext payload points to.
        self.index_ext_target: dict[tuple[str, tuple[str, ...]], PredefinedJoin] = {}
        self._finalized = False

    # ------------------------------------------------------------------ load
    def register(self, name: str, pdf: pd.DataFrame, zone_size: int | None = None) -> Table:
        """Register a base table; assigns the dense virtual RID column."""
        if self._finalized:
            raise RuntimeError("catalog already finalized")
        if name in self.tables:
            raise ValueError(f"table {name!r} already registered")
        if RID in pdf.columns:
            raise ValueError(f"column name {RID!r} is reserved")
        ext = pdf.reset_index(drop=True).copy()
        ext[RID] = np.arange(len(ext), dtype=np.int64)
        t = Table(
            name=name,
            pdf=ext,
            pdf_original=pdf.reset_index(drop=True),
            zone_size=zone_size or self.zone_size,
        )
        self.tables[name] = t
        return t

    def predefine_join(
        self,
        f_table: str,
        fk_cols: list[str] | tuple[str, ...],
        p_table: str,
        pk_cols: list[str] | tuple[str, ...],
    ) -> PredefinedJoin:
        """``PREDEFINE JOIN`` — materialize P's RIDs onto F (paper §3).

        ``fk_cols`` must form a foreign key: ``pk_cols`` must be unique in P.
        Dangling FKs materialize as null (they join nothing).
        """
        if self._finalized:
            raise RuntimeError("catalog already finalized")
        fk_cols, pk_cols = tuple(fk_cols), tuple(pk_cols)
        if len(fk_cols) != len(pk_cols) or not fk_cols:
            raise ValueError("fk/pk column lists must be non-empty and same length")
        f, p = self.tables[f_table], self.tables[p_table]
        key = (f_table, fk_cols)
        if key in self.predefined:
            raise ValueError(f"join on {f_table}{fk_cols} already predefined")
        if p.pdf.duplicated(subset=list(pk_cols)).any():
            raise ValueError(f"{p_table}{pk_cols} is not unique — not a valid FK target")
        pj = PredefinedJoin(f_table, fk_cols, p_table, pk_cols)
        lookup = p.pdf[list(pk_cols) + [RID]].rename(columns={RID: pj.rid_col})
        lookup = lookup.rename(columns=dict(zip(pk_cols, fk_cols)))
        merged = f.pdf.merge(lookup, on=list(fk_cols), how="left", sort=False)
        # merge can reorder only on sorted keys; how='left' preserves F's order.
        f.pdf[pj.rid_col] = merged[pj.rid_col].astype("Int64").to_numpy()
        f.rid_cols[fk_cols] = pj.rid_col
        self.predefined[key] = pj
        return pj

    def build_rid_index(
        self,
        f_table: str,
        fk_cols: list[str] | tuple[str, ...],
        extended_cols: list[str] | tuple[str, ...] | None = None,
    ) -> RIDIndex:
        """Build the CSR RID index on F keyed by the predefined join on
        ``fk_cols``; if ``extended_cols`` names a second predefined join on F,
        the index is extended with that join's RIDs (paper §5.2, Figure 2)."""
        fk_cols = tuple(fk_cols)
        pj = self.predefined.get((f_table, fk_cols))
        if pj is None:
            raise ValueError(f"no predefined join on {f_table}{fk_cols}")
        f = self.tables[f_table]
        n_p = self.tables[pj.p_table].n_rows
        ext_vals = None
        if extended_cols is not None:
            ext_pj = self.predefined.get((f_table, tuple(extended_cols)))
            if ext_pj is None:
                raise ValueError(
                    f"extended columns {extended_cols} are not a predefined join on {f_table}"
                )
            ext_vals = f.pdf[ext_pj.rid_col]
            self.index_ext_target[(f_table, fk_cols)] = ext_pj
        idx = RIDIndex.build(f.pdf[pj.rid_col], n_p, ext_vals)
        self.indices[(f_table, fk_cols)] = idx
        return idx

    def predefine_relationship(
        self,
        f_table: str,
        fk1: list[str],
        p1_table: str,
        pk1: list[str],
        fk2: list[str],
        p2_table: str,
        pk2: list[str],
        with_indices: bool = True,
    ) -> None:
        """Convenience for relationship tables: predefine both joins and build
        forward + backward extended RID indices (like fwd/bwd adjacency lists)."""
        self.predefine_join(f_table, fk1, p1_table, pk1)
        self.predefine_join(f_table, fk2, p2_table, pk2)
        if with_indices:
            self.build_rid_index(f_table, fk1, extended_cols=fk2)
            self.build_rid_index(f_table, fk2, extended_cols=fk1)

    def finalize(self, cache: bool = True, partition_rows: int = 200_000) -> None:
        """Create (and optionally cache+materialize) the Spark DataFrames.

        ``createDataFrame`` from pandas yields one partition per Arrow batch
        (~8k rows), which turns every scan into ~100 tiny tasks; coalesce to
        ~``partition_rows`` rows per partition before caching.
        """
        if self._finalized:
            return
        for t in self.tables.values():
            n_parts = max(1, min(16, -(-t.n_rows // partition_rows)))
            df = self.spark.createDataFrame(t.pdf).coalesce(n_parts)
            if cache:
                df = df.persist()
                df.count()  # materialize so query timings exclude load
            t.df = df
        self._finalized = True

    def unpersist(self) -> None:
        for t in self.tables.values():
            if t.df is not None:
                t.df.unpersist()

    # ---------------------------------------------------------------- lookup
    def find_predefined(
        self,
        a_table: str,
        a_cols: tuple[str, ...],
        b_table: str,
        b_cols: tuple[str, ...],
    ) -> tuple[PredefinedJoin, str] | None:
        """If the equi-join a.a_cols = b.b_cols is predefined, return the
        PredefinedJoin and which side ('a' or 'b') is F."""
        pj = self.predefined.get((a_table, a_cols))
        if pj is not None and pj.p_table == b_table and pj.pk_cols == b_cols:
            return pj, "a"
        pj = self.predefined.get((b_table, b_cols))
        if pj is not None and pj.p_table == a_table and pj.pk_cols == a_cols:
            return pj, "b"
        return None

    def rid_index(self, f_table: str, fk_cols: tuple[str, ...]) -> RIDIndex | None:
        return self.indices.get((f_table, tuple(fk_cols)))

    def oracle_tables(self) -> dict[str, pd.DataFrame]:
        """Original (pre-RID) tables, for ``repro.oracle.assert_equivalent``."""
        return {name: t.pdf_original for name, t in self.tables.items()}

    def table(self, name: str) -> Table:
        return self.tables[name]
