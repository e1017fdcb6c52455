"""Physical plan nodes.

The optimizer produces a tree of ``ScanNode``/``JoinNode``; the GRainDB
rewrite pass (``repro.core.rewrite``) annotates joins with RID conditions and
``SipAction``s and may collapse two joins into a ``MergeJoinNode``
(the paper's SJoin / SJoinIdxR / SJoinIdxM operators).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Union

PlanNode = Union["ScanNode", "JoinNode", "MergeJoinNode"]


@dataclass
class ScanNode:
    """Sequential scan of a base table (ScanSJ when it receives SIP masks)."""

    alias: str
    table: str
    filters: list[str] = field(default_factory=list)  # raw alias.col predicates
    est_rows: int = 0


@dataclass
class SipAction:
    """Sideways information passing from a join's build phase to a probe-side scan.

    - ``kind='direct'`` (SJoin, §4): the build side contains *F*; its
      materialized RID column (``source_alias.source_col``) holds pointers into
      the target table *P* — collect them into zone/row bitmasks for ScanSJ(P).
    - ``kind='index'`` (SJoinIdxR, §5.1): the build side contains *P*; consult
      the RID index ``index_key`` to map P-RIDs to the F-RIDs that join them,
      then pass bitmasks to ScanSJ(F).
    """

    kind: str  # 'direct' | 'index'
    target_alias: str
    source_alias: str
    source_col: str
    index_key: tuple[str, tuple[str, ...]] | None = None


@dataclass
class JoinNode:
    """Hash join. ``conds`` pairs (alias, col) across the two subtrees; the
    left element of each pair always belongs to the ``left`` subtree.

    ``kind`` labels what the rewrite produced: 'hash' (value-based, vanilla
    DuckDB), 'hash_rid' (Case 2 — RID equality, no SIP), 'sjoin' (Case 1),
    'sjoin_idxr' (reverse semijoin). Purely informational for tests/metrics;
    execution is driven by ``conds``/``sips``.
    """

    left: PlanNode
    right: PlanNode
    conds: list[tuple[tuple[str, str], tuple[str, str]]]
    build: str = "left"  # which child is the hash-build side
    sips: list[SipAction] = field(default_factory=list)
    kind: str = "hash"
    est_rows: int = 0


@dataclass
class MergeJoinNode:
    """SJoinIdxM (§5.2): joins the subtree containing *P1* (build) to the
    subtree containing *P2* (probe) directly through the extended RID index on
    the relationship table *F*, which is never scanned. SIP flows to
    ScanSJ(P2) with the P2-RIDs read from the index."""

    build: PlanNode
    probe: PlanNode
    f_alias: str
    f_table: str
    index_key: tuple[str, tuple[str, ...]]  # extended index keyed by P1 RIDs
    p1_alias: str
    p2_alias: str
    kind: str = "sjoin_idxm"
    est_rows: int = 0


def aliases_of(node: PlanNode) -> set[str]:
    if isinstance(node, ScanNode):
        return {node.alias}
    if isinstance(node, JoinNode):
        return aliases_of(node.left) | aliases_of(node.right)
    return aliases_of(node.build) | aliases_of(node.probe)


def scans_of(node: PlanNode) -> list[ScanNode]:
    if isinstance(node, ScanNode):
        return [node]
    if isinstance(node, JoinNode):
        return scans_of(node.left) + scans_of(node.right)
    return scans_of(node.build) + scans_of(node.probe)


def joins_of(node: PlanNode) -> list[PlanNode]:
    if isinstance(node, ScanNode):
        return []
    if isinstance(node, JoinNode):
        return joins_of(node.left) + joins_of(node.right) + [node]
    return joins_of(node.build) + joins_of(node.probe) + [node]


def describe(node: PlanNode, indent: int = 0) -> str:
    """Human-readable plan tree (used in tests and EXPERIMENTS notes)."""
    pad = "  " * indent
    if isinstance(node, ScanNode):
        f = f" filters={node.filters}" if node.filters else ""
        return f"{pad}Scan({node.alias}:{node.table}){f}"
    if isinstance(node, JoinNode):
        conds = ", ".join(f"{la}.{lc}={ra}.{rc}" for (la, lc), (ra, rc) in node.conds)
        sips = "".join(
            f" sip[{s.kind}]->{s.target_alias}" for s in node.sips
        )
        return (
            f"{pad}{node.kind.upper()}({conds}) build={node.build}{sips}\n"
            + describe(node.left, indent + 1)
            + "\n"
            + describe(node.right, indent + 1)
        )
    return (
        f"{pad}SJOIN_IDXM(f={node.f_alias}, {node.p1_alias}->{node.p2_alias})\n"
        + describe(node.build, indent + 1)
        + "\n"
        + describe(node.probe, indent + 1)
    )
