"""The four summarization scenarios (Section III).

A :class:`SummaryRequest` is one summarization task: its terminal set at
every cut-off ``k`` plus the input explanation paths. Terminals follow the
paper exactly — user-centric ``T = {u} ∪ R_u``, item-centric
``T = {i} ∪ C_i``, user-group ``T = D ∪ R_D``, item-group ``T = F ∪ C_F`` —
and each target/path carries the ``k`` at which it first enters the task, so
the incremental sweeps (k = 1…10 of the paper's figures) reuse one request.

Requests are built from the recommenders' output DataFrame; the per-user path
lists are small (``k ≤ 10``), so they are collected to the driver here and
the heavy lifting (shortest paths over the 10⁶-edge graph) stays in Spark
inside the summarizers.
"""
from collections import defaultdict
from dataclasses import dataclass

from pyspark.sql import DataFrame


@dataclass(frozen=True)
class SummaryRequest:
    """One summarization task across all cut-offs ``k``.

    Attributes:
        sid: stable identifier (e.g. ``"user:17"`` or ``"group:F"``).
        scenario: ``user-centric|item-centric|user-group|item-group``.
        centers: always-included terminals (the user u / item i / group D / F).
        targets: ``(k_enter, node)`` — node joins the terminal set at
            ``k ≥ k_enter`` (deduplicated at the smallest rank).
        paths: ``(k_enter, nodes)`` — input explanation paths with the cut-off
            at which they join ``P``.
    """

    sid: str
    scenario: str
    centers: tuple[int, ...]
    targets: tuple[tuple[int, int], ...]
    paths: tuple[tuple[int, tuple[int, ...]], ...]

    def k_max(self) -> int:
        return max((k for k, _ in self.targets), default=0)

    def terminals(self, k: int) -> list[int]:
        """Terminal set ``T`` at cut-off ``k`` (centers first, then targets)."""
        seen = dict.fromkeys(self.centers)
        for ke, node in self.targets:
            if ke <= k and node not in seen:
                seen[node] = None
        return list(seen)

    def paths_at(self, k: int) -> list[tuple[int, ...]]:
        return [p for ke, p in self.paths if ke <= k]


def _collect(paths_df: DataFrame) -> list[tuple[int, int, int, tuple[int, ...]]]:
    rows = paths_df.select("user", "item", "rank", "path").collect()
    return sorted(
        (int(r["user"]), int(r["item"]), int(r["rank"]), tuple(int(n) for n in r["path"]))
        for r in rows
    )


def user_centric_requests(paths_df: DataFrame) -> list[SummaryRequest]:
    """One request per user: explain why this user gets their top-k items."""
    by_user: dict[int, list] = defaultdict(list)
    for u, i, rank, path in _collect(paths_df):
        by_user[u].append((rank, i, path))
    out = []
    for u in sorted(by_user):
        entries = sorted(by_user[u])
        out.append(
            SummaryRequest(
                sid=f"user:{u}",
                scenario="user-centric",
                centers=(u,),
                targets=tuple((rank, i) for rank, i, _ in entries),
                paths=tuple((rank, p) for rank, _, p in entries),
            )
        )
    return out


def item_centric_requests(paths_df: DataFrame, items: list[int]) -> list[SummaryRequest]:
    """One request per item: explain why this item reaches its users ``C_i``.

    A user enters ``C_i`` at the ``k`` equal to the item's rank in their list.
    """
    by_item: dict[int, list] = defaultdict(list)
    for u, i, rank, path in _collect(paths_df):
        by_item[i].append((rank, u, path))
    out = []
    for i in items:
        entries = sorted(by_item.get(i, []))
        out.append(
            SummaryRequest(
                sid=f"item:{i}",
                scenario="item-centric",
                centers=(i,),
                targets=tuple((rank, u) for rank, u, _ in entries),
                paths=tuple((rank, p) for rank, _, p in entries),
            )
        )
    return out


def user_group_requests(
    paths_df: DataFrame, groups: dict[str, list[int]]
) -> list[SummaryRequest]:
    """One request per user group ``D``: terminals ``D ∪ R_D``."""
    by_user: dict[int, list] = defaultdict(list)
    for u, i, rank, path in _collect(paths_df):
        by_user[u].append((rank, i, path))
    out = []
    for gid, members in groups.items():
        targets: dict[int, int] = {}
        paths = []
        for u in sorted(members):
            for rank, i, p in sorted(by_user.get(u, [])):
                targets[i] = min(targets.get(i, rank), rank)
                paths.append((rank, p))
        out.append(
            SummaryRequest(
                sid=f"ugroup:{gid}",
                scenario="user-group",
                centers=tuple(sorted(members)),
                targets=tuple(sorted((ke, n) for n, ke in targets.items())),
                paths=tuple(sorted(paths)),
            )
        )
    return out


def item_group_requests(
    paths_df: DataFrame, groups: dict[str, list[int]]
) -> list[SummaryRequest]:
    """One request per item group ``F``: terminals ``F ∪ C_F``."""
    by_item: dict[int, list] = defaultdict(list)
    for u, i, rank, path in _collect(paths_df):
        by_item[i].append((rank, u, path))
    out = []
    for gid, members in groups.items():
        targets: dict[int, int] = {}
        paths = []
        for i in sorted(members):
            for rank, u, p in sorted(by_item.get(i, [])):
                targets[u] = min(targets.get(u, rank), rank)
                paths.append((rank, p))
        out.append(
            SummaryRequest(
                sid=f"igroup:{gid}",
                scenario="item-group",
                centers=tuple(sorted(members)),
                targets=tuple(sorted((ke, n) for n, ke in targets.items())),
                paths=tuple(sorted(paths)),
            )
        )
    return out
