"""Minimum-cost perfect matching (assignment problem).

The container ships no scipy, so we implement the Jonker-Volgenant-style
shortest-augmenting-path Hungarian algorithm with dual potentials,
O(n^3). Token counts per name are tiny (k <= ~8) so this is never a
bottleneck; it is also reused by the HMJ baseline tests.
"""
from __future__ import annotations

from collections.abc import Sequence

_INF = float("inf")


def assignment_min_cost(cost: Sequence[Sequence[float]]) -> tuple[float, list[int]]:
    """Solve the square assignment problem.

    Returns ``(total_cost, col_of_row)`` where ``col_of_row[i]`` is the
    column assigned to row ``i``. ``cost`` must be an n x n matrix of
    non-negative finite numbers.
    """
    n = len(cost)
    if n == 0:
        return 0.0, []
    for row in cost:
        if len(row) != n:
            raise ValueError("cost matrix must be square")
    # Potentials over rows (u) and columns (v); way[j] = predecessor col.
    u = [0.0] * (n + 1)
    v = [0.0] * (n + 1)
    p = [0] * (n + 1)  # p[j] = row (1-based) matched to column j; 0 = free
    for i in range(1, n + 1):
        p[0] = i
        j0 = 0
        minv = [_INF] * (n + 1)
        used = [False] * (n + 1)
        way = [0] * (n + 1)
        while True:
            used[j0] = True
            i0 = p[j0]
            delta = _INF
            j1 = 0
            for j in range(1, n + 1):
                if used[j]:
                    continue
                cur = cost[i0 - 1][j - 1] - u[i0] - v[j]
                if cur < minv[j]:
                    minv[j] = cur
                    way[j] = j0
                if minv[j] < delta:
                    delta = minv[j]
                    j1 = j
            for j in range(n + 1):
                if used[j]:
                    u[p[j]] += delta
                    v[j] -= delta
                else:
                    minv[j] -= delta
            j0 = j1
            if p[j0] == 0:
                break
        while j0:  # augment along the alternating path
            j1 = way[j0]
            p[j0] = p[j1]
            j0 = j1
    col_of_row = [0] * n
    for j in range(1, n + 1):
        if p[j]:
            col_of_row[p[j] - 1] = j - 1
    total = sum(cost[i][col_of_row[i]] for i in range(n))
    return total, col_of_row
