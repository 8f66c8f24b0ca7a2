"""Bayesian network structure: DAG, cardinalities, flat counter index.

A :class:`BayesNet` is the *structure only* — node set, parent sets and
per-variable cardinalities ``J_i``. It owns the mapping from CPD cells
to the dense global counter ids that the distributed-monitoring layer
maintains:

* family counters ``A_i(x_i, x_par)`` — one per CPD cell, tracking
  ``F_i(x_i, x_par)`` (paper Lemma 2 numerator);
* parent counters ``A_i(x_par)`` — one per parent configuration,
  tracking ``F_i(x_par)`` (denominator). Kept per-variable even when two
  variables share a parent set, exactly as Section 4.4 requires so the
  product terms stay independent.

Ids are laid out as: all family blocks (variable by variable), then all
parent blocks. Within variable ``i``'s family block the cell
``(x_i, x_par)`` has offset ``x_par_index * J_i + x_i`` where
``x_par_index`` is the mixed-radix encoding of the parent values.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass
class BayesNet:
    """Directed acyclic graph over categorical variables.

    Parameters
    ----------
    name:
        Human-readable dataset name (e.g. ``"alarm"``).
    parents:
        ``parents[i]`` is the ordered list of parent node ids of node
        ``i``. Order matters only for the mixed-radix parent encoding.
    cards:
        ``cards[i]`` is ``J_i``, the domain size of variable ``i``.
    """

    name: str
    parents: list[list[int]]
    cards: np.ndarray

    # Derived fields, filled in __post_init__.
    n: int = field(init=False)
    topo: np.ndarray = field(init=False)
    K: np.ndarray = field(init=False)
    fam_offset: np.ndarray = field(init=False)
    par_offset: np.ndarray = field(init=False)
    n_family_counters: int = field(init=False)
    n_counters: int = field(init=False)
    children: list[list[int]] = field(init=False)

    def __post_init__(self) -> None:
        self.cards = np.asarray(self.cards, dtype=np.int64)
        self.n = len(self.parents)
        if self.cards.shape != (self.n,):
            raise ValueError("cards length must equal number of nodes")
        if np.any(self.cards < 2):
            raise ValueError("every variable needs cardinality >= 2")
        self.topo = self._topological_order()
        # K_i = |dom(par(X_i))| = product of parent cardinalities (1 if root).
        self.K = np.array(
            [int(np.prod(self.cards[p])) if p else 1 for p in self.parents],
            dtype=np.int64,
        )
        fam_sizes = self.cards * self.K
        self.fam_offset = np.concatenate([[0], np.cumsum(fam_sizes)])
        self.n_family_counters = int(self.fam_offset[-1])
        self.par_offset = self.n_family_counters + np.concatenate(
            [[0], np.cumsum(self.K)]
        )
        self.n_counters = int(self.par_offset[-1])
        self.children = [[] for _ in range(self.n)]
        for j, ps in enumerate(self.parents):
            for p in ps:
                self.children[p].append(j)
        # Mixed-radix strides per parent slot: stride of parents[i][t] is
        # prod(cards[parents[i][:t]]) so x_par_index = sum stride*value.
        self._strides = [
            np.concatenate([[1], np.cumprod(self.cards[p][:-1])]).astype(np.int64)
            if p
            else np.zeros(0, dtype=np.int64)
            for p in self.parents
        ]

    # ---------------------------------------------------------------- DAG

    def _topological_order(self) -> np.ndarray:
        """Kahn's algorithm; raises if the graph has a cycle."""
        indeg = np.zeros(self.n, dtype=np.int64)
        for ps in self.parents:
            if len(set(ps)) != len(ps):
                raise ValueError("duplicate parent")
        for j, ps in enumerate(self.parents):
            for p in ps:
                if not (0 <= p < self.n):
                    raise ValueError(f"parent id {p} out of range")
                if p == j:
                    raise ValueError("self loop")
            indeg[j] = len(ps)
        order: list[int] = [int(i) for i in np.nonzero(indeg == 0)[0]]
        seen = len(order)
        head = 0
        while head < len(order):
            u = order[head]
            head += 1
            for c in [j for j, ps in enumerate(self.parents) if u in ps]:
                indeg[c] -= 1
                if indeg[c] == 0:
                    order.append(c)
                    seen += 1
        if seen != self.n:
            raise ValueError("graph has a cycle")
        return np.array(order, dtype=np.int64)

    @property
    def n_edges(self) -> int:
        return int(sum(len(p) for p in self.parents))

    @property
    def n_params(self) -> int:
        """Free parameters, ``sum_i (J_i - 1) * K_i`` — Table 1's metric."""
        return int(np.sum((self.cards - 1) * self.K))

    @property
    def max_parents(self) -> int:
        return max((len(p) for p in self.parents), default=0)

    # ------------------------------------------------------- counter index

    def parent_config_index(self, X: np.ndarray, i: int) -> np.ndarray:
        """Mixed-radix parent configuration index for node ``i``.

        ``X`` is an ``(m, n)`` assignment matrix; returns ``(m,)`` int64
        in ``[0, K_i)`` (all zeros for a root node).
        """
        ps = self.parents[i]
        if not ps:
            return np.zeros(X.shape[0], dtype=np.int64)
        return (X[:, ps].astype(np.int64) * self._strides[i]).sum(axis=1)

    def family_ids(self, X: np.ndarray, i: int) -> np.ndarray:
        """Global family-counter ids for events ``X`` at node ``i``."""
        pidx = self.parent_config_index(X, i)
        return self.fam_offset[i] + pidx * self.cards[i] + X[:, i].astype(np.int64)

    def parent_ids(self, X: np.ndarray, i: int) -> np.ndarray:
        """Global parent-counter ids for events ``X`` at node ``i``."""
        return self.par_offset[i] + self.parent_config_index(X, i)

    def all_counter_ids(self, X: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
        """(m, n) family and parent counter-id matrices for events ``X``."""
        m = X.shape[0]
        fam = np.empty((m, self.n), dtype=np.int64)
        par = np.empty((m, self.n), dtype=np.int64)
        for i in range(self.n):
            pidx = self.parent_config_index(X, i)
            fam[:, i] = self.fam_offset[i] + pidx * self.cards[i] + X[:, i]
            par[:, i] = self.par_offset[i] + pidx
        return fam, par

    def counter_owner(self) -> np.ndarray:
        """``(n_counters,)`` map from global counter id to owning variable."""
        owner = np.empty(self.n_counters, dtype=np.int64)
        for i in range(self.n):
            owner[self.fam_offset[i] : self.fam_offset[i + 1]] = i
            owner[self.par_offset[i] : self.par_offset[i + 1]] = i
        return owner

    def decode_family_id(self, cid: int) -> tuple[int, int, int]:
        """Inverse of the family-id mapping: ``(i, x_i, x_par_index)``."""
        i = int(np.searchsorted(self.fam_offset, cid, side="right") - 1)
        off = cid - int(self.fam_offset[i])
        return i, off % int(self.cards[i]), off // int(self.cards[i])
