"""Logical dataflow DAG model.

A :class:`DataflowDAG` is the *logical* plan of a streaming job (paper
§II-A): nodes are operators (type + static features, Table I), directed
edges are data dependencies. Parallelism degrees and source rates are
*dynamic* and live outside the static structure — they are attached per
execution by the simulator / tuner.
"""
from __future__ import annotations

import json
from dataclasses import dataclass, field, replace

#: Operator types used across Nexmark + PQP workloads. The catalogue is
#: closed (paper §VII notes one-hot typed operators require retraining for
#: genuinely new types — same here).
OPERATOR_TYPES = (
    "source",
    "map",
    "filter",
    "flatmap",
    "join",
    "window_join",
    "window_agg",
    "aggregate",
    "sink",
)

WINDOW_TYPES = ("none", "tumbling", "sliding")
WINDOW_POLICIES = ("none", "count", "time")
KEY_CLASSES = ("none", "int", "long", "string")
AGG_FUNCTIONS = ("none", "min", "max", "avg", "sum", "count")
TUPLE_DATA_TYPES = ("row", "kv", "scalar")


@dataclass(frozen=True)
class Operator:
    """One logical dataflow operator with its static features (Table I)."""

    op_id: str
    op_type: str
    window_type: str = "none"
    window_policy: str = "none"
    window_length: float = 0.0
    sliding_length: float = 0.0
    join_key_class: str = "none"
    aggregate_class: str = "none"
    aggregate_key_class: str = "none"
    aggregate_function: str = "none"
    tuple_width_in: float = 1.0
    tuple_width_out: float = 1.0
    tuple_data_type: str = "row"
    #: Data selectivity: output rate = processed input rate * selectivity.
    selectivity: float = 1.0

    def __post_init__(self) -> None:
        if self.op_type not in OPERATOR_TYPES:
            raise ValueError(f"unknown operator type {self.op_type!r}")
        if self.window_type not in WINDOW_TYPES:
            raise ValueError(f"unknown window type {self.window_type!r}")
        if self.window_policy not in WINDOW_POLICIES:
            raise ValueError(f"unknown window policy {self.window_policy!r}")
        if self.aggregate_function not in AGG_FUNCTIONS:
            raise ValueError(f"unknown agg function {self.aggregate_function!r}")


@dataclass
class DataflowDAG:
    """A logical dataflow DAG: operators + directed edges.

    ``sources`` maps source operator ids to a *source name* (e.g. "bids"),
    used to attach per-source rates at execution time.
    """

    name: str
    operators: list[Operator]
    edges: list[tuple[str, str]]
    sources: dict[str, str] = field(default_factory=dict)

    def __post_init__(self) -> None:
        ids = [o.op_id for o in self.operators]
        if len(set(ids)) != len(ids):
            raise ValueError(f"duplicate operator ids in {self.name}")
        idset = set(ids)
        for u, v in self.edges:
            if u not in idset or v not in idset:
                raise ValueError(f"edge ({u},{v}) references unknown operator")
            if u == v:
                raise ValueError(f"self-loop on {u}")
        for s in self.sources:
            if s not in idset:
                raise ValueError(f"source id {s} not an operator")
        # Every source-typed operator must be registered, and vice versa.
        src_ops = {o.op_id for o in self.operators if o.op_type == "source"}
        if src_ops != set(self.sources):
            raise ValueError(
                f"{self.name}: sources {sorted(self.sources)} != "
                f"source-typed operators {sorted(src_ops)}"
            )
        self.topological_order()  # raises on cycles

    # -- structure accessors -------------------------------------------------
    def op(self, op_id: str) -> Operator:
        for o in self.operators:
            if o.op_id == op_id:
                return o
        raise KeyError(op_id)

    def upstream(self, op_id: str) -> list[str]:
        return [u for u, v in self.edges if v == op_id]

    def downstream(self, op_id: str) -> list[str]:
        return [v for u, v in self.edges if u == op_id]

    def topological_order(self) -> list[str]:
        """Kahn topological sort; deterministic (insertion order ties)."""
        indeg = {o.op_id: 0 for o in self.operators}
        for _, v in self.edges:
            indeg[v] += 1
        queue = [i for i, d in indeg.items() if d == 0]
        order: list[str] = []
        while queue:
            u = queue.pop(0)
            order.append(u)
            for v in self.downstream(u):
                indeg[v] -= 1
                if indeg[v] == 0:
                    queue.append(v)
        if len(order) != len(self.operators):
            raise ValueError(f"{self.name}: cycle detected")
        return order

    def first_level_downstream(self) -> list[str]:
        """Operators that consume directly from sources (paper §II-A)."""
        out: list[str] = []
        for o in self.operators:
            if o.op_type == "source":
                continue
            if any(self.op(u).op_type == "source" for u in self.upstream(o.op_id)):
                out.append(o.op_id)
        return out

    def ancestors(self, op_id: str) -> set[str]:
        seen: set[str] = set()
        stack = list(self.upstream(op_id))
        while stack:
            u = stack.pop()
            if u not in seen:
                seen.add(u)
                stack.extend(self.upstream(u))
        return seen

    def descendants(self, op_id: str) -> set[str]:
        seen: set[str] = set()
        stack = list(self.downstream(op_id))
        while stack:
            u = stack.pop()
            if u not in seen:
                seen.add(u)
                stack.extend(self.downstream(u))
        return seen

    #: Operators whose parallelism is tunable (sources/sinks are not —
    #: sources are external and sinks are trivially cheap in the paper's
    #: workloads).
    def tunable_operators(self) -> list[str]:
        return [
            o.op_id
            for o in self.operators
            if o.op_type not in ("source", "sink")
        ]

    # -- serialisation (used by the Spark history fan-out) --------------------
    def to_json(self) -> str:
        return json.dumps(
            {
                "name": self.name,
                "operators": [vars(o) | {} for o in self.operators],
                "edges": self.edges,
                "sources": self.sources,
            }
        )

    @staticmethod
    def from_json(s: str) -> "DataflowDAG":
        d = json.loads(s)
        return DataflowDAG(
            name=d["name"],
            operators=[Operator(**o) for o in d["operators"]],
            edges=[tuple(e) for e in d["edges"]],
            sources=d["sources"],
        )

    def canonical_key(self) -> str:
        """Structure+label hash key: identical DAGs (up to op-id renaming in
        topological order) share a key. Used to deduplicate GED work."""
        order = {oid: i for i, oid in enumerate(self.topological_order())}
        ops = sorted(
            (
                order[o.op_id],
                o.op_type,
                o.window_type,
                o.window_policy,
                round(o.window_length, 6),
                round(o.sliding_length, 6),
                o.aggregate_function,
            )
            for o in self.operators
        )
        edges = sorted((order[u], order[v]) for u, v in self.edges)
        return json.dumps([ops, edges])


def relabel(dag: DataflowDAG, name: str, **op_overrides) -> DataflowDAG:
    """Copy a DAG under a new name, optionally overriding operator fields
    (``{op_id: {field: value}}``)."""
    ops = [
        replace(o, **op_overrides.get(o.op_id, {})) for o in dag.operators
    ]
    return DataflowDAG(name=name, operators=ops, edges=list(dag.edges), sources=dict(dag.sources))
