"""Typed AST for SAQL queries.

One ``Query`` node per parsed query; the compiler (``core.compiler``)
turns it into an executable plan. Expression nodes form a small algebra
shared by attribute constraints, alert conditions, and return items.
"""
from __future__ import annotations

from dataclasses import dataclass, field


# ---------------------------------------------------------------- expressions
@dataclass(frozen=True)
class Literal:
    value: float | str | bool


@dataclass(frozen=True)
class Ref:
    """``name[index].attr`` — any of index/attr may be absent.

    Covers ``p1.exe_name``, ``ss.amt``, ``ss[0].avg_amount``,
    ``cluster.outlier``, ``evt.amount``, bare aliases (``p1``), and
    invariant variables (``a``).
    """

    name: str
    index: int | None = None
    attr: str | None = None


@dataclass(frozen=True)
class Unary:
    op: str  # '!' | '-'
    operand: "Expr"


@dataclass(frozen=True)
class Binary:
    op: str  # || && == != < <= > >= + - * / union diff intersect
    left: "Expr"
    right: "Expr"


@dataclass(frozen=True)
class Card:
    """``|e|`` — cardinality of a set expression (abs for numerics)."""

    operand: "Expr"


@dataclass(frozen=True)
class Call:
    name: str
    args: tuple["Expr", ...]


Expr = Literal | Ref | Unary | Binary | Card | Call


# ---------------------------------------------------------------- patterns
@dataclass(frozen=True)
class Constraint:
    """One attribute constraint inside ``[...]``.

    ``attr=None`` is the positional shortcut (``proc p1["%cmd.exe"]``):
    the constraint applies to the entity's default attribute. ``=``
    against a string containing ``%`` means SQL LIKE.
    """

    attr: str | None
    op: str  # = != < <= > >=
    value: float | str


@dataclass
class EntityDecl:
    """An entity occurrence in a pattern: type, variable, constraints.

    ``is_ref`` marks a later occurrence of an already-declared variable
    (entity identity is then shared across the patterns).
    """

    etype: str  # proc | file | ip
    var: str
    constraints: list[Constraint] = field(default_factory=list)
    is_ref: bool = False


@dataclass
class EventPattern:
    subject: EntityDecl
    ops: list[str]  # disjunction: read || write
    obj: EntityDecl
    alias: str | None = None


@dataclass(frozen=True)
class WindowSpec:
    """``#time(len [, slide])`` in seconds; slide==length is tumbling."""

    length_s: float
    slide_s: float


@dataclass(frozen=True)
class GlobalConstraint:
    attr: str
    op: str
    value: float | str


# ---------------------------------------------------------------- stateful
@dataclass
class StateField:
    name: str
    func: str  # avg sum count min max set distinct_count
    arg: Expr | None  # None for count()


@dataclass
class StateDecl:
    history: int  # number of addressable windows (>=1); ss[k] needs k < history
    name: str
    fields: list[StateField]
    group_by: list[Ref]


@dataclass
class InvariantDecl:
    train_windows: int
    mode: str  # offline | online
    var: str
    init: Expr  # Literal or Ref('empty_set')
    update: Expr  # expression over var + state refs


@dataclass
class ClusterDecl:
    points: list[Ref]  # state fields forming the comparison point
    distance: str  # "ed" (Euclidean)
    method: str  # e.g. DBSCAN
    method_args: list[float]


@dataclass
class ReturnItem:
    expr: Expr
    alias: str | None = None


@dataclass
class ReturnClause:
    distinct: bool
    items: list[ReturnItem]


@dataclass
class Query:
    """A full SAQL query. Optional sections are None when absent."""

    globals: list[GlobalConstraint] = field(default_factory=list)
    patterns: list[EventPattern] = field(default_factory=list)
    temporal: list[str] = field(default_factory=list)  # alias order, evt1->evt2
    window: WindowSpec | None = None
    state: StateDecl | None = None
    invariant: InvariantDecl | None = None
    cluster: ClusterDecl | None = None
    alert: Expr | None = None
    ret: ReturnClause | None = None

    @property
    def kind(self) -> str:
        """Which anomaly-model family the query belongs to (paper §II-B)."""
        if self.cluster is not None:
            return "outlier"
        if self.invariant is not None:
            return "invariant"
        if self.state is not None and self.state.history > 1:
            return "timeseries"
        if self.state is not None:
            return "stateful"
        return "rule"
