"""SAQL anomaly query engine core.

Layers (bottom-up): ``schema`` (the SVO system-event model), ``exprs``
(attribute resolution + expression compilation), ``matcher`` (event
pattern matching / multi-event temporal joins), ``windows`` + ``state``
(sliding windows and per-window stateful computation), ``models``
(time-series / invariant / outlier model evaluation over window
states), ``compiler`` + ``engine`` (AST -> executable query), and
``scheduler`` (master-dependent concurrent query execution).
"""
