"""Stream substrate: replayer + incremental anomaly query execution.

``replayer`` mirrors the paper's stream replayer (stored monitoring
data replayed as a stream, with host/time selection); ``executor`` is
the incremental micro-batch engine (state maintainer across batches);
``source`` wires the executor to a real Structured Streaming file
source via ``foreachBatch``.
"""
