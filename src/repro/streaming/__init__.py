"""Incremental sketch maintenance with Structured Streaming.

The paper's first key challenge is "efficiency of network construction
and updates ... to achieve interactivity": new observations must extend
the sketch store without rebuilding it. Basic-window statistics are pure
sums (count, Σx, Σx², pairwise Σxy), hence mergeable: each micro-batch
contributes partial sums that an upsert folds into the store.

- ``sketch_stream`` — the store plus two Structured Streaming paths:
  the production ``foreachBatch`` upsert, and a windowed-aggregation
  (event-time ``window()``) query used to cross-check the aggregation;
- ``query``        — serving correlation queries straight from the
  store, including running Dangoron on it.
"""
