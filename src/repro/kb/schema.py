"""Schemas and constants for the YAGO-lite knowledge base.

The KB is represented as five pandas frames (it is small — tens of
thousands of rows) that are lifted to Spark DataFrames on demand for the
distributed indexing joins:

- ``types(type_id, type_name, parent_id, top_id, depth, stat_count, gs)``:
  the ISA hierarchy under a single root. ``top_id`` is the top-level
  ancestor (direct child of the root, as in YAGO 4); ``stat_count`` is the
  *declared* number of entities of that type (calibrated to YAGO-scale
  magnitudes, decoupled from how many entity instances we materialize);
  ``gs`` is the granularity score of Eq 2 (see ``granularity_score``).
- ``ancestors(type_id, anc_id)``: reflexive-transitive closure up to (and
  including) the top-level type; the root itself is excluded because the
  paper treats it as uninformative.
- ``labels(label, entity_id)``: entity labels / alternate names. Homographs
  are represented by one label mapping to several entity ids.
- ``entity_types(entity_id, type_id)``: leaf-type assignment (an entity may
  have several leaf types).
- ``triples(subj_id, pred_id, obj_id)`` and
  ``predicates(pred_id, pred_name, pair_count)``: binary relationships. Our
  synthetic triples are functional per (subj, predicate), which both matches
  how SANTOS's FD filter expects meaningful relationships to behave and
  keeps generated lake tables FD-consistent.
"""
from __future__ import annotations

import math

ROOT = "thing"

# Columns of the melted data-lake cell frame used throughout the project.
CELL_COLUMNS = ["table", "col", "col_name", "row", "value", "is_num"]


def granularity_score(stat_count: int) -> float:
    """Eq 2 with the min/max typo fixed (see DESIGN.md §3.1).

    ``gs(a) = 1 / max(1, log10(a.count))`` — reproduces Example 14:
    place with 6M entities -> ~0.147, city with 42K -> ~0.216, and clamps
    rare types (<10 entities) to 1.0.
    """
    if stat_count <= 0:
        return 1.0
    return 1.0 / max(1.0, math.log10(stat_count))
