"""Simulated path-based baseline recommenders.

The paper's baselines (PGPR, CAFE, PLM-Rec, PEARLM) are trained RL / language
models that cannot be reproduced offline; each is replaced by a seeded
3-hop beam walker whose selection policy mimics the published behaviour the
summarization experiments depend on (see DESIGN.md §2):

* :func:`~repro.recommenders.pgpr.pgpr` — weight-greedy over both metapath
  families (popularity-concentrated, low diversity).
* :func:`~repro.recommenders.cafe.cafe` — restricted to the
  ``user→item→entity→item`` metapath template.
* :func:`~repro.recommenders.plm.plm` — temperature-sampled, with a
  hallucination rate (paths may leave the KG).
* :func:`~repro.recommenders.pearlm.pearlm` — temperature-sampled, faithful.
* :func:`~repro.recommenders.base.random_walker` — uniform random (used for
  Table III's synthetic paths).

All return the same schema: ``(user, item, rank, path, in_kg, score)`` with
``path`` a 4-node array (3 edges), top-``k`` distinct items per user.
"""
from repro.recommenders.base import random_walker, recommend_paths
from repro.recommenders.cafe import cafe
from repro.recommenders.pearlm import pearlm
from repro.recommenders.pgpr import pgpr
from repro.recommenders.plm import plm

BASELINES = {"pgpr": pgpr, "cafe": cafe, "plm": plm, "pearlm": pearlm}

__all__ = ["recommend_paths", "random_walker", "pgpr", "cafe", "plm", "pearlm", "BASELINES"]
