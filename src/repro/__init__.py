"""Reproduction of "Crowdsourced Truth Discovery in the Presence of
Hierarchies for Knowledge Fusion" (Jung, Kim, Shim; EDBT 2019).

Package layout (see DESIGN.md for the full map):

* :mod:`repro.core` — the TDH probabilistic model and EM inference
  (numpy reference engine + Spark DataFrame engine).
* :mod:`repro.assign` — EAI task assignment (incremental EM, Lemma 4.1
  bound, Algorithm 1) and the QASCA/MB/ME baselines.
* :mod:`repro.baselines` — the 13 compared truth-discovery algorithms.
* :mod:`repro.hierarchy` — hierarchy substrate (tree + numeric implied).
* :mod:`repro.datagen` — synthetic stand-ins for the paper's datasets.
* :mod:`repro.eval` — the paper's quality measures + crowdsourcing loop.
* :mod:`repro.tables` — harnesses reproducing Tables 3–6.
"""
