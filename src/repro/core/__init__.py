"""The paper's contribution: differential maintenance of the IFE dataflow.

Modules:

* :mod:`repro.core.specs`      — query specifications (SPSP/K-hop/RPQ/WCC/PR)
* :mod:`repro.core.store`      — eager-merged 1-D difference index (§4.2)
* :mod:`repro.core.frontier`   — the ExpandFrontier (Join + Min/Sum) operator
  pair as a Spark DataFrame job (Fig. 1)
* :mod:`repro.core.static_ife` — Scratch: the static IFE run (also populates
  the G0 difference trace)
* :mod:`repro.core.engine`     — DC^JOD maintenance (§4.1) with eager merging
* :mod:`repro.core.vdc`        — vanilla DC: JOD's schedule plus a
  materialized δJ store (what JOD drops)
* :mod:`repro.core.policies`   — Random / Degree drop selection (§5.2)
* :mod:`repro.core.dropping`   — Det-Drop / Prob-Drop (§5.1)
* :mod:`repro.core.memory`     — the byte-accounting model (§5.1.1, App. C)
"""
