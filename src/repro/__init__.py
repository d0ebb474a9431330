"""Reproduction of PASS — Precomputation-Assisted Stratified Sampling
(Liang, Sintos, Shang, Krishnan, SIGMOD 2021).

Subpackages: :mod:`repro.core` (the paper's contribution),
:mod:`repro.baselines` (US/ST/AQP++/KD-US/VerdictDB-lite/DeepDB-lite),
plus :mod:`repro.synth_data`, :mod:`repro.workload`, :mod:`repro.harness`,
:mod:`repro.experiments` (Tables 1–3 drivers) and :mod:`repro.oracle`
(DuckDB result-equality checks).
"""
