"""Reproduction of LOCAT (SIGMOD 2022): low-overhead online configuration
auto-tuning of Spark SQL applications.

Subpackages: ``core`` (the paper's contribution — QCSA, IICP, DAGP, BO,
the LOCAT pipeline), ``cluster`` (simulated ARM/x86 cluster substrate),
``execmodel`` (executor protocol; simulator and live-Spark backends),
``workloads`` (real Spark SQL benchmarks), ``baselines`` (Tuneful, DAC,
GBO-RL, QTune), ``mlmodels`` (from-scratch regressors), ``experiments``
(one harness per evaluation table). See DESIGN.md and EXPERIMENTS.md.
"""
