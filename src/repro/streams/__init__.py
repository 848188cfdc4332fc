"""Workload generators for the paper's evaluation (sec 7).

weibull  discretized Weibull item-count distributions via the paper's
         inverse-CDF-on-a-regular-grid construction
orders   stream arrangements: randomly permuted (exchangeable ~ i.i.d.),
         frequency-sorted (pathological for Unbiased SS), two-phase
         (pathological for Deterministic SS), epoch partitioning
criteo   synthetic stand-in for the Criteo ad-impression log (see
         DESIGN.md substitution #1)
"""
