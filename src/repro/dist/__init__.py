"""Spark orchestration: distributed Mondrian over a corpus DataFrame.

:mod:`repro.dist.pipeline` expresses the Mondrian dataflow as DataFrame
stages (per-file region detection, blocked region matching, per-pair
layout similarity); :mod:`repro.dist.ccomp` provides connected components
both as a driver union-find and as distributed label propagation.
"""
