"""Mondrian core: per-file layout inference and cross-file comparison.

Modules mirror the paper's pipeline (VLDB 2021, Sec. 4):

- :mod:`repro.core.cells`        syntactic cell typing + color encoding (Table 1)
- :mod:`repro.core.grid`         CSV text -> padded cell/type grids -> pixel image
- :mod:`repro.core.elements`     rectangular elements + spatial relations (Defs 3-5, 8)
- :mod:`repro.core.segmentation` connected components + rectilinear partitioning
- :mod:`repro.core.clustering`   custom-distance DBSCAN region detection
- :mod:`repro.core.regions`      regions, boundaries, histogram fingerprints
- :mod:`repro.core.region_sim`   histogram-correlation region similarity
- :mod:`repro.core.layout`       complete layout graphs with labeled edges
- :mod:`repro.core.matching`     Hungarian maximum-weight bipartite matching
- :mod:`repro.core.flooding`     similarity-flooding layout similarity
- :mod:`repro.core.mondrian`     end-to-end per-file pipeline
- :mod:`repro.core.templates`    Algorithm 1 template inference (driver-side)
"""
