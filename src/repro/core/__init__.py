"""Core STPM implementation (the paper's primary contribution).

Layout
------
``granularity``   granule positions, m-Finer mappings, pct->absolute thresholds
``symbolize``     raw values -> symbol alphabet (threshold / quantile / SAX-lite)
``events``        temporal events, instances, Allen-style relations with epsilon
``sequences``     symbolic series -> temporal sequence database (D_SEQ)
``seasonal``      support sets, near support sets, seasons, maxSeason
``hlh``           hierarchical lookup hash structures HLH_1 / HLH_k
``estpm``         exact seasonal temporal pattern mining (E-STPM)
``mi``            entropy, (normalized) mutual information, Lambert W, mu bound
``astpm``         approximate STPM (A-STPM) via MI pruning
``brute``         brute-force reference miner used by the test oracle
"""
