"""Insert-only streaming baselines the paper compares against.

Both ignore deletion elements entirely (the behaviour the paper
quantifies in Fig. 3): ``fleet.Fleet3`` and ``cas.CasR``.
"""
