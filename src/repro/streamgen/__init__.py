"""Workload substrate: synthetic bipartite graphs and fully dynamic streams.

``graphs``   — Zipf-degree bipartite edge generators (KONECT substitutes)
``stream``   — fully dynamic stream construction per Sec. VI-A
``datasets`` — the four scaled KONECT-lite dataset configurations
"""
