"""Graph-stream algorithms (§5): incremental temporal butterfly counting.

Modules
-------
graph      chronological adjacency snapshot with time-range queries
stbc       STBC (Algorithm 7): per-edge delta counting, sequential
stbc_plus  STBC⁺ (Algorithm 8): conflict-free batch deltas, Spark-parallel
window     the §6.2 sliding-window evaluation driver
"""
