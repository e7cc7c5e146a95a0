"""Core algorithms of the paper: temporal butterfly counting/enumeration.

Modules
-------
schema     edge-frame conventions, gid encoding, shared constants
classify   the 6-type temporal-butterfly algebra (python / numpy / SQL)
brute      exact reference implementations (pandas + DuckDB SQL oracle)
priority   vertex priority (Definition 4) as a Spark DataFrame
wedges     temporal wedge enumeration (Definition 1) with priority filters
baseline   TBC / TBE — the §3 baselines as pure-Catalyst dataflows
wedge_set  wedge set + wedge priority combine kernels (§4) — pure python
optimized  TBC+ / TBC++ — §4 counting over applyInPandas groups
enumerate_ TBE+ — §4.3 enumeration over applyInPandas groups
"""
