"""Graph substrate: synthetic generators, dataset stand-ins, orderings.

The paper evaluates on real social networks from KONECT / Network
Repository; this subpackage provides deterministic synthetic stand-ins
(see DESIGN.md §3) plus the Spark-side degree/ordering/orientation
machinery every algorithm shares.
"""
