"""General temporal-motif comparators (§6 "Algorithms" item 4).

generic  chronological 4-edge enumeration — the permute-everything
         approach the paper's general competitors reduce to, included to
         demonstrate why they time out on anything non-trivial.
"""
