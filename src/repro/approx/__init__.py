"""Appendix A: approximate temporal butterfly counting.

sampling  ApproxTBC(+/++): edge sampling with probability p, scale p^-4
sgrapp    sGrappTBC(+/++): window-exact counting + EC^theta cross-window
          estimation per butterfly type
"""
