"""Graph substrates: planarity testing, shortest paths, bubble trees.

These are the subsystems the paper depends on (Boost/MATLAB graph
libraries in the original) re-implemented from scratch, since the
environment ships neither networkx nor scipy.
"""
