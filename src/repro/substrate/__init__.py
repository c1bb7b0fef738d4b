"""Substrates the paper depends on but that are not available here.

``numutils``  — numpy kernels replacing scipy (inverse normal CDF, KDE,
                Kendall tau-b, KS distance, uniformity statistic).
``cluster``   — agglomerative hierarchical clustering + dendrogram linkage,
                replacing scipy.cluster for the nullity dendrogram.
``sparkutils``— Spark DataFrame helpers: contiguous row index, multi-column
                melt, null-indicator frame.
"""
