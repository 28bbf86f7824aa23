"""Foundation-model substrate for the KG-enhanced applications (Sec. IV).

mPLUG/RoBERTa/mT5/BERT/UIE have no offline weights; their roles are
played by a featurizer whose "pre-training" is a co-occurrence-SVD
token-embedding fit on either a *general* or an *e-commerce domain*
corpus, and whose "+KG" variants consume OpenBG-derived features
(gazetteers, category priors, statement statistics) computed with Spark
aggregations over the full KG.  See DESIGN.md's substitution table.
"""
from repro.pretrain.features import TokenEmbeddings, hashed_bow, kmeans_clusters
from repro.pretrain.model import FoundationModel, KGFeatures, model_grid

__all__ = [
    "TokenEmbeddings",
    "hashed_bow",
    "kmeans_clusters",
    "FoundationModel",
    "KGFeatures",
    "model_grid",
]
