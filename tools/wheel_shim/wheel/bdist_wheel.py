"""Minimal ``bdist_wheel`` distutils command for PEP 660 editable builds.

setuptools' ``editable_wheel`` only needs ``get_tag()`` and
``write_wheelfile()`` from this command; a full ``run()`` (binary wheel
build) is intentionally not supported offline.
"""
from __future__ import annotations

import os

from setuptools import Command


class bdist_wheel(Command):
    description = "minimal bdist_wheel shim (editable installs only)"
    user_options = [
        ("dist-dir=", "d", "directory to put final built distributions in"),
        ("plat-name=", "p", "platform name"),
    ]

    def initialize_options(self):
        self.dist_dir = None
        self.plat_name = None

    def finalize_options(self):
        if self.dist_dir is None:
            self.dist_dir = "dist"

    def get_tag(self):
        # Pure-python project (this repo has no extension modules).
        return ("py3", "none", "any")

    def write_wheelfile(self, wheelfile_base, generator="wheel-shim"):
        tag = "-".join(self.get_tag())
        content = (
            "Wheel-Version: 1.0\n"
            f"Generator: {generator}\n"
            "Root-Is-Purelib: true\n"
            f"Tag: {tag}\n"
        )
        with open(os.path.join(wheelfile_base, "WHEEL"), "w") as f:
            f.write(content)

    def egg2dist(self, egginfo_path, distinfo_path):
        """Convert an .egg-info directory into a .dist-info directory
        (PKG-INFO becomes METADATA; build-internal files are dropped)."""
        import shutil

        distinfo_path = str(distinfo_path)
        if os.path.isdir(distinfo_path):
            shutil.rmtree(distinfo_path)
        os.makedirs(distinfo_path)
        skip = {
            "PKG-INFO",
            "SOURCES.txt",
            "requires.txt",
            "dependency_links.txt",
            "not-zip-safe",
            "zip-safe",
        }
        shutil.copy2(
            os.path.join(egginfo_path, "PKG-INFO"),
            os.path.join(distinfo_path, "METADATA"),
        )
        for name in sorted(os.listdir(egginfo_path)):
            if name in skip:
                continue
            src = os.path.join(egginfo_path, name)
            if os.path.isfile(src):
                shutil.copy2(src, os.path.join(distinfo_path, name))

    def run(self):  # pragma: no cover - not used by editable installs
        raise NotImplementedError(
            "wheel-shim supports editable (PEP 660) builds only"
        )
