"""Minimal ``bdist_wheel`` distutils command (pure-Python wheels only).

setuptools' ``editable_wheel`` only calls ``write_wheelfile`` and
``get_tag``; building a full binary wheel via ``run`` supports
``pip wheel``-style flows for pure-Python projects.
"""
from __future__ import annotations

import os
import sys

from setuptools import Command


class bdist_wheel(Command):
    description = "create a pure-Python wheel (offline shim)"
    user_options = [("dist-dir=", "d", "output directory")]

    def initialize_options(self):
        self.dist_dir = None
        self.data_dir = None
        self.plat_name = "any"
        self.root_is_pure = True

    def finalize_options(self):
        if self.dist_dir is None:
            self.dist_dir = "dist"

    def get_tag(self):
        return ("py3", "none", "any")

    def wheel_dist_name(self):
        from setuptools.dist import Distribution  # noqa: F401  (parity import)

        name = self.distribution.get_name().replace("-", "_")
        version = self.distribution.get_version()
        return f"{name}-{version}"

    def egg2dist(self, egginfo_path, distinfo_path):
        """Convert an ``.egg-info`` directory into ``.dist-info``.

        setuptools' ``dist_info`` command delegates this step to
        bdist_wheel.  PKG-INFO becomes METADATA; entry points and
        top-level listings are carried over verbatim.
        """
        import shutil

        if os.path.exists(distinfo_path):
            shutil.rmtree(distinfo_path)
        os.makedirs(distinfo_path)
        shutil.copy2(
            os.path.join(egginfo_path, "PKG-INFO"),
            os.path.join(distinfo_path, "METADATA"),
        )
        for extra in ("entry_points.txt", "top_level.txt"):
            src = os.path.join(egginfo_path, extra)
            if os.path.exists(src):
                shutil.copy2(src, os.path.join(distinfo_path, extra))

    def write_wheelfile(self, wheelfile_base, generator="wheel-shim (offline)"):
        content = (
            "Wheel-Version: 1.0\n"
            f"Generator: {generator}\n"
            f"Root-Is-Purelib: {'true' if self.root_is_pure else 'false'}\n"
            f"Tag: {'-'.join(self.get_tag())}\n"
        )
        with open(os.path.join(wheelfile_base, "WHEEL"), "w", encoding="utf-8") as f:
            f.write(content)

    def run(self):
        """Build a regular (non-editable) pure wheel: build_py → zip."""
        import tempfile

        from wheel.wheelfile import WheelFile

        build = self.reinitialize_command("build", reinit_subcommands=True)
        build.build_lib = tempfile.mkdtemp(suffix=".bdist-wheel")
        self.run_command("build")
        di_cmd = self.reinitialize_command("dist_info")
        di_cmd.output_dir = build.build_lib
        di_cmd.ensure_finalized()
        di_cmd.run()
        name = f"{self.wheel_dist_name()}-{'-'.join(self.get_tag())}.whl"
        os.makedirs(self.dist_dir, exist_ok=True)
        path = os.path.join(self.dist_dir, name)
        with WheelFile(path, "w") as wf:
            wf.write_files(build.build_lib)
        self.distribution.dist_files.append(("bdist_wheel", f"{sys.version_info[0]}", path))
